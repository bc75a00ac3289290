package repro.jobs

import repro.core.PowerMethod
import repro.eval.{Datasets, Harness, Metrics}

/** Dense Power Method ground truth on a small dataset (§4.1 oracle).
  *
  * Usage: ... --class repro.jobs.GroundTruthJob repro.jar [datasetKey] [source] [iters]
  */
object GroundTruthJob {
  def main(args: Array[String]): Unit = {
    val key = args.lift(0).getOrElse("GQ-lite")
    val source = args.lift(1).map(_.toInt).getOrElse(0)
    val iters = args.lift(2).map(_.toInt).getOrElse(40)
    val spark = JobSession.get(s"groundtruth-$key")
    val graph = Datasets.byKey(key).generate(spark)
    println(s"graph: $graph, power-method iters=$iters (error ≤ c^L = ${math.pow(Harness.C, iters)})")
    val s = PowerMethod.simrank(graph.csr, Harness.C, iters)
    println(s"single-source ground truth for v$source, top-20:")
    Metrics.topK(s(source), 20, source).foreach(j => println(f"  v$j%-8d ${s(source)(j)}%.9f"))
    spark.stop()
  }
}
