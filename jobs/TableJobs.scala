package repro.jobs

import repro.eval.{Experiments, Harness, MemoryModel}

/** Table 2: dataset statistics (paper vs synthetic analogs). */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table2")
    println(f"${"key"}%-8s ${"paper graph"}%-12s ${"type"}%-10s ${"paper n"}%12s ${"paper m"}%14s ${"n"}%8s ${"m"}%10s")
    Experiments.table2(spark).foreach { r =>
      println(f"${r.key}%-8s ${r.paperName}%-12s ${r.tpe}%-10s ${r.paperN}%12d ${r.paperM}%14d ${r.n}%8d ${r.m}%10d")
    }
    spark.stop()
  }
}

/** Table 3: memory overhead of basic vs optimized ExactSim vs graph size. */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table3")
    println(f"${"dataset"}%-8s ${"basic MB"}%10s ${"optimized MB"}%13s ${"graph MB"}%10s ${"basic/graph"}%12s ${"basic/opt"}%10s")
    Experiments.table3(spark).foreach { r =>
      println(f"${r.dataset}%-8s ${MemoryModel.fmtMB(r.basicBytes)}%10s ${MemoryModel.fmtMB(r.optimizedBytes)}%13s " +
        f"${MemoryModel.fmtMB(r.graphBytes)}%10s ${r.basicOverGraph}%12.2f ${r.basicOverOptimized}%10.2f")
    }
    spark.stop()
  }
}

/** Figures 1–4 in table form: small-graph accuracy/time/index tradeoffs.
  * Optional args: dataset keys to restrict to (default: all small analogs).
  */
object SmallTradeoffJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("small-tradeoff")
    val specs = if (args.isEmpty) repro.eval.Datasets.small else args.toSeq.map(repro.eval.Datasets.byKey)
    Harness.printRows("small-graph tradeoffs (ground truth: dense Power Method)",
      Experiments.smallTradeoff(spark, specs))
    spark.stop()
  }
}

/** Figures 5–8 in table form: large-graph accuracy/time/index tradeoffs.
  * Optional args: dataset keys to restrict to (default: all large analogs).
  */
object LargeTradeoffJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("large-tradeoff")
    val specs = if (args.isEmpty) repro.eval.Datasets.large else args.toSeq.map(repro.eval.Datasets.byKey)
    Harness.printRows("large-graph tradeoffs (ground truth: ExactSim at eps_min)",
      Experiments.largeTradeoff(spark, specs))
    spark.stop()
  }
}

/** Figure 9 in table form: basic vs optimized ExactSim. */
object AblationJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("ablation")
    Harness.printRows("ablation: basic vs optimized ExactSim", Experiments.ablation(spark))
    spark.stop()
  }
}
