package repro.eval

import org.apache.spark.sql.SparkSession
import repro.graph.{GraphData, GraphGen}

/** Synthetic analogs of the paper's Table 2 datasets (see DESIGN.md §3–4).
  *
  * Real SNAP/LAW graphs are unavailable offline, so each dataset is a
  * Chung–Lu power-law graph with the paper graph's type (directed/undirected)
  * and scaled size. `paperN`/`paperM` keep the original statistics next to
  * the analogs for EXPERIMENTS.md.
  */
object Datasets {

  final case class Spec(key: String, paperName: String, directed: Boolean,
                        paperN: Long, paperM: Long, n: Int, mTarget: Long,
                        alpha: Double, seed: Long) {
    def generate(spark: SparkSession): GraphData =
      GraphGen.chungLu(spark, key, n, mTarget, alpha, undirected = !directed, seed = seed)
  }

  /** Small graphs — dense Power Method ground truth is feasible (§4.1). */
  val small: Seq[Spec] = Seq(
    Spec("GQ-lite", "ca-GrQc",  directed = false, 5242, 28968, 2000, 12000, 0.6, 101),
    Spec("HT-lite", "CA-HepTh", directed = false, 9877, 51946, 3000, 16000, 0.6, 102),
    Spec("WV-lite", "Wikivote", directed = true,  7115, 103689, 2500, 36000, 0.75, 103),
    Spec("HP-lite", "CA-HepPh", directed = false, 12008, 236978, 3500, 70000, 0.7, 104),
  )

  /** Large graphs — ground truth = ExactSim at ε_min (§4.2 methodology). */
  val large: Seq[Spec] = Seq(
    Spec("DB-lite", "DBLP-Author", directed = false, 5425963L, 17298032L, 54000, 173000, 0.65, 201),
    Spec("IC-lite", "IndoChina",   directed = true,  7414768L, 191606827L, 74000, 1000000, 0.8, 202),
    Spec("IT-lite", "It-2004",     directed = true,  41290682L, 1135718909L, 41000, 1100000, 0.8, 203),
    Spec("TW-lite", "Twitter",     directed = true,  41652230L, 1468364884L, 42000, 1400000, 0.85, 204),
  )

  val all: Seq[Spec] = small ++ large

  def byKey(key: String): Spec =
    all.find(_.key == key).getOrElse(sys.error(s"unknown dataset $key; known: ${all.map(_.key)}"))
}
