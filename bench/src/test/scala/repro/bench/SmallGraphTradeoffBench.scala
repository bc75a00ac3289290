package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, Harness}

/** Figures 1–4 in table form: MaxError / Precision@k vs query time on the
  * small analogs, ground truth from the dense Power Method (§4.1). Index
  * rows double as the Figure 3/4 preprocessing-time / index-size data.
  */
class SmallGraphTradeoffBench extends SparkSpec {

  test("small-graph tradeoffs: ExactSim vs MC/ParSim/Linearization/PRSim") {
    val rows = Experiments.smallTradeoff(spark)
    Harness.printRows("small graphs (GT: Power Method, k=100)", rows)

    val ok = rows.filterNot(_.note.contains("SKIPPED"))
    assert(ok.nonEmpty)

    rows.groupBy(_.dataset).foreach { case (ds, dsRows) =>
      val ran = dsRows.filterNot(_.note.contains("SKIPPED"))
      // Headline claim: ExactSim reaches the smallest error of all methods.
      val exactBest = ran.filter(_.algo == "ExactSim").map(_.maxError).min
      val otherBest = ran.filter(r => r.algo != "ExactSim").map(_.maxError).min
      assert(exactBest <= otherBest * 1.5 + 1e-12,
        s"$ds: ExactSim best $exactBest should not lose to baselines' best $otherBest")
      // ExactSim at the finest ε achieves (near-)exactness: precision@k = 1.
      val finest = ran.filter(_.algo == "ExactSim").minBy(_.maxError)
      assert(finest.precision >= 0.95, s"$ds: precision ${finest.precision} at finest eps")
      // ExactSim's error ladder is monotone decreasing (within noise).
      val ladder = dsRows.filter(_.algo == "ExactSim").map(_.maxError)
      assert(ladder.head >= ladder.last, s"$ds: ladder $ladder")
      // Linearization at fine ε hits the walk budget (its §2.2 bottleneck).
      assert(dsRows.exists(r => r.algo == "Linearization" && r.note.contains("SKIPPED")),
        s"$ds: expected a budget-capped Linearization config")
    }
  }
}
