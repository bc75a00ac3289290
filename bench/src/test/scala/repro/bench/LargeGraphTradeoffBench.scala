package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, Harness}

/** Figures 5–8 in table form: tradeoffs on the large analogs; ground truth is
  * ExactSim at ε_min, exactly the paper's §4.2 methodology.
  */
class LargeGraphTradeoffBench extends SparkSpec {

  test("large-graph tradeoffs: ExactSim is the only method reaching eps_min") {
    val rows = Experiments.largeTradeoff(spark)
    Harness.printRows(s"large graphs (GT: ExactSim at eps=${Experiments.epsMin}, k=500)", rows)

    rows.groupBy(_.dataset).foreach { case (ds, dsRows) =>
      val ran = dsRows.filterNot(r => r.note.contains("SKIPPED") || r.note.contains("ground truth"))
      val exact = ran.filter(_.algo == "ExactSim")
      assert(exact.nonEmpty, s"$ds: no ExactSim rows")
      // ExactSim's measured error at its finest ε beats every baseline's best.
      val exactBest = exact.map(_.maxError).min
      val baselines = ran.filter(_.algo != "ExactSim")
      if (baselines.nonEmpty) {
        val otherBest = baselines.map(_.maxError).min
        assert(exactBest <= otherBest * 1.5 + 1e-12, s"$ds: $exactBest vs $otherBest")
      }
      // At least one baseline must be budget-capped on large graphs — the
      // O(n log n / eps^2) wall the paper builds ExactSim to break.
      assert(dsRows.exists(_.note.contains("SKIPPED")), s"$ds: expected budget-capped baselines")
    }
  }
}
