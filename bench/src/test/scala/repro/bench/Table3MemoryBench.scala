package repro.bench

import repro.SparkSpec
import repro.eval.{Experiments, MemoryModel}

/** Paper Table 3: memory overhead of basic vs optimized ExactSim vs graph
  * size on the large analogs, at ε_min. Paper shape: basic overhead is larger
  * than the graph itself; sparse Linearization cuts it by ~5–6×.
  */
class Table3MemoryBench extends SparkSpec {

  test("Table 3: memory overhead on large graphs") {
    val rows = Experiments.table3(spark)
    println("\n== Table 3: memory overhead (MB) at eps_min = " + Experiments.epsMin + " ==")
    println(f"${"dataset"}%-8s ${"basic"}%10s ${"optimized"}%11s ${"graph"}%9s ${"basic/graph"}%12s ${"basic/opt"}%10s")
    rows.foreach { r =>
      println(f"${r.dataset}%-8s ${MemoryModel.fmtMB(r.basicBytes)}%10s ${MemoryModel.fmtMB(r.optimizedBytes)}%11s " +
        f"${MemoryModel.fmtMB(r.graphBytes)}%9s ${r.basicOverGraph}%12.2f ${r.basicOverOptimized}%10.2f")
    }
    assert(rows.size == 4)
    rows.foreach { r =>
      // Paper shape: basic ExactSim's dense hop vectors dominate the graph...
      assert(r.basicBytes > r.graphBytes / 2,
        s"${r.dataset}: basic ${r.basicBytes} should be comparable to or above graph ${r.graphBytes}")
      // ...and sparse Linearization shrinks them several-fold (paper: 5–6×).
      assert(r.basicOverOptimized > 2.0,
        s"${r.dataset}: expected a multi-x reduction, got ${r.basicOverOptimized}")
    }
  }
}
