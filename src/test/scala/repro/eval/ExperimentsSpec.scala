package repro.eval

import repro.SimTestKit

class ExperimentsSpec extends SimTestKit {

  test("env knobs fall back to documented defaults") {
    // The test JVM does not set BENCH_* variables.
    assert(Experiments.alpha == 1.0)
    assert(Experiments.epsMin == 1e-4)
    assert(Experiments.smallQueries == 2 && Experiments.largeQueries == 1)
    assert(Experiments.walkBudget == 300000000L)
  }

  test("envInt / envDouble parse when present") {
    assert(Experiments.envInt("PATH_DOES_NOT_EXIST_XYZ", 7) == 7)
    assert(Experiments.envDouble("PATH_DOES_NOT_EXIST_XYZ", 0.5) == 0.5)
  }

  test("table2 row shape on a single small spec") {
    val rows = Experiments.table2(spark, Seq(Datasets.byKey("GQ-lite")))
    assert(rows.size == 1)
    val r = rows.head
    assert(r.key == "GQ-lite" && r.tpe == "undirected" && r.n == 2000 && r.m > 0)
  }

  test("DatasetRow keeps paper numbers verbatim") {
    val rows = Experiments.table2(spark, Seq(Datasets.byKey("WV-lite")))
    assert(rows.head.paperN == 7115 && rows.head.paperM == 103689 && rows.head.tpe == "directed")
  }
}
