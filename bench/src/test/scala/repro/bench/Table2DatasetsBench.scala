package repro.bench

import repro.SparkSpec
import repro.eval.Experiments

/** Paper Table 2: dataset statistics — synthetic analogs next to the paper's
  * graphs (see DESIGN.md §4; numbers recorded in EXPERIMENTS.md).
  */
class Table2DatasetsBench extends SparkSpec {

  test("Table 2: dataset statistics") {
    val rows = Experiments.table2(spark)
    println("\n== Table 2: datasets (paper graph vs synthetic analog) ==")
    println(f"${"key"}%-8s ${"paper graph"}%-12s ${"type"}%-10s ${"paper n"}%12s ${"paper m"}%14s ${"n"}%8s ${"m"}%10s")
    rows.foreach { r =>
      println(f"${r.key}%-8s ${r.paperName}%-12s ${r.tpe}%-10s ${r.paperN}%12d ${r.paperM}%14d ${r.n}%8d ${r.m}%10d")
    }
    assert(rows.size == 8)
    // Shape checks: every analog respects its paper graph's type and a sane size.
    rows.foreach { r =>
      assert(r.m > 0 && r.n > 0)
      assert(r.m.toDouble / r.n >= 2.0, s"${r.key}: avg degree ${r.m.toDouble / r.n} too low")
    }
    // Relative ordering of graph sizes follows the paper's (GQ smallest … TW densest).
    val byKey = rows.map(r => r.key -> r).toMap
    assert(byKey("GQ-lite").m < byKey("HP-lite").m)
    assert(byKey("DB-lite").m < byKey("IC-lite").m)
  }
}
