package repro.eval

import repro.SimTestKit

class DatasetsSpec extends SimTestKit {

  test("spec registry: 4 small + 4 large, unique keys") {
    assert(Datasets.small.size == 4 && Datasets.large.size == 4)
    assert(Datasets.all.map(_.key).distinct.size == 8)
  }

  test("byKey resolves known keys and rejects unknown ones") {
    assert(Datasets.byKey("GQ-lite").paperName == "ca-GrQc")
    intercept[RuntimeException](Datasets.byKey("nope"))
  }

  test("paper statistics carried for EXPERIMENTS.md diffing") {
    val tw = Datasets.byKey("TW-lite")
    assert(tw.paperN == 41652230L && tw.paperM == 1468364884L && tw.directed)
    val gq = Datasets.byKey("GQ-lite")
    assert(!gq.directed && gq.paperN == 5242)
  }

  test("small specs generate graphs with roughly the target size") {
    val sp = Datasets.byKey("GQ-lite")
    val g = sp.generate(spark)
    assert(g.n == sp.n)
    assert(g.m > sp.mTarget * 0.55 && g.m <= sp.mTarget * 1.3, s"m=${g.m} target=${sp.mTarget}")
    g.unpersistAll()
  }

  test("undirected specs yield symmetric graphs, directed ones do not") {
    val und = Datasets.byKey("HT-lite").generate(spark)
    val es = und.edges.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    es.take(200).foreach { case (s, d) => assert(es.contains((d, s))) }
    und.unpersistAll()
  }

  test("generation is deterministic per spec") {
    val a = Datasets.byKey("WV-lite").generate(spark).m
    val b = Datasets.byKey("WV-lite").generate(spark).m
    assert(a == b)
  }
}
