package repro.eval

import repro.SimTestKit

class PoolingSpec extends SimTestKit {

  test("an algorithm returning the true top-k gets pooled precision 1") {
    val g = rnd60u
    val truth = groundTruth(g)(4)
    val k = 5
    val good = Metrics.topK(truth, k, 4)
    val bad = truth.indices.filter(_ != 4).sortBy(i => (truth(i), i)).take(k) // bottom-k
    val precs = Pooling.pooledPrecision(Seq(good, bad), truth.apply, k)
    assert(precs.head == 1.0)
    assert(precs(1) < 0.5)
  }

  test("pooled precision can exceed true precision (relative-only caveat, §2)") {
    // Two algorithms missing the same true top node split the pool between
    // themselves: pooled precision is computed against the pool's best k, so
    // it is an upper bound of sorts relative to the participating algorithms.
    val score = Map(0 -> 0.9, 1 -> 0.8, 2 -> 0.7, 3 -> 0.6, 4 -> 0.5).withDefaultValue(0.0)
    val a = Seq(1, 2) // neither found node 0
    val b = Seq(1, 3)
    val precs = Pooling.pooledPrecision(Seq(a, b), score, k = 2)
    assert(precs.head == 1.0, "pool thinks {1,2} is perfect because 0 is absent")
  }

  test("pool merges and dedupes candidates") {
    val score = (v: Int) => 1.0 / (v + 1)
    val precs = Pooling.pooledPrecision(Seq(Seq(0, 1), Seq(1, 0)), score, k = 2)
    assert(precs == Seq(1.0, 1.0))
  }

  test("empty pools behave gracefully (vacuous precision 1)") {
    assert(Pooling.pooledPrecision(Seq(Seq.empty), _.toDouble, 3) == Seq(1.0))
  }
}
