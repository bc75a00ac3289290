package repro.eval

/** Pooling (§2, after ProbeSim): compare top-k algorithms *without* ground
  * truth. The union of every algorithm's top-k is re-scored by a
  * high-precision estimator; the best k of the pool become the pseudo ground
  * truth against which each algorithm's precision is measured.
  *
  * The paper uses pooling as prior art and builds ExactSim to replace it; we
  * implement it both as a tested utility and to cross-check that pooled
  * precision agrees with true precision when the scorer is exact.
  */
object Pooling {

  /** @param topKs    each algorithm's top-k node list for the same source
    * @param score    high-precision scorer for pool members (e.g. ExactSim at
    *                 ε_min, or the exact ground truth in tests)
    * @param k        pool cut-off
    * @return per-algorithm pooled precision, aligned with `topKs`
    */
  def pooledPrecision(topKs: Seq[Seq[Int]], score: Int => Double, k: Int): Seq[Double] = {
    val pool = topKs.flatten.distinct
    val scored = pool.map(v => v -> score(v)).toMap
    val poolTopK = pool.sortBy(v => (-scored(v), v)).take(k).toSet
    topKs.map { tk =>
      if (poolTopK.isEmpty) 1.0 else tk.count(poolTopK.contains).toDouble / k
    }
  }
}
