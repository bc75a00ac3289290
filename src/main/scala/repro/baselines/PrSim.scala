package repro.baselines

import repro.core.{DiagEstimator, Linearized}
import repro.graph.GraphData
import repro.linalg.{LinEngine, SparkEngine}

/** PRSim-lite (after Wei et al., SIGMOD'19).
  *
  * Faithful-in-shape substitution (see DESIGN.md §3.4): the index estimates
  * the diagonal `D̂` with pair-walk samples allocated by *global* PageRank —
  * `R(k) = ⌈n·R_base·π̄(k)²⌉` with `R_base = α·ln n/ε²` — so the total
  * preprocessing cost is `O(n·‖π̄‖²·log n/ε²)`, PRSim's average complexity:
  * sublinear-in-n behaviour on power-law graphs, but still n-scaled, which is
  * exactly why it cannot reach ε_min on large graphs (paper §2.2). Queries
  * run the linearized backward iteration in `O(m·log(1/ε))`.
  *
  * Unlike ExactSim the allocation is source-independent, so sources whose PPR
  * differs from global PageRank see larger errors — the "bad source" effect
  * the paper describes.
  */
object PrSim {

  final case class Index(dhat: Array[Double], walkPairs: Long, pageRankNormSq: Double,
                         prepMillis: Long) {
    def bytes: Long = dhat.length.toLong * 8
  }

  final case class Result(scores: Array[Double], millis: Long)

  /** Global PageRank proxy: π̄ = (1−√c)·Σ_ℓ (√c P)^ℓ · (1/n)·1 — the average
    * of all PPR vectors, computed with the same distributed mat-vec.
    */
  def globalPageRank(graph: GraphData, c: Double, iters: Int,
                     engine: Option[LinEngine] = None): Array[Double] = {
    val eng = engine.getOrElse(new SparkEngine(graph))
    val n = graph.n
    val sqrtC = math.sqrt(c)
    var cur = Array.fill(n)((1.0 - sqrtC) / n)
    val pi = cur.clone()
    var ell = 1
    while (ell <= iters) {
      cur = eng.mulP(cur)
      var k = 0
      while (k < n) { cur(k) *= sqrtC; pi(k) += cur(k); k += 1 }
      ell += 1
    }
    pi
  }

  /** Pair-walk count the index build would need (budget checks, no walks run). */
  def plannedPairs(graph: GraphData, c: Double, eps: Double, alpha: Double,
                   engine: Option[LinEngine] = None): Long = {
    val n = graph.n
    val pr = globalPageRank(graph, c, Linearized.iterationsFor(c, eps), engine)
    val rBase = alpha * math.log(n.max(2)) / (eps * eps)
    pr.collect { case p if p > 0.0 => math.ceil(n * rBase * p * p).toLong.max(1L) }.sum
  }

  def buildIndex(graph: GraphData, c: Double, eps: Double, alpha: Double,
                 seed: Long = 42, engine: Option[LinEngine] = None,
                 precomputedPr: Option[Array[Double]] = None): Index = {
    val t0 = System.nanoTime()
    val spark = graph.spark
    val n = graph.n
    val iters = Linearized.iterationsFor(c, eps)
    val pr = precomputedPr.getOrElse(globalPageRank(graph, c, iters, engine))
    var normSq = 0.0
    pr.foreach(p => normSq += p * p)
    val rBase = alpha * math.log(n.max(2)) / (eps * eps)
    val tasks = (0 until n).collect {
      case k if pr(k) > 0.0 => k -> math.ceil(n * rBase * pr(k) * pr(k)).toLong.max(1L)
    }
    val bc = spark.sparkContext.broadcast(graph.csr)
    val res = DiagEstimator.basic(spark, bc, tasks.toIndexedSeq, c, seed)
    val dhat = Array.tabulate(n)(k => res.dhat.getOrElse(k, 1.0 - c))
    bc.destroy()
    Index(dhat, res.walkPairs, normSq, (System.nanoTime() - t0) / 1000000)
  }

  def singleSource(graph: GraphData, source: Int, index: Index, c: Double, eps: Double,
                   engine: Option[LinEngine] = None): Result = {
    val t0 = System.nanoTime()
    val eng = engine.getOrElse(new SparkEngine(graph))
    val fwd = Linearized.forward(eng, source, c, Linearized.iterationsFor(c, eps))
    val scores = Linearized.backward(eng, fwd, index.dhat, c)
    scores(source) = 1.0
    Result(scores, (System.nanoTime() - t0) / 1000000)
  }
}
