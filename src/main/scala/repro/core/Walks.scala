package repro.core

import java.util.SplittableRandom
import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import repro.graph.Csr

/** Distributed √c-walk simulation.
  *
  * A √c-walk moves to a uniform random in-neighbor with probability √c and
  * stops otherwise; it also stops (forcedly) at a node with no in-neighbors.
  * Two walks *meet* if they are at the same node at the same step ≥ 1.
  *
  * Work is sharded into chunks of at most [[ChunkSize]] samples and executed
  * with `Dataset.mapPartitions` over a broadcast CSR; RNG streams are seeded
  * per (node, chunk) so results are reproducible for a fixed seed regardless
  * of partitioning.
  */
object Walks {

  val ChunkSize = 8192

  /** One D̂ sampling task: simulate `pairs` independent √c-walk pairs from
    * `node` (Algorithm 2) and report how many pairs met.
    */
  final case class MeetCount(node: Int, pairs: Long, meets: Long)

  /** Simulate pair-walks per node: input (node, numPairs); output per-node
    * totals. `Pr[meet]`'s complement is the Algorithm-2 estimator for D(k,k).
    */
  def pairMeetCounts(spark: SparkSession, csr: Broadcast[Csr], tasks: Seq[(Int, Long)],
                     c: Double, seed: Long): Map[Int, MeetCount] = {
    import spark.implicits._
    val chunks = tasks.flatMap { case (node, pairs) =>
      val full = (pairs / ChunkSize).toInt
      val rem = pairs - full.toLong * ChunkSize
      (0 until full).map(ci => (node, ChunkSize.toLong, ci)) ++
        (if (rem > 0) Seq((node, rem, full)) else Nil)
    }
    val parts = math.min(512, math.max(spark.sparkContext.defaultParallelism, chunks.size / 4 + 1))
    val ds: Dataset[(Int, Long, Int)] = spark.createDataset(chunks).repartition(parts)
    val res = ds.mapPartitions { it =>
      val g = csr.value
      val sqrtC = math.sqrt(c)
      it.map { case (node, pairs, chunk) =>
        val rng = new SplittableRandom(mix(seed, node, chunk))
        var meets = 0L
        var r = 0L
        while (r < pairs) {
          if (simulatePairMeet(g, node, node, sqrtC, rng)) meets += 1
          r += 1
        }
        (node, pairs, meets)
      }
    }.toDF("node", "pairs", "meets")
      .groupBy("node")
      .agg(org.apache.spark.sql.functions.sum("pairs").as("pairs"),
           org.apache.spark.sql.functions.sum("meets").as("meets"))
    res.collect().map(r => r.getInt(0) -> MeetCount(r.getInt(0), r.getLong(1), r.getLong(2))).toMap
  }

  /** Tail sampling of Algorithm 3, chunked like [[pairMeetCounts]]: input
    * (node, pairs, prefixLen); a pair counts as a meet iff the walks survive
    * `prefixLen` forced (non-stopping) steps without meeting or dying and
    * the subsequent √c-walks meet. The caller scales by `c^prefixLen`.
    */
  def pairTailMeetCounts(spark: SparkSession, csr: Broadcast[Csr],
                         tasks: Seq[(Int, Long, Int)], c: Double, seed: Long): Map[Int, MeetCount] = {
    import spark.implicits._
    val chunks = tasks.flatMap { case (node, pairs, prefix) =>
      val full = (pairs / ChunkSize).toInt
      val rem = pairs - full.toLong * ChunkSize
      (0 until full).map(ci => (node, ChunkSize.toLong, prefix, ci)) ++
        (if (rem > 0) Seq((node, rem, prefix, full)) else Nil)
    }
    if (chunks.isEmpty) return Map.empty
    val parts = math.min(512, math.max(spark.sparkContext.defaultParallelism, chunks.size / 4 + 1))
    val res = spark.createDataset(chunks).repartition(parts).mapPartitions { it =>
      val g = csr.value
      val sqrtC = math.sqrt(c)
      it.map { case (node, pairs, prefix, chunk) =>
        val rng = new SplittableRandom(mix(seed, node, chunk))
        var meets = 0L
        var r = 0L
        while (r < pairs) {
          if (simulateTailPairMeet(g, node, prefix, sqrtC, rng)) meets += 1
          r += 1
        }
        (node, pairs, meets)
      }
    }.toDF("node", "pairs", "meets")
      .groupBy("node")
      .agg(org.apache.spark.sql.functions.sum("pairs").as("pairs"),
           org.apache.spark.sql.functions.sum("meets").as("meets"))
    res.collect().map(r => r.getInt(0) -> MeetCount(r.getInt(0), r.getLong(1), r.getLong(2))).toMap
  }

  /** One Algorithm-3 tail sample from `k`: both walks take `prefix` forced
    * steps; pairs that die or meet inside the prefix contribute no meet
    * (those meets are covered by the deterministic Z sums). Afterwards the
    * pair behaves as two plain √c-walks.
    */
  def simulateTailPairMeet(g: Csr, k: Int, prefix: Int, sqrtC: Double, rng: SplittableRandom): Boolean = {
    var a = k
    var b = k
    var step = 0
    while (step < prefix) {
      a = g.step(a, rng); b = g.step(b, rng)
      if (a < 0 || b < 0) return false // dead end inside the prefix
      if (a == b) return false         // met within ℓ(k): already accounted
      step += 1
    }
    simulatePairMeet(g, a, b, sqrtC, rng)
  }

  /** Simulate one pair of √c-walks from (a, b); true iff they meet at some
    * step ≥ 1 (the D(k,k) convention: coincidence at step 0 does not count).
    */
  def simulatePairMeet(g: Csr, a0: Int, b0: Int, sqrtC: Double, rng: SplittableRandom): Boolean = {
    var a = a0
    var b = b0
    while (true) {
      // Both walks must elect to continue (√c each) for a future meet.
      if (rng.nextDouble() >= sqrtC) return false
      if (rng.nextDouble() >= sqrtC) return false
      a = g.step(a, rng)
      b = g.step(b, rng)
      if (a < 0 || b < 0) return false // dead end: forced stop
      if (a == b) return true
    }
    false
  }

  /** MC-index walk trace row: node's r-th √c-walk visited `pos` at `step`. */
  final case class WalkPos(node: Long, walk: Int, step: Int, pos: Long)

  /** Build the Fogaras–Rácz walk index: `r` √c-walks from every node, stored
    * as a (node, walk, step, pos) DataFrame including step 0. This is the MC
    * baseline's index; its row count × 28 bytes is its index size.
    */
  def walkIndex(spark: SparkSession, csr: Broadcast[Csr], n: Int, r: Int,
                c: Double, seed: Long): DataFrame = {
    import spark.implicits._
    val parts = math.min(256, math.max(spark.sparkContext.defaultParallelism, n * r / 200000 + 1))
    spark.range(0, n.toLong, 1, parts).as[Long].mapPartitions { it =>
      val g = csr.value
      val sqrtC = math.sqrt(c)
      it.flatMap { node =>
        val rng = new SplittableRandom(mix(seed, node.toInt, 0))
        (0 until r).iterator.flatMap { w =>
          var pos = node.toInt
          var step = 0
          val buf = scala.collection.mutable.ArrayBuffer(WalkPos(node, w, 0, pos))
          var alive = true
          while (alive && rng.nextDouble() < sqrtC) {
            pos = g.step(pos, rng)
            if (pos < 0) alive = false
            else { step += 1; buf += WalkPos(node, w, step, pos) }
          }
          buf
        }
      }
    }.toDF()
  }

  /** Splitmix-style seed mixing so per-task streams are independent. */
  def mix(seed: Long, a: Int, b: Int): Long = {
    var z = seed + 0x9e3779b97f4a7c15L * (a + 1) + 0xbf58476d1ce4e5b9L * (b + 1)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
}
