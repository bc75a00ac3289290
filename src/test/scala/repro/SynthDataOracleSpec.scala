package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators against the DuckDB oracle so
  * the shared `SynthData`/`Oracle` plumbing is covered even though this
  * paper's workload is graphs (see DESIGN.md substitution #6).
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.002).cache()

  test("lineitem aggregate by returnflag matches DuckDB") {
    val sparkDf = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders join lineitem aggregate matches DuckDB") {
    val sparkDf = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT o_orderstatus, COUNT(*) AS cnt
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> ord)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.002).agg(sum("c_custkey")).head().getLong(0)
    val b = SynthData.customer(spark, 0.002).agg(sum("c_custkey")).head().getLong(0)
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000, seed = 3)
    val u = SynthData.uniformKeys(spark, 20000, 1000, seed = 3)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    assert(zTop > 3 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
