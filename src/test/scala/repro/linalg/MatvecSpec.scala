package repro.linalg

import java.util.SplittableRandom
import org.apache.spark.sql.functions._
import repro.{Oracle, SimTestKit}

class MatvecSpec extends SimTestKit {

  private def randomVec(n: Int, seed: Long): Array[Double] = {
    val rng = new SplittableRandom(seed)
    Array.fill(n)(rng.nextDouble())
  }

  private val batteryNames = Seq("cycle7", "path6", "star8", "complete5", "pair", "rnd40", "rnd60u", "rnd80")

  for (name <- batteryNames) test(s"SparkEngine.mulP equals LocalEngine.mulP on $name") {
    val g = battery.find(_.name == name).get
    val x = randomVec(g.n, 17)
    val sparkY = new SparkEngine(g).mulP(x)
    val localY = new LocalEngine(g.csr).mulP(x)
    assertVecNear(sparkY, localY, 1e-10, s"mulP on ${g.name}")
  }

  for (name <- batteryNames) test(s"SparkEngine.mulPT equals LocalEngine.mulPT on $name") {
    val g = battery.find(_.name == name).get
    val x = randomVec(g.n, 19)
    val sparkY = new SparkEngine(g).mulPT(x)
    val localY = new LocalEngine(g.csr).mulPT(x)
    assertVecNear(sparkY, localY, 1e-10, s"mulPT on ${g.name}")
  }

  test("sparse input vectors are handled (zeros dropped before the join)") {
    val g = rnd40
    val x = new Array[Double](g.n); x(3) = 1.0
    assertVecNear(new SparkEngine(g).mulP(x), new LocalEngine(g.csr).mulP(x), 1e-12, "sparse mulP")
  }

  test("zero vector maps to zero vector") {
    val g = rnd40
    val y = new SparkEngine(g).mulP(new Array[Double](g.n))
    assert(y.forall(_ == 0.0))
  }

  test("mulP dataflow matches DuckDB join+aggregate") {
    val g = rnd40
    import g.spark.implicits._
    val x = randomVec(g.n, 23)
    val vecDf = g.spark.createDataset(x.indices.map(i => (i.toLong, x(i)))).toDF("id", "v")
    val sparkDf = g.pEdges
      .join(vecDf.withColumnRenamed("id", "dst"), "dst")
      .groupBy(col("src").as("id"))
      .agg(sum(col("w") * col("v")).as("v"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT e.src AS id, SUM(CAST(e.w AS DOUBLE) * CAST(v.v AS DOUBLE)) AS v
        |FROM e JOIN v ON e.dst = v.id GROUP BY e.src""".stripMargin,
      "e" -> g.pEdges, "v" -> vecDf)
  }

  test("mulPT dataflow matches DuckDB join+aggregate") {
    val g = rnd60u
    import g.spark.implicits._
    val x = randomVec(g.n, 29)
    val vecDf = g.spark.createDataset(x.indices.map(i => (i.toLong, x(i)))).toDF("id", "v")
    val sparkDf = g.pEdges
      .join(vecDf.withColumnRenamed("id", "src"), "src")
      .groupBy(col("dst").as("id"))
      .agg(sum(col("w") * col("v")).as("v"))
    Oracle.assertEquivalent(sparkDf,
      """SELECT e.dst AS id, SUM(CAST(e.w AS DOUBLE) * CAST(v.v AS DOUBLE)) AS v
        |FROM e JOIN v ON e.src = v.id GROUP BY e.dst""".stripMargin,
      "e" -> g.pEdges, "v" -> vecDf)
  }

  test("mulP conserves mass on graphs without dead ends") {
    val g = cycle7 // every node has in-degree 1
    val x = randomVec(g.n, 31)
    val y = new SparkEngine(g).mulP(x)
    assert(math.abs(y.sum - x.sum) < 1e-9)
  }

  test("columns of P sum to 1 exactly for nodes with in-degree > 0") {
    for (g <- Seq(rnd40, rnd60u, star8)) {
      val sums = g.pEdges.groupBy("dst").agg(sum("w").as("s")).collect()
      sums.foreach(r => assert(math.abs(r.getDouble(1) - 1.0) < 1e-9, s"${g.name} col ${r.get(0)}"))
    }
  }
}
