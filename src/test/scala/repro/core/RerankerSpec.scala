package repro.core

import org.apache.spark.sql.functions._
import repro.core.expr.LinearScore
import repro.webdb.WebData
import repro.{Oracle, SparkSpec, TestFixtures}

/** The distributed re-rank operator versus the DuckDB oracle, the SQL path
  * through the custom Catalyst expression, and the injected optimizer rule.
  */
class RerankerSpec extends SparkSpec {

  private lazy val dia = WebData.diamonds(spark, sf = 0.002).cache()

  /** DuckDB-side mirror of [[Reranker.scoreColumn]] (tables are stored as
    * VARCHAR by the oracle, hence the casts; same left-associated sum).
    */
  private def duckScore(f: LinearRanking, norm: Normalizer): String =
    f.weights
      .map { case (a, w) =>
        val (lo, hi) = norm.minMax(a)
        s"($w * ((CAST($a AS DOUBLE) - $lo) / ${hi - lo}))"
      }
      .mkString(" + ")

  private def checkAgainstOracle(f: LinearRanking, h: Int): Unit = {
    val norm = TestFixtures.trueNorm(TestFixtures.diamonds(spark, 0.002), f.attrs)
    val got = Reranker
      .topH(dia, f, norm, h)
      .select(col("id"), col("price"), col("carat"))
    Oracle.assertEquivalent(
      got,
      s"""SELECT CAST(id AS BIGINT) AS id,
         |       CAST(price AS DOUBLE) AS price,
         |       CAST(carat AS DOUBLE) AS carat
         |FROM diamonds
         |ORDER BY ${duckScore(f, norm)}, CAST(id AS BIGINT)
         |LIMIT $h""".stripMargin,
      "diamonds" -> dia,
    )
  }

  test("rerank top-20 equals DuckDB for price − 0.5·carat") {
    checkAgainstOracle(LinearRanking(Seq("price" -> 1.0, "carat" -> -0.5)), 20)
  }

  test("rerank top-20 equals DuckDB for the paper 3D example") {
    checkAgainstOracle(LinearRanking(Seq("price" -> 1.0, "carat" -> -0.1, "depth" -> -0.5)), 20)
  }

  test("rerank top-15 equals DuckDB for an anti-correlated function") {
    checkAgainstOracle(LinearRanking(Seq("price" -> -1.0, "carat" -> -0.5)), 15)
  }

  test("full rerank (no limit) equals DuckDB ordering") {
    val f    = LinearRanking(Seq("price" -> 1.0, "lwr" -> 1.0))
    val norm = TestFixtures.trueNorm(TestFixtures.diamonds(spark, 0.002), f.attrs)
    val got  = Reranker.rerank(dia, f, norm).select(col("id"), col("lwr"))
    Oracle.assertEquivalent(
      got,
      s"""SELECT CAST(id AS BIGINT) AS id, CAST(lwr AS DOUBLE) AS lwr
         |FROM diamonds""".stripMargin,
      "diamonds" -> dia,
    )
  }

  test("SQL path (qr2_score expression) produces the same ranking as the Column path") {
    Reranker.registerExtensions(spark)
    val f    = LinearRanking(Seq("price" -> 1.0, "carat" -> -0.5))
    val norm = TestFixtures.trueNorm(TestFixtures.diamonds(spark, 0.002), f.attrs)
    val a    = Reranker.rerank(dia, f, norm).select("id").collect().map(_.getLong(0)).toSeq
    val b    = Reranker.rerankSql(dia, f, norm).select("id").collect().map(_.getLong(0)).toSeq
    assert(a == b)
  }

  test("qr2_score scores agree with the driver-side LinearRanking.score") {
    Reranker.registerExtensions(spark)
    val f    = LinearRanking(Seq("price" -> 1.0, "carat" -> -0.5))
    val db   = TestFixtures.diamonds(spark, 0.002)
    val norm = TestFixtures.trueNorm(db, f.attrs)
    val rows = Reranker.rerankSql(dia, f, norm).select("id", Reranker.ScoreCol).collect()
    val byId = db.allTuples.map(t => t.id -> t).toMap
    rows.take(50).foreach { r =>
      val expected = f.score(byId(r.getLong(0)), norm)
      assert(math.abs(r.getDouble(1) - expected) < 1e-9)
    }
  }

  test("optimizer rule prunes zero-weight terms from LinearScore") {
    Reranker.registerExtensions(spark)
    val df = dia.selectExpr(
      "id",
      "qr2_score(1.0, 200.0, 200000.0, price, 0.0, 0.2, 5.0, carat) AS s",
    )
    val scores = df.queryExecution.optimizedPlan.expressions
      .flatMap(_.collect { case l: LinearScore => l })
    assert(scores.nonEmpty, "LinearScore missing from the optimized plan")
    assert(scores.forall(_.children.size == 1),
      s"zero-weight term not pruned: ${scores.map(_.children.size)}")
    // Semantics unchanged: the pruned plan computes the same scores.
    val full = dia.selectExpr("id", "qr2_score(1.0, 200.0, 200000.0, price) AS s")
    assert(df.orderBy("id").collect().toSeq == full.orderBy("id").collect().toSeq)
  }

  test("optimizer rule prunes collapsed-range terms") {
    Reranker.registerExtensions(spark)
    val df = dia.selectExpr("id", "qr2_score(1.0, 200.0, 200000.0, price, 0.7, 5.0, 5.0, carat) AS s")
    val scores = df.queryExecution.optimizedPlan.expressions
      .flatMap(_.collect { case l: LinearScore => l })
    assert(scores.forall(_.children.size == 1))
  }

  test("LinearScore is null-propagating on nullable inputs") {
    Reranker.registerExtensions(spark)
    import spark.implicits._
    val df = Seq((1L, Some(10.0)), (2L, Option.empty[Double]), (3L, Some(20.0)))
      .toDF("id", "x")
      .selectExpr("id", "qr2_score(1.0, 0.0, 100.0, x) AS s")
    val rows = df.orderBy("id").collect()
    assert(rows(0).getDouble(1) == 0.1)
    assert(rows(1).isNullAt(1))
    assert(rows(2).getDouble(1) == 0.2)
  }

  test("qr2_score rejects a malformed argument list") {
    Reranker.registerExtensions(spark)
    val ex = intercept[Exception](dia.selectExpr("qr2_score(1.0, 2.0, price)").collect())
    assert(ex.getMessage.toLowerCase.contains("qr2_score") || ex.getCause != null)
  }

  test("tuplesToDataFrame round-trips tuples with all public attributes") {
    val db = TestFixtures.diamonds(spark, 0.002)
    val ts = db.allTuples.take(25)
    val df = Reranker.tuplesToDataFrame(spark, db.schema, ts)
    assert(df.count() == 25)
    assert(df.columns.toSet ==
      (Set(db.schema.idCol) ++ db.schema.numeric ++ db.schema.categorical))
    val back = df.collect().map(r => r.getAs[Long]("id") -> r.getAs[Double]("price")).toMap
    ts.foreach(t => assert(back(t.id) == t.num("price")))
  }

  test("rerank on a fetched result-set DataFrame (the service presentation path)") {
    val db   = TestFixtures.diamonds(spark, 0.002)
    val f    = LinearRanking(Seq("price" -> 1.0, "carat" -> -0.5))
    val norm = TestFixtures.trueNorm(db, f.attrs)
    val fetched = db.allTuples.take(100) // "fetched from the web database"
    val df      = Reranker.tuplesToDataFrame(spark, db.schema, fetched)
    val got     = Reranker.rerank(df, f, norm).select("id").collect().map(_.getLong(0)).toSeq
    val expect = fetched
      .map(t => (f.score(t, norm), t.id))
      .sortBy(identity)
      .map(_._2)
    assert(got == expect)
  }
}
