package repro.core

import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, LongType, StringType, StructField, StructType}
import org.apache.spark.sql.{Column, DataFrame, Row, SparkSession}
import repro.core.expr.{LinearScore, SimplifyLinearScore}
import repro.webdb.{WebSchema, WebTuple}

/** The distributed re-rank operator: applies an arbitrary user ranking
  * function to a result set fetched from a web database as a DataFrame
  * transformation — score column, stable (score, id) sort, optional top-h.
  *
  * Two equivalent paths are provided (and tested against each other and
  * against the DuckDB oracle):
  *
  *  - [[scoreColumn]] — plain Column arithmetic (the production path);
  *  - [[rerankSql]] — through the custom Catalyst expression
  *    [[repro.core.expr.LinearScore]], registered as the SQL function
  *    `qr2_score` and simplified by the injected optimizer rule
  *    [[repro.core.expr.SimplifyLinearScore]].
  */
object Reranker {

  /** Default name of the appended score column. */
  val ScoreCol = "qr2_score"

  /** Column computing `Σ wᵢ·(Aᵢ−minᵢ)/(maxᵢ−minᵢ)`, left-associated like
    * [[LinearRanking.score]] so driver- and cluster-side scores agree
    * bit-for-bit.
    */
  def scoreColumn(f: LinearRanking, norm: Normalizer): Column =
    f.weights
      .map { case (a, w) =>
        val (lo, hi) = norm.minMax(a)
        if (hi > lo) lit(w) * ((col(a) - lit(lo)) / lit(hi - lo)) else lit(0.0)
      }
      .reduceLeft(_ + _)

  /** Re-rank a fetched result set: append the score and sort by
    * (score asc, id asc).
    */
  def rerank(
      df: DataFrame,
      f: LinearRanking,
      norm: Normalizer,
      idCol: String = "id",
      scoreName: String = ScoreCol,
  ): DataFrame =
    df.withColumn(scoreName, scoreColumn(f, norm))
      .orderBy(col(scoreName).asc, col(idCol).asc)

  /** Top-h of the re-ranked result set (one user page). */
  def topH(
      df: DataFrame,
      f: LinearRanking,
      norm: Normalizer,
      h: Int,
      idCol: String = "id",
  ): DataFrame = rerank(df, f, norm, idCol).limit(h)

  /** The `qr2_score(...)` SQL call text for a ranking function. */
  def sqlScoreExpr(f: LinearRanking, norm: Normalizer): String =
    f.weights
      .map { case (a, w) =>
        val (lo, hi) = norm.minMax(a)
        s"$w, $lo, $hi, $a"
      }
      .mkString("qr2_score(", ", ", ")")

  /** Re-rank through the registered Catalyst expression (SQL path). Call
    * [[registerExtensions]] on the session first.
    */
  def rerankSql(
      df: DataFrame,
      f: LinearRanking,
      norm: Normalizer,
      idCol: String = "id",
      scoreName: String = ScoreCol,
  ): DataFrame =
    df.selectExpr("*", s"${sqlScoreExpr(f, norm)} AS $scoreName")
      .orderBy(col(scoreName).asc, col(idCol).asc)

  /** Register the `qr2_score` function and inject the simplification rule.
    * Idempotent; safe to call once per session.
    */
  def registerExtensions(spark: SparkSession): Unit = {
    spark.sessionState.functionRegistry.createOrReplaceTempFunction(
      "qr2_score",
      (args: Seq[org.apache.spark.sql.catalyst.expressions.Expression]) =>
        LinearScore.fromArguments(args),
      "scala_udf",
    )
    if (!spark.experimental.extraOptimizations.contains(SimplifyLinearScore))
      spark.experimental.extraOptimizations =
        spark.experimental.extraOptimizations :+ SimplifyLinearScore
  }

  /** Materialize driver-side tuples (e.g. a session's discovered top-h) as
    * a DataFrame so they can be re-ranked / joined / displayed with the
    * full Spark API.
    */
  def tuplesToDataFrame(
      spark: SparkSession,
      schema: WebSchema,
      tuples: Seq[WebTuple],
  ): DataFrame = {
    val st = StructType(
      Seq(StructField(schema.idCol, LongType, nullable = false))
        ++ schema.numeric.map(StructField(_, DoubleType, nullable = false))
        ++ schema.categorical.map(StructField(_, StringType, nullable = false)))
    val rows = tuples.map { t =>
      Row.fromSeq(Seq(t.id) ++ schema.numeric.map(t.num) ++ schema.categorical.map(t.cat))
    }
    spark.createDataFrame(spark.sparkContext.parallelize(rows.toSeq, 1), st)
  }
}
