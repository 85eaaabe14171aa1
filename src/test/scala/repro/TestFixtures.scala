package repro

import org.apache.spark.sql.SparkSession
import repro.core.{LinearRanking, Normalizer}
import repro.webdb._

import scala.collection.concurrent.TrieMap

/** Shared, memoized test data: the synthetic web databases are deterministic
  * in (sf, seed), so one driver-side copy per configuration serves every
  * suite in the single test JVM.
  */
object TestFixtures {

  private val localCache = TrieMap.empty[(String, Double, Int), LocalWebDb]

  def diamonds(spark: SparkSession, sf: Double = 0.005, k: Int = 10): LocalWebDb =
    localCache.getOrElseUpdate(("diamonds", sf, k), WebData.diamondsLocal(spark, sf, k))

  def houses(spark: SparkSession, sf: Double = 0.005, k: Int = 10): LocalWebDb =
    localCache.getOrElseUpdate(("houses", sf, k), WebData.housesLocal(spark, sf, k))

  /** Exhaustive ground truth: all matching tuples in (score, id) order —
    * what an omniscient service would return page by page.
    */
  def groundTruth(
      db: LocalWebDb,
      base: WebQuery,
      f: LinearRanking,
      norm: Normalizer,
  ): Vector[WebTuple] =
    db.allTuples
      .filter(base.matches)
      .map(t => (f.score(t, norm), t))
      .sortBy { case (s, t) => (s, t.id) }
      .map(_._2)

  /** Ground truth for a 1D order (normalization-invariant). */
  def groundTruth1D(db: LocalWebDb, base: WebQuery, attr: String, asc: Boolean): Vector[WebTuple] = {
    val f = LinearRanking.oneD(attr, asc)
    groundTruth(db, base, f, Normalizer.fromDomains(db.schema, Seq(attr)))
  }

  /** Data-true normalizer over the ranking attributes. */
  def trueNorm(db: LocalWebDb, attrs: Seq[String]): Normalizer =
    Normalizer.fromTuples(db.allTuples, attrs)
}
