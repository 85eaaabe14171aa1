package repro.service

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.crawl.Crawler
import repro.webdb._

import scala.collection.concurrent.TrieMap
import scala.collection.mutable

/** How the user filled the ranking section of the UI (§II-C). */
sealed trait RankSpec {
  def attrs: Seq[String]
  /** The linear scoring function the spec denotes (1D ascending = +1). */
  def toLinear: LinearRanking
}

/** 1D ranking: attribute + direction, like a SQL ORDER BY. */
final case class OneDRank(attr: String, asc: Boolean = true) extends RankSpec {
  def attrs: Seq[String]      = Seq(attr)
  def toLinear: LinearRanking = LinearRanking.oneD(attr, asc)
}

/** MD ranking: slider weights in [-1, 1] per attribute; score is the dot
  * product with the min-max-normalized attribute values; lower is better.
  */
final case class MDRank(weights: Seq[(String, Double)]) extends RankSpec {
  def attrs: Seq[String]      = weights.map(_._1)
  def toLinear: LinearRanking = LinearRanking(weights)
}

/** Which get-next strategy serves the session. */
sealed trait Algo
object Algo {
  case object Baseline extends Algo
  case object Binary   extends Algo
  case object Rerank   extends Algo
  /** Threshold Algorithm (MD only; degenerates to RERANK in 1D). */
  case object TA extends Algo
  val all: Seq[Algo] = Seq(Baseline, Binary, Rerank, TA)
}

/** The QR2 third-party reranking service (Fig 1 of the paper): wraps one
  * web database, owns the shared dense-region store ("MySQL" cache) and the
  * min-max normalization bounds (discovered through the 1D algorithm, as
  * the paper prescribes), and opens per-user sessions that answer get-next
  * and get-page with any of the strategies.
  */
final class Qr2Service(
    val db: WebDb,
    val store: DenseRegionStore = new DenseRegionStore,
    val latencyMsPerRound: Long = DbStats.DefaultLatencyMs,
) {

  /** Accountant for service-level bootstrap traffic (min/max discovery,
    * cache verification) — shared overhead, not billed to any session.
    */
  val serviceAcc = new Accountant

  private val minMaxCache = TrieMap.empty[String, (Double, Double)]

  /** True min/max of `attr`, discovered on first use via 1D-RERANK in each
    * direction ("obtaining the min and max values on each attribute is
    * simply doable using the 1D-RERANK algorithm", §II-B). Cached for the
    * service lifetime.
    */
  def minMax(attr: String): (Double, Double) =
    minMaxCache.getOrElseUpdate(attr, {
      val conn = new WebDbConn(db, serviceAcc)
      val mn = new OneDRerank(conn, WebQuery.all, attr, asc = true, store)
        .getNext()
        .getOrElse(throw new IllegalStateException(s"empty database: no min for $attr"))
        .num(attr)
      val mx = new OneDRerank(conn, WebQuery.all, attr, asc = false, store)
        .getNext()
        .getOrElse(throw new IllegalStateException(s"empty database: no max for $attr"))
        .num(attr)
      (mn, mx)
    })

  /** Min-max normalizer over the given ranking attributes. */
  def normalizer(attrs: Seq[String]): Normalizer =
    Normalizer(attrs.map(a => a -> minMax(a)).toMap)

  /** Open a user session: filter predicates + ranking spec + strategy. */
  def newSession(base: WebQuery, spec: RankSpec, algo: Algo = Algo.Rerank): Qr2Session = {
    val acc  = new Accountant
    val conn = new WebDbConn(db, acc)
    val impl: GetNexter = spec match {
      case OneDRank(a, asc) =>
        algo match {
          case Algo.Baseline          => new OneDBaseline(conn, base, a, asc)
          case Algo.Binary            => new OneDBinary(conn, base, a, asc)
          case Algo.Rerank | Algo.TA  => new OneDRerank(conn, base, a, asc, store)
        }
      case md @ MDRank(ws) =>
        val norm = normalizer(md.attrs)
        algo match {
          case Algo.Baseline => new MDBaseline(conn, base, LinearRanking(ws), norm)
          case Algo.Binary   => new MDBinary(conn, base, LinearRanking(ws), norm)
          case Algo.Rerank   => new MDRerank(conn, base, LinearRanking(ws), norm, store)
          case Algo.TA       => new MDTA(conn, base, LinearRanking(ws), norm, store)
        }
    }
    new Qr2Session(this, impl, acc, base, spec)
  }

  /** Boot-time cache verification (§II-B "before the system boots up we
    * verify the cache and update the changes from the web database"):
    * re-crawl every indexed region and rebuild the store content. Returns
    * the number of regions refreshed.
    */
  def verifyCache(): Int = {
    val conn    = new WebDbConn(db, serviceAcc)
    val entries = store.allEntries
    val fresh   = entries.map(e =>
      (e.box, Crawler.crawlQuery(conn, e.box.toQuery(WebQuery.all)): Seq[WebTuple]))
    store.replaceAll(fresh)
    entries.size
  }
}

/** One user session: incremental get-next / get-page over the chosen
  * strategy, plus the statistics panel of the demo UI (query cost and
  * processing time — §II-C "Search results and statistics").
  */
final class Qr2Session(
    val service: Qr2Service,
    private val impl: GetNexter,
    private val acc: Accountant,
    val base: WebQuery,
    val spec: RankSpec,
) {

  private val results = mutable.Buffer.empty[WebTuple]

  /** Tuples already shown to this user, in rank order. */
  def seen: Vector[WebTuple] = results.toVector

  def getNext(): Option[WebTuple] = {
    val t = impl.getNext()
    t.foreach(results += _)
    t
  }

  /** The next page of `pageSize` results (the demo's get-next button). */
  def getPage(pageSize: Int): Vector[WebTuple] = {
    val page = impl.next(pageSize)
    results ++= page
    page
  }

  /** Session cost so far (the statistics panel numbers). */
  def stats: DbStats = acc.snapshot

  /** Simulated processing time under the service's latency model. */
  def simulatedMs: Long = stats.simulatedMs(service.latencyMsPerRound)

  /** The statistics panel string, e.g. `"27 queries, 33.0 s"`. */
  def statsPanel: String =
    f"${stats.queries} queries, ${simulatedMs / 1000.0}%.1f s"

  /** Present the discovered results as a re-ranked DataFrame (the search
    * results table of the UI, produced by the distributed re-rank operator).
    */
  def resultsAsDataFrame(spark: SparkSession): DataFrame = {
    val schema = service.db.schema
    val df     = Reranker.tuplesToDataFrame(spark, schema, seen)
    spec match {
      case md: MDRank =>
        Reranker.rerank(df, md.toLinear, service.normalizer(md.attrs), schema.idCol)
      case od: OneDRank =>
        // 1D order is normalization-invariant; normalize over the domain.
        Reranker.rerank(df, od.toLinear, Normalizer.fromDomains(schema, od.attrs), schema.idCol)
    }
  }
}
