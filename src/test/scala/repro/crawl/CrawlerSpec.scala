package repro.crawl

import repro.webdb._
import repro.{SparkSpec, TestFixtures}

/** The hidden-DB crawler must retrieve *exactly* the matching set of any
  * region — completeness is what the general-positioning fix and the
  * dense-region index rely on.
  */
class CrawlerSpec extends SparkSpec {

  private def brute(db: LocalWebDb, q: WebQuery): Set[Long] =
    db.allTuples.filter(q.matches).map(_.id).toSet

  test("crawling a non-overflowing region costs a single query") {
    val db   = TestFixtures.diamonds(spark)
    val conn = new WebDbConn(db)
    val q    = WebQuery.all.and("price", Interval(200.0, 360.0))
    val ts   = Crawler.crawlQuery(conn, q)
    assert(ts.map(_.id).toSet == brute(db, q))
    assert(conn.acc.queries == 1)
  }

  test("crawling an overflowing range returns exactly the matching set") {
    val db   = TestFixtures.diamonds(spark)
    val conn = new WebDbConn(db)
    val q    = WebQuery.all.and("price", Interval(200.0, 2000.0))
    val expected = brute(db, q)
    assert(expected.size > db.k, "test premise: region overflows")
    val ts = Crawler.crawlQuery(conn, q)
    assert(ts.map(_.id).toSet == expected)
    assert(conn.acc.queries > 1)
    assert(conn.acc.crawlQueries == conn.acc.queries, "crawler traffic must be tagged")
  }

  test("point predicate with more than k matches (the lwr spike) crawls completely") {
    val db       = TestFixtures.diamonds(spark)
    val conn     = new WebDbConn(db)
    val q        = WebQuery.all.and("lwr", Interval.point(1.0))
    val expected = brute(db, q)
    assert(expected.size > 10 * db.k, s"premise: spike has ${expected.size} tuples")
    val ts = Crawler.crawlQuery(conn, q)
    assert(ts.map(_.id).toSet == expected)
  }

  test("point predicate combined with filters crawls the filtered subset") {
    val db       = TestFixtures.diamonds(spark)
    val conn     = new WebDbConn(db)
    val q        = WebQuery.all.and("lwr", Interval.point(1.0)).andCat("cut", Set("Ideal"))
    val expected = brute(db, q)
    val ts       = Crawler.crawlQuery(conn, q)
    assert(ts.map(_.id).toSet == expected)
  }

  test("crawling the whole database retrieves every tuple") {
    val db = TestFixtures.diamonds(spark, sf = 0.002)
    val conn = new WebDbConn(db)
    val ts   = Crawler.crawlQuery(conn, WebQuery.all)
    assert(ts.map(_.id).toSet == db.allTuples.map(_.id).toSet)
  }

  test("crawl of an empty region returns nothing after one query") {
    val db   = TestFixtures.diamonds(spark)
    val conn = new WebDbConn(db)
    val ts   = Crawler.crawlQuery(conn, WebQuery.all.and("price", Interval(200.0, 201.0)))
    assert(ts.isEmpty)
    assert(conn.acc.queries == 1)
  }

  test("crawler batches sub-queries into parallel rounds") {
    val db   = TestFixtures.diamonds(spark)
    val conn = new WebDbConn(db)
    Crawler.crawlQuery(conn, WebQuery.all.and("lwr", Interval.point(1.0)))
    val s = conn.acc.snapshot
    assert(s.parallelRounds > 0, "a big crawl must issue parallel rounds")
    assert(s.parallelQueryFraction > 0.5, s"parallel query fraction ${s.parallelQueryFraction}")
  }

  test("crawl cost scales with region population, not domain size") {
    val db    = TestFixtures.diamonds(spark)
    val cBig  = new WebDbConn(db)
    val cTiny = new WebDbConn(db)
    Crawler.crawlQuery(cBig, WebQuery.all.and("price", Interval(200.0, 3000.0)))
    Crawler.crawlQuery(cTiny, WebQuery.all.and("price", Interval(200.0, 500.0)))
    assert(cTiny.acc.queries < cBig.acc.queries)
  }

  test("no duplicate tuples in the crawl result") {
    val db = TestFixtures.diamonds(spark)
    val ts = Crawler.crawlQuery(new WebDbConn(db), WebQuery.all.and("carat", Interval(0.2, 0.3)))
    assert(ts.map(_.id).distinct.size == ts.size)
  }
}
