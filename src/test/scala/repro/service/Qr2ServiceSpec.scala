package repro.service

import repro.webdb._
import repro.{SparkSpec, TestFixtures}

/** End-to-end service behaviour: normalization discovery, sessions over
  * every strategy, paging, statistics, cache sharing, boot verification.
  */
class Qr2ServiceSpec extends SparkSpec {

  test("minMax discovery through 1D-RERANK equals the true extrema") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    for (a <- Seq("price", "carat", "depth")) {
      val vs = db.allTuples.map(_.num(a))
      assert(service.minMax(a) == ((vs.min, vs.max)), s"attr $a")
    }
  }

  test("minMax is cached: the second call issues no further queries") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    service.minMax("price")
    val q1 = service.serviceAcc.queries
    assert(q1 > 0)
    service.minMax("price")
    assert(service.serviceAcc.queries == q1)
  }

  test("service normalizer equals the data-true normalizer") {
    val db      = TestFixtures.houses(spark)
    val service = new Qr2Service(db)
    val n       = service.normalizer(Seq("price", "sqft"))
    assert(n.minMax == TestFixtures.trueNorm(db, Seq("price", "sqft")).minMax)
  }

  for (algo <- Algo.all) {
    test(s"session over $algo emits the ground-truth MD order") {
      val db      = TestFixtures.diamonds(spark)
      val service = new Qr2Service(db)
      val spec    = MDRank(Seq("price" -> 1.0, "carat" -> -0.5))
      val session = service.newSession(WebQuery.all, spec, algo)
      val got     = session.getPage(8)
      val truth = TestFixtures
        .groundTruth(db, WebQuery.all, spec.toLinear, service.normalizer(spec.attrs))
        .take(8)
      assert(got.map(_.id) == truth.map(_.id))
    }
  }

  for (algo <- Seq(Algo.Baseline, Algo.Binary, Algo.Rerank)) {
    test(s"session over $algo emits the ground-truth 1D order (desc)") {
      val db      = TestFixtures.diamonds(spark)
      val service = new Qr2Service(db)
      val session = service.newSession(WebQuery.all, OneDRank("price", asc = false), algo)
      val got     = session.getPage(8)
      val truth   = TestFixtures.groundTruth1D(db, WebQuery.all, "price", asc = false).take(8)
      assert(got.map(_.id) == truth.map(_.id))
    }
  }

  test("Algo.TA on a 1D spec degenerates to RERANK and still works") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val got     = service.newSession(WebQuery.all, OneDRank("depth", asc = true), Algo.TA).getPage(5)
    val truth   = TestFixtures.groundTruth1D(db, WebQuery.all, "depth", asc = true).take(5)
    assert(got.map(_.id) == truth.map(_.id))
  }

  test("successive pages concatenate to the ground-truth prefix (get-next button)") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val spec    = MDRank(Seq("price" -> 1.0, "carat" -> -0.1))
    val session = service.newSession(WebQuery.all, spec, Algo.Rerank)
    val p1      = session.getPage(5)
    val p2      = session.getPage(5)
    val truth = TestFixtures
      .groundTruth(db, WebQuery.all, spec.toLinear, service.normalizer(spec.attrs))
      .take(10)
    assert((p1 ++ p2).map(_.id) == truth.map(_.id))
    assert(session.seen.map(_.id) == truth.map(_.id))
  }

  test("filtered session honours the user predicate") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val base    = WebQuery.all.andCat("shape", Set("Round", "Oval"))
    val session = service.newSession(base, OneDRank("carat", asc = false), Algo.Rerank)
    val got     = session.getPage(6)
    assert(got.forall(t => Set("Round", "Oval").contains(t.cat("shape"))))
    assert(got.map(_.id) == TestFixtures.groundTruth1D(db, base, "carat", asc = false).take(6).map(_.id))
  }

  test("statistics panel reports queries and simulated latency") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val session = service.newSession(WebQuery.all, OneDRank("price"), Algo.Baseline)
    session.getPage(5)
    val s = session.stats
    assert(s.queries > 0 && s.rounds > 0)
    assert(session.simulatedMs == s.rounds * service.latencyMsPerRound)
    assert(session.statsPanel.matches("""\d+ queries, \d+\.\d s"""), session.statsPanel)
  }

  test("sessions share the dense-region store: the second user pays less") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val s1      = service.newSession(WebQuery.all, OneDRank("lwr", asc = true), Algo.Rerank)
    s1.getPage(10)
    val s2 = service.newSession(WebQuery.all.andCat("cut", Set("Good")), OneDRank("lwr", asc = true), Algo.Rerank)
    s2.getPage(10)
    assert(s2.stats.queries < s1.stats.queries / 5,
      s"first=${s1.stats.queries} second=${s2.stats.queries}")
    assert(service.store.size > 0)
  }

  test("verifyCache re-crawls every region and keeps the content consistent") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    service.newSession(WebQuery.all, OneDRank("lwr", asc = true), Algo.Rerank).getPage(10)
    val before = service.store.allEntries.map(e => e.box -> e.tuples.map(_.id).toSet).toMap
    assert(before.nonEmpty)
    val refreshed = service.verifyCache()
    assert(refreshed == before.size)
    val after = service.store.allEntries.map(e => e.box -> e.tuples.map(_.id).toSet).toMap
    assert(after == before, "static database: verification must reproduce identical content")
  }

  test("resultsAsDataFrame presents the page in user-ranking order") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val spec    = MDRank(Seq("price" -> 1.0, "carat" -> -0.5))
    val session = service.newSession(WebQuery.all, spec, Algo.Binary)
    session.getPage(8)
    val ids = session.resultsAsDataFrame(spark).select("id").collect().map(_.getLong(0)).toSeq
    assert(ids == session.seen.map(_.id))
  }

  test("an exhausted session keeps returning empty pages") {
    val db      = TestFixtures.diamonds(spark)
    val service = new Qr2Service(db)
    val base    = WebQuery.all.and("price", Interval(200.0, 400.0))
    val session = service.newSession(base, OneDRank("price"), Algo.Rerank)
    val total   = TestFixtures.groundTruth1D(db, base, "price", asc = true).size
    val all     = session.getPage(total + 10)
    assert(all.size == total)
    assert(session.getPage(5).isEmpty)
  }
}
