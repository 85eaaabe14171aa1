package repro.service

import java.nio.file.Files
import repro.webdb._
import repro.{SparkSpec, TestFixtures}

/** Dense-region store semantics: containment lookup, 1D coverage, Parquet
  * persistence (the MySQL-cache substitution).
  */
class DenseRegionStoreSpec extends SparkSpec {

  private def t(id: Long, v: Double): WebTuple =
    WebTuple(id, Map("x" -> v), Map.empty)

  test("lookupBox hits only regions containing the probe box") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 10.0))), Seq(t(1, 5.0)))
    assert(s.lookupBox(Box(Map("x" -> Interval(2.0, 3.0)))).isDefined)
    assert(s.lookupBox(Box(Map("x" -> Interval(5.0, 12.0)))).isEmpty)
    assert(s.lookupBox(Box(Map("y" -> Interval(2.0, 3.0)))).isEmpty,
      "a probe on a different attribute is unconstrained on x and must miss")
  }

  test("lookupBox with multi-dim entries requires containment on every entry dim") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 10.0), "y" -> Interval(0.0, 1.0))), Seq(t(1, 5.0)))
    assert(s.lookupBox(Box(Map("x" -> Interval(1.0, 2.0), "y" -> Interval(0.2, 0.5)))).isDefined)
    assert(s.lookupBox(Box(Map("x" -> Interval(1.0, 2.0)))).isEmpty,
      "probe unconstrained on y is not contained in the entry")
  }

  test("coverageFrom covers frontiers inside the region and skips those at its end") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(1.0, 2.0))), Seq(t(1, 1.5)))
    assert(s.coverageFrom("x", asc = true, 0.9).isEmpty, "region starts above the frontier")
    val Some((end, incl, ts)) = s.coverageFrom("x", asc = true, 1.2)
    assert(end == 2.0 && incl && ts.map(_.id) == Vector(1L))
    assert(s.coverageFrom("x", asc = true, 2.0).isEmpty,
      "a region ending at the frontier covers nothing beyond it")
    assert(s.coverageFrom("x", asc = true, 1.0).isDefined,
      "closed region covers the neighbourhood above its own lower bound")
  }

  test("coverageFrom in descending key space flips the interval") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(1.0, 2.0))), Seq(t(1, 1.5)))
    // keys are −x: the region covers keys [−2, −1]
    val Some((end, _, _)) = s.coverageFrom("x", asc = false, -1.8)
    assert(end == -1.0)
    assert(s.coverageFrom("x", asc = false, -0.5).isEmpty)
  }

  test("coverageFrom prefers the furthest-reaching entry") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 1.0))), Seq(t(1, 0.5)))
    s.add(Box(Map("x" -> Interval(0.0, 3.0))), Seq(t(2, 2.5)))
    val Some((end, _, ts)) = s.coverageFrom("x", asc = true, 0.2)
    assert(end == 3.0 && ts.map(_.id) == Vector(2L))
  }

  test("coverageFrom ignores multi-dimensional entries") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 10.0), "y" -> Interval(0.0, 1.0))), Seq(t(1, 5.0)))
    assert(s.coverageFrom("x", asc = true, 1.0).isEmpty)
  }

  test("replaceAll swaps the content atomically") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 1.0))), Seq(t(1, 0.5)))
    s.replaceAll(Seq((Box(Map("x" -> Interval(5.0, 6.0))), Seq(t(9, 5.5)))))
    assert(s.size == 1)
    assert(s.lookupBox(Box(Map("x" -> Interval(5.2, 5.8)))).get.map(_.id) == Vector(9L))
    assert(s.lookupBox(Box(Map("x" -> Interval(0.2, 0.8)))).isEmpty)
  }

  test("persist/load round-trips regions and tuples through Parquet") {
    val db  = TestFixtures.diamonds(spark, 0.002)
    val s   = new DenseRegionStore
    val box = Box(Map("lwr" -> Interval.point(1.0)))
    val ts  = db.allTuples.filter(_.num("lwr") == 1.0)
    s.add(box, ts)
    s.add(Box(Map("price" -> Interval(200.0, 500.0))), db.allTuples.filter(_.num("price") <= 500.0))
    val dir = Files.createTempDirectory("qr2-store").toString
    s.persist(spark, db.schema, dir)
    val loaded = DenseRegionStore.load(spark, db.schema, dir)
    assert(loaded.size == s.size)
    assert(loaded.lookupBox(box).get.map(_.id).sorted == ts.map(_.id).sorted)
    // full tuple content (numeric + categorical) survives
    val orig = ts.sortBy(_.id)
    assert(loaded.lookupBox(box).get.sortBy(_.id) == orig)
  }

  test("toDataFrame deduplicates tuples shared by several regions") {
    val db = TestFixtures.diamonds(spark, 0.002)
    val s  = new DenseRegionStore
    val ts = db.allTuples.take(20)
    s.add(Box(Map("price" -> Interval(0.0, 1e6))), ts)
    s.add(Box(Map("carat" -> Interval(0.0, 10.0))), ts.take(10))
    val df = s.toDataFrame(spark, db.schema)
    assert(df.count() == 20)
  }

  test("indexedTupleCount sums entry sizes") {
    val s = new DenseRegionStore
    s.add(Box(Map("x" -> Interval(0.0, 1.0))), Seq(t(1, 0.5), t(2, 0.6)))
    s.add(Box(Map("x" -> Interval(2.0, 3.0))), Seq(t(3, 2.5)))
    assert(s.indexedTupleCount == 3)
    assert(s.size == 2)
  }
}
