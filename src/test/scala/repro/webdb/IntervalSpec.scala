package repro.webdb

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

/** Interval algebra: bounds semantics, intersection, subset — the geometry
  * every search strategy relies on. Randomized checks use a fixed seed so
  * runs are reproducible.
  */
class IntervalSpec extends AnyFunSuite {

  private def rndIv(r: Random): Interval = {
    val a = r.between(-100.0, 100.0)
    val b = r.between(-100.0, 100.0)
    Interval(math.min(a, b), math.max(a, b), r.nextBoolean(), r.nextBoolean())
  }

  test("closed interval contains its endpoints") {
    val iv = Interval(1.0, 2.0)
    assert(iv.contains(1.0) && iv.contains(2.0) && iv.contains(1.5))
    assert(!iv.contains(0.999) && !iv.contains(2.001))
  }

  test("open bounds exclude their endpoint") {
    assert(!Interval.openClosed(1.0, 2.0).contains(1.0))
    assert(Interval.openClosed(1.0, 2.0).contains(2.0))
    assert(!Interval.open(1.0, 2.0).contains(1.0))
    assert(!Interval.open(1.0, 2.0).contains(2.0))
  }

  test("point interval") {
    val p = Interval.point(3.0)
    assert(p.isPoint && p.contains(3.0) && !p.isEmpty && p.width == 0.0)
  }

  test("degenerate half-open interval is empty") {
    assert(Interval(1.0, 1.0, loIncl = false, hiIncl = true).isEmpty)
    assert(Interval(1.0, 1.0, loIncl = true, hiIncl = false).isEmpty)
    assert(Interval(2.0, 1.0).isEmpty)
  }

  test("intersection membership equals conjunction of memberships (500 random cases)") {
    val r = new Random(1)
    (1 to 500).foreach { _ =>
      val (a, b) = (rndIv(r), rndIv(r))
      val v      = r.between(-120.0, 120.0)
      assert(a.intersect(b).contains(v) == (a.contains(v) && b.contains(v)), s"$a ∩ $b at $v")
      // endpoints too — the interesting cases
      Seq(a.lo, a.hi, b.lo, b.hi).foreach { e =>
        assert(a.intersect(b).contains(e) == (a.contains(e) && b.contains(e)), s"$a ∩ $b at endpoint $e")
      }
    }
  }

  test("intersection is commutative on membership (500 random cases)") {
    val r = new Random(2)
    (1 to 500).foreach { _ =>
      val (a, b) = (rndIv(r), rndIv(r))
      Seq(a.lo, a.hi, b.lo, b.hi, r.between(-120.0, 120.0)).foreach { v =>
        assert(a.intersect(b).contains(v) == b.intersect(a).contains(v))
      }
    }
  }

  test("subsetOf implies membership inclusion (500 random cases)") {
    val r = new Random(3)
    (1 to 500).foreach { _ =>
      val (a, b) = (rndIv(r), rndIv(r))
      if (a.subsetOf(b))
        Seq(a.lo, a.hi, a.mid, r.between(-120.0, 120.0)).foreach { v =>
          assert(!a.contains(v) || b.contains(v), s"$a ⊆ $b but $v only in a")
        }
    }
  }

  test("an interval is a subset of itself and of a strict superset") {
    val iv = Interval(1.0, 2.0, loIncl = false, hiIncl = true)
    assert(iv.subsetOf(iv))
    assert(iv.subsetOf(Interval(0.0, 3.0)))
    assert(iv.subsetOf(Interval(1.0, 2.0))) // open lo fits inside closed lo
    assert(!Interval(1.0, 2.0).subsetOf(iv)) // closed lo does not fit inside open lo
  }

  test("empty interval is subset of anything") {
    val r = new Random(4)
    (1 to 100).foreach(_ => assert(Interval(5.0, 4.0).subsetOf(rndIv(r))))
  }

  test("mid lies inside any non-degenerate closed interval (200 random cases)") {
    val r = new Random(5)
    (1 to 200).foreach { _ =>
      val iv = rndIv(r).copy(loIncl = true, hiIncl = true)
      if (iv.width > 0) assert(iv.contains(iv.mid))
    }
  }
}
