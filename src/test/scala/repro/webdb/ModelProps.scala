package repro.webdb

import org.scalacheck.{Gen, Prop, Properties}

/** ScalaCheck property suite over the predicate/region algebra. */
object ModelProps extends Properties("webdb.model") {

  private val genIv: Gen[Interval] = for {
    a  <- Gen.chooseNum(-50.0, 50.0)
    w  <- Gen.chooseNum(0.0, 30.0)
    li <- Gen.oneOf(true, false)
    hi <- Gen.oneOf(true, false)
  } yield Interval(a, a + w, li, hi)

  private val genV: Gen[Double] = Gen.chooseNum(-60.0, 60.0)

  private def tup(v: Double, w: Double): WebTuple =
    WebTuple(1L, Map("x" -> v, "y" -> w), Map.empty)

  property("intersect ∧-semantics") = Prop.forAll(genIv, genIv, genV) { (a, b, v) =>
    a.intersect(b).contains(v) == (a.contains(v) && b.contains(v))
  }

  property("intersect with self is identity on membership") = Prop.forAll(genIv, genV) { (a, v) =>
    a.intersect(a).contains(v) == a.contains(v)
  }

  property("subsetOf is reflexive") = Prop.forAll(genIv) { a => a.subsetOf(a) }

  property("subsetOf is transitive") = Prop.forAll(genIv, genIv, genIv) { (a, b, c) =>
    !(a.subsetOf(b) && b.subsetOf(c)) || a.subsetOf(c)
  }

  property("intersection is a subset of both operands") = Prop.forAll(genIv, genIv) { (a, b) =>
    val i = a.intersect(b)
    i.subsetOf(a) && i.subsetOf(b)
  }

  property("query conjunction = membership conjunction") =
    Prop.forAll(genIv, genIv, genV, genV) { (ix, iy, vx, vy) =>
      val q = WebQuery.all.and("x", ix).and("y", iy)
      q.matches(tup(vx, vy)) == (ix.contains(vx) && iy.contains(vy))
    }

  property("box split partitions membership") = Prop.forAll(genIv, genIv, genV, genV) {
    (ix, iy, vx, vy) =>
      val box = Box(Map("x" -> ix, "y" -> iy))
      val t   = tup(vx, vy)
      val (b1, b2) = box.split("x")
      box.contains(t) == (b1.contains(t) ^ b2.contains(t)) || !box.contains(t) && !b1.contains(t) && !b2.contains(t)
  }

  property("box children are contained in the parent (non-empty boxes)") =
    Prop.forAll(genIv, genIv) { (ix, iy) =>
      val box = Box(Map("x" -> ix, "y" -> iy))
      // The strategies only ever split non-empty boxes (push() filters them).
      box.isEmpty || {
        val (b1, b2) = box.split("y")
        b1.containedIn(box) && b2.containedIn(box)
      }
    }

  property("toQuery agrees with box membership") = Prop.forAll(genIv, genV) { (ix, v) =>
    val box = Box(Map("x" -> ix))
    box.toQuery().matches(tup(v, 0.0)) == box.contains(tup(v, 0.0))
  }

  property("KeySpace flip round-trip") = Prop.forAll(genIv, genV) { (iv, v) =>
    import repro.core.KeySpace
    val ks = KeySpace("x", asc = false, Interval(-60.0, 60.0))
    iv.contains(ks.key(v)) == ks.toRaw(iv).contains(v)
  }
}
