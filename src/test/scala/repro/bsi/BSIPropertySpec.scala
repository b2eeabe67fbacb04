package repro.bsi

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck properties over the full operator set — randomized column shapes
  * beyond the fixed seeds of the other suites. (scalatestplus is not on the
  * offline classpath, so properties run through ScalaCheck's own runner.)
  */
class BSIPropertySpec extends AnyFunSuite {
  import RefModel._

  private def check(prop: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(60), prop)
    assert(res.passed, res.status.toString)
  }

  private val genRef: Gen[Ref] = for {
    n   <- Gen.choose(0, 300)
    mx  <- Gen.oneOf(1L, 7L, 100L, 65535L, 1L << 24)
    u   <- Gen.oneOf(100, 5000, 1 << 20)
    seed <- Gen.choose(0L, Long.MaxValue / 2)
  } yield random(seed, n, u, mx)

  test("property: codec round-trip is identity") {
    check(Prop.forAll(genRef) { r => bsiToRef(BSICodec.deserialize(BSICodec.serialize(toBsi(r)))) == r })
  }

  test("property: add matches reference") {
    check(Prop.forAll(genRef, genRef) { (x, y) => bsiToRef(toBsi(x).add(toBsi(y))) == add(x, y) })
  }

  test("property: subtract matches reference") {
    check(Prop.forAll(genRef, genRef) { (x, y) =>
      bsiToRef(toBsi(x).subtract(toBsi(y))) == subtract(x, y)
    })
  }

  test("property: multiply matches reference (bounded values)") {
    val bounded = genRef.map(_.view.mapValues(v => (v % 65536) + 1).toMap)
    check(Prop.forAll(bounded, bounded) { (x, y) =>
      bsiToRef(toBsi(x).multiply(toBsi(y))) == multiply(x, y)
    })
  }

  test("property: lt/eq/gt partition the both-exist positions") {
    check(Prop.forAll(genRef, genRef) { (x, y) =>
      val (bx, by) = (toBsi(x), toBsi(y))
      val both = x.keySet.intersect(y.keySet)
      val lt = bitmapToSet(bx.lt(by)); val eq = bitmapToSet(bx.eqTo(by)); val gt = bitmapToSet(bx.gt(by))
      (lt ++ eq ++ gt) == both && lt.intersect(eq).isEmpty && lt.intersect(gt).isEmpty &&
        eq.intersect(gt).isEmpty
    })
  }

  test("property: constant comparisons match reference for arbitrary k") {
    val genK = Gen.oneOf(Gen.choose(0L, 10L), Gen.choose(0L, 1L << 26))
    check(Prop.forAll(genRef, genK) { (x, k) =>
      val b = toBsi(x)
      bitmapToSet(b.ltConst(k)) == compareConst(x, k, _ < _) &&
        bitmapToSet(b.leConst(k)) == compareConst(x, k, _ <= _) &&
        bitmapToSet(b.gtConst(k)) == compareConst(x, k, _ > _) &&
        bitmapToSet(b.geConst(k)) == compareConst(x, k, _ >= _) &&
        bitmapToSet(b.eqConst(k)) == compareConst(x, k, _ == _) &&
        bitmapToSet(b.neqConst(k)) == compareConst(x, k, _ != _)
    })
  }

  test("property: sumValues/count/min/max/median agree with the decoded column") {
    check(Prop.forAll(genRef) { r =>
      val b = toBsi(r)
      r.isEmpty ||
        (b.sumValues == r.values.sum && b.count == r.size &&
         b.minValue == r.values.min && b.maxValue == r.values.max &&
         b.median == r.values.toSeq.sorted.apply((r.size + 1) / 2 - 1))
    })
  }

  test("property: maxBSI is pointwise max with absent-as-zero") {
    check(Prop.forAll(genRef, genRef) { (x, y) =>
      bsiToRef(BSIAggregates.maxBSI(toBsi(x), toBsi(y))) == maxOf(x, y)
    })
  }

  test("property: distinctPos existence is the key union") {
    check(Prop.forAll(genRef, genRef) { (x, y) =>
      bitmapToSet(BSIAggregates.distinctPos(toBsi(x), toBsi(y)).existence) == (x.keySet ++ y.keySet)
    })
  }

  test("property: andBinary equals filterKeys") {
    check(Prop.forAll(genRef) { r =>
      val keep = r.keySet.filter(_ % 2 == 0)
      val bm = new org.roaringbitmap.RoaringBitmap()
      keep.foreach(bm.add)
      bsiToRef(toBsi(r).andBinary(bm)) == r.view.filterKeys(keep).toMap
    })
  }
}
