package repro.bsi

import org.scalatest.funsuite.AnyFunSuite

/** Comparison operators (Algorithms 1–3 and the constant-range variants)
  * against the reference model. Both-operands-nonzero semantics are asserted
  * explicitly on positions existing in only one BSI.
  */
class BSICompareSpec extends AnyFunSuite {
  import RefModel._

  private val shapes = Seq(
    (64, 30, 3L), (1000, 400, 50L), (1000, 400, 1L << 16), (50000, 1500, 1L << 30))

  private val bsiOps: Seq[(String, (BSI, BSI) => org.roaringbitmap.RoaringBitmap, (Long, Long) => Boolean)] =
    Seq(
      ("lt", _.lt(_), _ < _), ("le", _.le(_), _ <= _), ("gt", _.gt(_), _ > _),
      ("ge", _.ge(_), _ >= _), ("eq", _.eqTo(_), _ == _), ("neq", _.neq(_), _ != _))

  for (((u, n, mx), i) <- shapes.zipWithIndex; (name, op, ref) <- bsiOps) {
    test(s"$name vs BSI matches reference (shape $i)") {
      for (seed <- 0 until 3) {
        val rx = random(seed * 7 + i * 1000, n, u, mx)
        val ry = random(seed * 7 + 3 + i * 1000, n, u, mx)
        assert(bitmapToSet(op(toBsi(rx), toBsi(ry))) == compare(rx, ry, ref),
          s"seed=$seed op=$name")
      }
    }
  }

  private val constOps: Seq[(String, (BSI, Long) => org.roaringbitmap.RoaringBitmap, (Long, Long) => Boolean)] =
    Seq(
      ("ltConst", _.ltConst(_), _ < _), ("leConst", _.leConst(_), _ <= _),
      ("gtConst", _.gtConst(_), _ > _), ("geConst", _.geConst(_), _ >= _),
      ("eqConst", _.eqConst(_), _ == _), ("neqConst", _.neqConst(_), _ != _))

  for (((u, n, mx), i) <- shapes.zipWithIndex; (name, op, ref) <- constOps) {
    test(s"$name matches reference across constants (shape $i)") {
      val rx = random(i * 31 + 5, n, u, mx)
      val b  = toBsi(rx)
      val ks = Seq(0L, 1L, 2L, 3L, mx / 2, mx - 1, mx, mx + 1, 2 * mx + 3)
      ks.foreach { k =>
        assert(bitmapToSet(op(b, k)) == compareConst(rx, k, ref), s"k=$k op=$name")
      }
    }
  }

  test("comparisons require both operands non-zero (one-sided positions never match)") {
    val x = BSI.fromPairs(Seq(1 -> 5L, 2 -> 9L))           // pos 2 only in x
    val y = BSI.fromPairs(Seq(1 -> 7L, 3 -> 2L))           // pos 3 only in y
    assert(bitmapToSet(x.lt(y)) == Set(1))                 // 5 < 7; 0<2 at pos 3 excluded
    assert(bitmapToSet(x.gt(y)) == Set.empty[Int])         // 9>0 at pos 2 excluded
    assert(bitmapToSet(x.neq(y)) == Set(1))
    assert(bitmapToSet(x.eqTo(y)) == Set.empty[Int])
  }

  test("equal values on both sides: eq matches, lt/gt/neq empty") {
    val r = random(77, 300, 2000, 1000)
    val b = toBsi(r)
    assert(bitmapToSet(b.eqTo(b)) == r.keySet)
    assert(b.lt(b).isEmpty && b.gt(b).isEmpty && b.neq(b).isEmpty)
    assert(bitmapToSet(b.le(b)) == r.keySet)
    assert(bitmapToSet(b.ge(b)) == r.keySet)
  }

  test("gtConst(0) is existence; ltConst(0)/leConst(-1) empty; eqConst(0) empty") {
    val r = random(88, 200, 1000, 64L)
    val b = toBsi(r)
    assert(bitmapToSet(b.gtConst(0)) == r.keySet)
    assert(b.ltConst(0).isEmpty)
    assert(b.eqConst(0).isEmpty)
    assert(bitmapToSet(b.geConst(0)) == r.keySet)
    assert(bitmapToSet(b.geConst(1)) == r.keySet)
  }

  test("betweenConst is the paper's offset range filter") {
    // §4.1.2: select exposures with 2 <= offset <= 5
    val offsets = Map(0 -> 1L, 1 -> 2L, 2 -> 3L, 3 -> 5L, 4 -> 6L, 5 -> 4L)
    val b = BSI.fromPairs(offsets)
    assert(bitmapToSet(b.betweenConst(2, 5)) == Set(1, 2, 3, 5))
  }

  test("constant larger than any slice: everything is less") {
    val b = BSI.fromPairs(Seq(1 -> 3L, 2 -> 7L))
    assert(bitmapToSet(b.ltConst(1L << 40)) == Set(1, 2))
    assert(b.gtConst(1L << 40).isEmpty)
    assert(b.eqConst(1L << 40).isEmpty)
  }
}
