package repro.bsi

import org.scalatest.funsuite.AnyFunSuite

/** Structure, construction and accessors of [[BSI]]. */
class BSIBasicSpec extends AnyFunSuite {

  test("empty BSI has no slices, no positions, zero everywhere") {
    assert(BSI.empty.isEmpty)
    assert(BSI.empty.numSlices == 0)
    assert(BSI.empty.count == 0)
    assert(BSI.empty.get(0) == 0L)
    assert(BSI.empty.get(123456) == 0L)
  }

  test("fromPairs drops zero values (zero = absent)") {
    val b = BSI.fromPairs(Seq(1 -> 0L, 2 -> 5L, 3 -> 0L))
    assert(b.count == 1)
    assert(b.get(1) == 0L && b.get(3) == 0L && b.get(2) == 5L)
  }

  test("figure 1 example: values decode back exactly") {
    // the paper's Figure 1: ids 1..8 with C = 5,0,127,23,200,9,64,39
    val vals = Seq(1 -> 5L, 3 -> 127L, 4 -> 23L, 5 -> 200L, 6 -> 9L, 7 -> 64L, 8 -> 39L)
    val b = BSI.fromPairs(vals)
    vals.foreach { case (p, v) => assert(b.get(p) == v, s"pos $p") }
    assert(b.get(2) == 0L) // id 2 has C = 0 → absent
    assert(b.numSlices == 8) // 200 needs 8 bits
    assert(b.count == 7)
  }

  test("figure 1 example: slices match the binary columns") {
    val b = BSI.fromPairs(Seq(1 -> 5L, 3 -> 127L, 4 -> 23L, 5 -> 200L, 6 -> 9L, 7 -> 64L, 8 -> 39L))
    // B^0 column of Figure 1: rows 1, 3, 4, 6, 8
    assert(RefModel.bitmapToSet(b.slice(0)) == Set(1, 3, 4, 6, 8))
    // B^7: only row 5 (200 = 11001000b)
    assert(RefModel.bitmapToSet(b.slice(7)) == Set(5))
    // B^6: rows 3 (127), 5 (200), 7 (64)
    assert(RefModel.bitmapToSet(b.slice(6)) == Set(3, 5, 7))
  }

  test("trailing empty slices are trimmed") {
    val b = BSI.fromPairs(Seq(0 -> 3L)) // needs 2 slices only
    assert(b.numSlices == 2)
    assert(b.slice(5).isEmpty) // out-of-range access is safe
  }

  test("existence is the OR of all slices") {
    val b = BSI.fromPairs(Seq(10 -> 4L, 20 -> 3L, 30 -> 1L))
    assert(RefModel.bitmapToSet(b.existence) == Set(10, 20, 30))
  }

  test("fromBitmap wraps a binary bitmap as a 1-slice BSI") {
    val bm = org.roaringbitmap.RoaringBitmap.bitmapOf(1, 5, 9)
    val b = BSI.fromBitmap(bm)
    assert(b.numSlices == 1)
    assert(b.get(5) == 1L && b.get(2) == 0L)
    bm.add(100) // cloned: later mutation must not leak in
    assert(b.get(100) == 0L)
  }

  test("equals compares slice content") {
    val a = BSI.fromPairs(Seq(1 -> 7L, 9 -> 2L))
    val b = BSI.fromPairs(Seq(9 -> 2L, 1 -> 7L))
    val c = BSI.fromPairs(Seq(1 -> 7L, 9 -> 3L))
    assert(a == b)
    assert(a != c)
    assert(a.hashCode == b.hashCode)
  }

  test("toPairs round-trips") {
    val ref = RefModel.random(7, 500, 10000, 1 << 20)
    assert(RefModel.bsiToRef(RefModel.toBsi(ref)) == ref)
  }

  test("large positions (beyond 2^20) work") {
    val b = BSI.fromPairs(Seq((1 << 24) -> 42L, 0 -> 1L))
    assert(b.get(1 << 24) == 42L)
    assert(b.count == 2)
  }

  test("values requiring many slices round-trip") {
    val big = (1L << 40) + 12345L
    val b = BSI.fromPairs(Seq(3 -> big))
    assert(b.numSlices == 41)
    assert(b.get(3) == big)
    assert(b.sumValues == big)
  }

  test("builder rejects negative values") {
    intercept[IllegalArgumentException](new BSIBuilder().put(0, -1L))
  }

  test("shiftSlices multiplies by powers of two") {
    val b = BSI.fromPairs(Seq(1 -> 3L, 2 -> 5L)).shiftSlices(3)
    assert(b.get(1) == 24L && b.get(2) == 40L)
  }
}
