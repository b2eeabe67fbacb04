package repro.bsi

import scala.util.Random

/** Plain `Map[Int, Long]` reference semantics for BSI operations, mirroring
  * the paper's "zero = absent" convention: a map entry is a non-zero value at
  * a position. Every BSI operation has a reference twin here; tests assert
  * the compressed implementation matches on randomized inputs.
  */
object RefModel {

  type Ref = Map[Int, Long]

  /** Deterministic random column: `n` positions in [0, universe) with values
    * in [1, maxValue].
    */
  def random(seed: Long, n: Int, universe: Int, maxValue: Long): Ref = {
    val rnd = new Random(seed)
    Iterator.continually((rnd.nextInt(universe), 1L + math.abs(rnd.nextLong()) % maxValue))
      .take(n).toMap
  }

  def toBsi(ref: Ref): BSI = BSI.fromPairs(ref.iterator)

  def add(x: Ref, y: Ref): Ref =
    (x.keySet ++ y.keySet).iterator
      .map(p => p -> (x.getOrElse(p, 0L) + y.getOrElse(p, 0L)))
      .filter(_._2 != 0L).toMap

  /** Subtraction with underflow clamped to absent (the implementation's documented semantics). */
  def subtract(x: Ref, y: Ref): Ref =
    (x.keySet ++ y.keySet).iterator
      .map(p => p -> (x.getOrElse(p, 0L) - y.getOrElse(p, 0L)))
      .filter(_._2 > 0L).toMap

  def multiply(x: Ref, y: Ref): Ref =
    x.keySet.intersect(y.keySet).iterator.map(p => p -> x(p) * y(p)).filter(_._2 != 0).toMap

  def maxOf(x: Ref, y: Ref): Ref =
    (x.keySet ++ y.keySet).iterator
      .map(p => p -> math.max(x.getOrElse(p, 0L), y.getOrElse(p, 0L)))
      .filter(_._2 != 0L).toMap

  /** Positions where both exist and `cmp` holds. */
  def compare(x: Ref, y: Ref, cmp: (Long, Long) => Boolean): Set[Int] =
    x.keySet.intersect(y.keySet).filter(p => cmp(x(p), y(p)))

  /** Positions (existing, i.e. non-zero) where `cmp(value, k)` holds. */
  def compareConst(x: Ref, k: Long, cmp: (Long, Long) => Boolean): Set[Int] =
    x.keySet.filter(p => cmp(x(p), k))

  def bitmapToSet(bm: org.roaringbitmap.RoaringBitmap): Set[Int] = {
    val b = Set.newBuilder[Int]
    val it = bm.iterator()
    while (it.hasNext) b += it.next()
    b.result()
  }

  def bsiToRef(b: BSI): Ref = b.toPairs.toMap
}
