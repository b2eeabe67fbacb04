package repro.bsi

import org.roaringbitmap.RoaringBitmap

/** Mutable accumulator for building a [[BSI]] from `(position, value)` rows.
  *
  * `put` assumes each position is seen once (the common case after position
  * encoding: one row per analysis unit) and just sets the value's bits —
  * O(popcount) per row. `addTo` handles repeated positions by summing, which is
  * what a grouped `bsi_build` aggregation needs when the same unit contributes
  * several rows (e.g. page-view-level raw rows rolled up to a unit).
  *
  * Java-serializable (RoaringBitmap is Externalizable) so it can serve as a
  * Spark `Aggregator` buffer; serialization only happens at shuffle boundaries.
  */
final class BSIBuilder extends Serializable {
  private var slices = new Array[RoaringBitmap](8)
  private var top    = 0 // number of slice cells in use

  private def ensure(n: Int): Unit = {
    if (n > slices.length) {
      val grown = new Array[RoaringBitmap](math.max(n, slices.length * 2))
      System.arraycopy(slices, 0, grown, 0, top)
      slices = grown
    }
    while (top < n) { slices(top) = new RoaringBitmap(); top += 1 }
  }

  /** Set `pos` to `value`, assuming `pos` was not added before. Zero is a no-op. */
  def put(pos: Int, value: Long): this.type = {
    require(value >= 0, s"BSI values are non-negative; got $value at pos $pos")
    if (value == 0) return this
    ensure(64 - java.lang.Long.numberOfLeadingZeros(value))
    var v = value
    while (v != 0) {
      val i = java.lang.Long.numberOfTrailingZeros(v)
      slices(i).add(pos)
      v &= v - 1
    }
    this
  }

  /** Current value at `pos` (for additive accumulation). */
  def get(pos: Int): Long = {
    var v = 0L
    var i = 0
    while (i < top) {
      if (slices(i).contains(pos)) v |= (1L << i)
      i += 1
    }
    v
  }

  /** Add `value` to whatever `pos` currently holds (read–modify–write). */
  def addTo(pos: Int, value: Long): this.type = {
    require(value >= 0, s"BSI values are non-negative; got $value at pos $pos")
    if (value == 0) return this
    val old = get(pos)
    if (old == 0) return put(pos, value)
    var i = 0
    while (i < top) { slices(i).remove(pos); i += 1 }
    put(pos, old + value)
  }

  private def existenceBm: RoaringBitmap = {
    val ex = new RoaringBitmap()
    var i = 0
    while (i < top) { ex.or(slices(i)); i += 1 }
    ex
  }

  /** Fold another builder in, summing on colliding positions. Disjoint
    * positions (the common case across Spark partitions) merge by slice-wise
    * OR; only colliding positions pay the read–modify–write path.
    */
  def merge(that: BSIBuilder): this.type = {
    val collide = RoaringBitmap.and(this.existenceBm, that.existenceBm)
    ensure(that.top)
    var i = 0
    while (i < that.top) {
      if (collide.isEmpty) slices(i).or(that.slices(i))
      else slices(i).or(RoaringBitmap.andNot(that.slices(i), collide))
      i += 1
    }
    val it = collide.iterator()
    while (it.hasNext) {
      val p = it.next()
      addTo(p, that.get(p))
    }
    this
  }

  /** Finish: run-optimized immutable BSI. The builder may be reused afterwards
    * only via fresh `put`s on new positions (slices are handed over, not copied).
    */
  def result(): BSI = {
    val bsi = BSI.fromSlices(java.util.Arrays.copyOf(slices, top))
    bsi.runOptimize()
    bsi
  }
}
