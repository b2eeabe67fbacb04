package repro.adhoc

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.jdk.CollectionConverters._

import org.roaringbitmap.RoaringBitmap
import repro.bsi.BSI

/** In-process substitute for the paper's ClickHouse ad-hoc tier (§5.3):
  * each *segment* of data lives in one in-memory "node shard" and queries run
  * segment-parallel on a fixed thread pool, exactly the locality/parallelism
  * structure of Fig. 8. Both §6.3 methods are implemented:
  *
  *   - BSI method: expose offsets and metric values are BSIs; the expose
  *     filter is a constant comparison on the offset BSI and the sum is an
  *     in-BSI aggregate — all on compressed data;
  *   - normal method: per-day expose *bitmaps* are cached per strategy (the
  *     paper notes ClickHouse joins are slow, so the baseline also avoids a
  *     join); metric rows are scanned columnar and filtered by
  *     `bitmap.contains(pos)`, then hash-free accumulated.
  *
  * Query shape: for (strategies × metrics × dates) return per-(strategy,
  * metric, date) total sum and exposed count (the scorecard numbers a deep
  * dive renders).
  */
final class AdhocEngine(val nSegments: Int, nThreads: Int = Runtime.getRuntime.availableProcessors()) {
  import AdhocEngine.Cell


  /** BSI store: (segment, metric, date) → value BSI. */
  private val metricBsi = new java.util.concurrent.ConcurrentHashMap[(Int, Int, Int), BSI]()
  /** BSI store: (segment, strategy) → (minExposeDate, offset BSI). */
  private val exposeBsi = new java.util.concurrent.ConcurrentHashMap[(Int, Long), (Int, BSI)]()

  /** Normal store: (segment, metric, date) → columnar (positions, values). */
  private val metricRows = new java.util.concurrent.ConcurrentHashMap[(Int, Int, Int), (Array[Int], Array[Long])]()
  /** Normal store: (segment, strategy, date) → bitmap of units exposed by that date. */
  private val exposeBitmaps = new java.util.concurrent.ConcurrentHashMap[(Int, Long, Int), RoaringBitmap]()

  def loadMetricBsi(segment: Int, metricId: Int, date: Int, bsi: BSI): Unit =
    metricBsi.put((segment, metricId, date), bsi)

  def loadExposeBsi(segment: Int, strategyId: Long, minExposeDate: Int, offset: BSI): Unit =
    exposeBsi.put((segment, strategyId), (minExposeDate, offset))

  def loadMetricRows(segment: Int, metricId: Int, date: Int,
                     positions: Array[Int], values: Array[Long]): Unit =
    metricRows.put((segment, metricId, date), (positions, values))

  /** Derive and cache the per-day expose bitmaps for the normal method from an
    * already-loaded expose BSI (positions with `offset <= date - min + 1`).
    */
  def buildExposeBitmaps(segment: Int, strategyId: Long, dates: Seq[Int]): Unit = {
    val (minDate, offset) = exposeBsi.get((segment, strategyId))
    dates.foreach { d =>
      exposeBitmaps.put((segment, strategyId, d), offset.leConst((d - minDate + 1).toLong))
    }
  }

  private def runSegmentParallel[T](f: Int => Seq[T]): Seq[T] = {
    val pool = Executors.newFixedThreadPool(nThreads)
    try {
      val tasks = (0 until nSegments).map(s => new Callable[Seq[T]] { def call(): Seq[T] = f(s) })
      pool.invokeAll(tasks.asJava).asScala.toSeq.flatMap(_.get())
    } finally { pool.shutdown(); pool.awaitTermination(1, TimeUnit.MINUTES) }
  }

  private def mergeCells(parts: Seq[Cell]): Seq[Cell] =
    parts.groupBy(c => (c.strategyId, c.metricId, c.date)).map { case ((st, m, d), cs) =>
      Cell(st, m, d, cs.map(_.sum).sum, cs.map(_.exposedCnt).sum)
    }.toSeq.sortBy(c => (c.strategyId, c.metricId, c.date))

  /** §6.3 BSI method. */
  def queryBsi(strategyIds: Seq[Long], metricIds: Seq[Int], dates: Seq[Int]): Seq[Cell] =
    mergeCells(runSegmentParallel { seg =>
      for {
        st <- strategyIds
        (minDate, offset) = exposeBsi.getOrDefault((seg, st), (0, BSI.empty))
        d <- dates
        expose = offset.leConst(math.max(0L, (d - minDate + 1).toLong))
        m <- metricIds
      } yield {
        val value = metricBsi.getOrDefault((seg, m, d), BSI.empty)
        Cell(st, m, d, value.filteredSum(expose), expose.getLongCardinality)
      }
    })

  /** §6.3 normal method: scan the metric rows of each (segment, metric, date)
    * once and test membership in each strategy's cached expose bitmap.
    */
  def queryNormal(strategyIds: Seq[Long], metricIds: Seq[Int], dates: Seq[Int]): Seq[Cell] =
    mergeCells(runSegmentParallel { seg =>
      val out = Seq.newBuilder[Cell]
      for (d <- dates; m <- metricIds) {
        val (pos, values) = metricRows.getOrDefault((seg, m, d), (Array.empty[Int], Array.empty[Long]))
        for (st <- strategyIds) {
          val bm = exposeBitmaps.get((seg, st, d))
          var sum = 0L
          var i = 0
          while (i < pos.length) {
            if (bm.contains(pos(i))) sum += values(i)
            i += 1
          }
          out += Cell(st, m, d, sum, bm.getLongCardinality)
        }
      }
      out.result()
    })
}

object AdhocEngine {
  /** One result cell: totals over all segments for a (strategy, metric, date). */
  final case class Cell(strategyId: Long, metricId: Int, date: Int, sum: Long, exposedCnt: Long)
}
