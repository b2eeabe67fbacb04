package repro.eval

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.jdk.CollectionConverters._

import repro.adhoc.AdhocEngine
import repro.bsi.BSIBuilder
import repro.expgen.ExperimentGen

/** Table 8 — average latency of ad-hoc queries computing the 105 core metrics
  * for an experiment with 3 strategies over one week, BSI method vs normal
  * method, both on the ClickHouse-substitute [[AdhocEngine]] (§5.3, §6.3).
  *
  * Shard data is generated directly into the engine, segment-parallel, with
  * the same distributions as [[ExperimentGen]] (Table 3 value ranges,
  * Pareto-concentrated values, geometric expose offsets). Density matters for
  * fidelity: the paper runs ~200k users per ClickHouse segment, where Roaring
  * slices sit in bitmap containers and operate word-parallel — the per-segment
  * user count here is chosen to stay in that regime.
  */
object Table8Eval {

  final case class Result(bsiSec: Double, normalSec: Double, cells: Int, rendered: String)

  private def mix(x: Long): Long = { // splitmix64 finalizer
    var z = x + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
  private def u01(x: Long): Double = (mix(x) >>> 11).toDouble / (1L << 53)

  /** Populate one segment shard: expose BSIs for the 3 strategies and, per
    * (metric, date), the value BSI plus the normal-format columnar rows.
    */
  private def fillSegment(engine: AdhocEngine, seg: Int, usersPerSegment: Int,
                          specs: Seq[ExperimentGen.MetricSpec], strategyIds: Seq[Long],
                          dates: Seq[Int], seed: Long): Unit = {
    // expose: ~90% of users in the experiment, uniform arm, geometric offset
    val offsets = strategyIds.map(_ => new BSIBuilder)
    var p = 0
    while (p < usersPerSegment) {
      val h = mix(seed + seg.toLong * 1000003L + p)
      if (u01(h) < 0.9) {
        val arm = (mix(h + 1) >>> 33).toInt % strategyIds.size
        val off = math.min(dates.size, (math.log(1.0 - u01(h + 2)) / math.log(0.5)).toInt + 1)
        offsets(arm).put(p, off.toLong)
      }
      p += 1
    }
    strategyIds.zipWithIndex.foreach { case (st, a) =>
      engine.loadExposeBsi(seg, st, dates.min, offsets(a).result())
    }
    strategyIds.foreach(st => engine.buildExposeBitmaps(seg, st, dates))

    specs.foreach { spec =>
      dates.foreach { d =>
        val b = new BSIBuilder
        val posB = new scala.collection.mutable.ArrayBuilder.ofInt
        val valB = new scala.collection.mutable.ArrayBuilder.ofLong
        val part = spec.basePartPpm / 1e6
        var p = 0
        while (p < usersPerSegment) {
          val h = mix(seed * 31 + seg.toLong * 7777777L + spec.metricId * 131071L + d * 8191L + p)
          // participation ∝ engagement (decreasing in position, as encoded)
          val engagement = 1.0 - (p + 0.5) / usersPerSegment
          if (u01(h) < math.min(1.0, 2 * engagement * part)) {
            val u = u01(h + 5)
            val v = math.max(1L, math.pow(spec.rangeCard.toDouble, u * u * u).toLong)
              .min(spec.rangeCard)
            b.put(p, v)
            posB += p
            valB += v
          }
          p += 1
        }
        engine.loadMetricBsi(seg, spec.metricId, d, b.result())
        engine.loadMetricRows(seg, spec.metricId, d, posB.result(), valB.result())
      }
    }
  }

  def run(spark: org.apache.spark.sql.SparkSession, nUsers: Long, nSegments: Int,
          nMetrics: Int = 105, nDays: Int = 7, reps: Int = 10, seed: Long = 42): Result = {
    val specs = ExperimentGen.coreMetricSpecs.take(nMetrics)
    val dates = (1 to nDays).toSeq
    val strategyIds = Seq(9000L, 9001L, 9002L) // one huge 3-arm experiment
    val usersPerSegment = (nUsers / nSegments).toInt

    val engine = new AdhocEngine(nSegments)
    val pool = Executors.newFixedThreadPool(Runtime.getRuntime.availableProcessors())
    try {
      pool.invokeAll((0 until nSegments).map(seg => new Callable[Unit] {
        def call(): Unit = fillSegment(engine, seg, usersPerSegment, specs, strategyIds, dates, seed)
      }).asJava).asScala.foreach(_.get())
    } finally { pool.shutdown(); pool.awaitTermination(5, TimeUnit.MINUTES) }

    // correctness guard before timing: both methods must agree cell-for-cell
    val metricIds = specs.map(_.metricId)
    val cb = engine.queryBsi(strategyIds, metricIds, dates)
    val cn = engine.queryNormal(strategyIds, metricIds, dates)
    require(cb == cn, s"ad-hoc methods disagree: ${cb.diff(cn).take(3)} vs ${cn.diff(cb).take(3)}")

    val bsiSec    = Measure.avgSeconds(warmup = 2, reps = reps) { engine.queryBsi(strategyIds, metricIds, dates) }
    val normalSec = Measure.avgSeconds(warmup = 2, reps = reps) { engine.queryNormal(strategyIds, metricIds, dates) }

    val rendered = Measure.renderTable(
      Seq("Format of Representation", "Average Latency", "Ratio"),
      Seq(
        Seq("Normal (paper)", "22.3 seconds", "1.0x"),
        Seq("BSI (paper)", "6.0 seconds", "3.72x less"),
        Seq("Normal (ours)", f"$normalSec%.3f seconds", "1.0x"),
        Seq("BSI (ours)", f"$bsiSec%.3f seconds", f"${normalSec / bsiSec}%.2fx less")))
    Result(bsiSec, normalSec, cb.size, rendered)
  }
}
