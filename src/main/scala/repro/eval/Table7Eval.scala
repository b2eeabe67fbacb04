package repro.eval

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.core.{BsiConvert, BsiUdfs, Scorecard, ScorecardBaseline}
import repro.expgen.ExperimentGen

/** Table 7 — CPU consumed by the scorecard pre-computation over a batch of
  * strategy–metric pairs: normal-format Spark SQL (the pre-BSI production
  * method, §6.2) vs the BSI pipeline (§4.2). Both read pre-materialized
  * inputs (conversion to BSI happens at ingestion in the paper's architecture,
  * Fig. 7, so it is not part of the measured pre-computation). The paper
  * reports CPU hours on a 2000-core cluster; we report executor CPU seconds on
  * `local[*]` — the ratio is the reproduced quantity.
  */
object Table7Eval {

  final case class Result(pairs: Long, normalCpuSec: Double, bsiCpuSec: Double,
                          normalRows: Long, bsiRows: Long, rendered: String)

  def run(spark: SparkSession, nUsers: Long, nSegments: Int, nExperiments: Int,
          nMetrics: Int, date: Int = 8, trafficPpm: Long = 100000L,
          seed: Long = 42): Result = {
    BsiUdfs.register(spark)
    val specs      = ExperimentGen.coreMetricSpecs.take(nMetrics)
    val strategies = ExperimentGen.twoArmStrategies(nExperiments, trafficPpm, startDate = 1, nDays = 7)

    val dict   = ExperimentGen.dictionary(spark, nUsers, nSegments, seed).cache()
    val expose = ExperimentGen.exposeLog(spark, nUsers, strategies, nBuckets = nSegments, seed)
      // simple case: segment doubles as bucket (§4.2), so the baseline
      // replicates over the same grid the BSI path uses
      .join(dict.select("unit_id", "segment_id"), "unit_id")
      .withColumn("bucket_id", col("segment_id"))
      .drop("segment_id")
      .cache()
    val metric = ExperimentGen.metricLog(spark, nUsers, specs, Seq(date), seed).cache()
    expose.count(); metric.count(); dict.count()

    val exposeBsi = BsiConvert.exposeLogToBsi(expose, dict).cache()
    val metricBsi = BsiConvert.metricLogToBsi(metric, dict).cache()
    exposeBsi.count(); metricBsi.count()

    val (normalRows, normalCpu) = Measure.sparkCpuSeconds(spark) {
      ScorecardBaseline.bucketValues(expose, metric, Seq(date)).count()
    }
    val (bsiRows, bsiCpu) = Measure.sparkCpuSeconds(spark) {
      Scorecard.bucketValuesSimple(exposeBsi, metricBsi, Seq(date)).count()
    }

    Seq(dict, expose, metric, exposeBsi, metricBsi).foreach(_.unpersist())

    val pairs = strategies.size.toLong * specs.size
    val rendered = Measure.renderTable(
      Seq("Format of Representation", "CPU Consumed", "Ratio"),
      Seq(
        Seq("Normal (paper)", "22712 CPU hours", "1.0x"),
        Seq("BSI (paper)", "5446 CPU hours", "4.17x less"),
        Seq("Normal (ours)", f"$normalCpu%.1f CPU seconds", "1.0x"),
        Seq("BSI (ours)", f"$bsiCpu%.1f CPU seconds", f"${normalCpu / bsiCpu}%.2fx less")))
    Result(pairs, normalCpu, bsiCpu, normalRows, bsiRows, rendered)
  }
}
