package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.expgen.ExperimentGen

/** A small shared experiment fixture for the Spark integration suites:
  * 3000 users, 8 segments (segment = bucket), two 2-arm experiments running
  * days 1–5, 4 metrics logged on days 1–8, dimensions on day 6.
  */
object TestFixtures {
  val NUsers    = 3000L
  val NSegments = 8
  val Seed      = 7L
  val MetricDates: Seq[Int] = 1 to 8
  val Specs     = ExperimentGen.smallMetricSpecs(4)
  val Strategies = ExperimentGen.twoArmStrategies(2, trafficPpm = 400000L, startDate = 1, nDays = 5)

  final case class Data(dict: DataFrame, expose: DataFrame, metric: DataFrame,
                        dim: DataFrame, exposeBsi: DataFrame, metricBsi: DataFrame,
                        dimBsi: DataFrame)

  @volatile private var cached: Data = _

  /** Build (once per JVM) and cache all normal + BSI tables. The expose log's
    * bucket column is replaced by the unit's segment id — the §4.2 simple case
    * the scorecard suites exercise — so baseline and BSI replicate over the
    * same grid.
    */
  def data(spark: SparkSession): Data = {
    if (cached == null) synchronized {
      if (cached == null) {
        BsiUdfs.register(spark)
        import org.apache.spark.sql.functions._
        val dict = ExperimentGen.dictionary(spark, NUsers, NSegments, Seed).cache()
        val expose = ExperimentGen.exposeLog(spark, NUsers, Strategies, NSegments, Seed)
          .join(dict.select("unit_id", "segment_id"), "unit_id")
          .withColumn("bucket_id", col("segment_id"))
          .drop("segment_id")
          .cache()
        val metric = ExperimentGen.metricLog(spark, NUsers, Specs, MetricDates, Seed).cache()
        val dim    = ExperimentGen.dimensionLog(spark, NUsers, Seq(6), Seed).cache()
        val eBsi   = BsiConvert.exposeLogToBsi(expose, dict).cache()
        val mBsi   = BsiConvert.metricLogToBsi(metric, dict).cache()
        val dBsi   = BsiConvert.dimensionLogToBsi(dim, dict).cache()
        Seq(dict, expose, metric, dim, eBsi, mBsi, dBsi).foreach(_.count())
        cached = Data(dict, expose, metric, dim, eBsi, mBsi, dBsi)
      }
    }
    cached
  }
}
