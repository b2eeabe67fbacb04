package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Scorecard computation on the BSI representation (§4.2).
  *
  * For each (strategy, metric, date) the pipeline mirrors the paper's SQL:
  * the expose filter is a constant comparison on the `offset` BSI
  * (`expose-date <= date  ⇔  offset <= date - min_expose_date + 1`), the
  * filtered value is `value * expose` (multiplication by a binary BSI), and
  * per-bucket sums/counts feed the statistical inference.
  *
  * Output grain: `(strategy_id, metric_id, date, bucket_id, bucket_sum,
  * exposed_cnt)` — `bucket_sum` is the sum of metric values over exposed units
  * in the bucket; `exposed_cnt` counts exposed units (with or without a metric
  * row), the denominator of per-user mean metrics.
  */
object Scorecard {

  /** The common case where segmentation and bucketing coincide (§4.2's demo):
    * the segment id *is* the bucket id, so each joined (strategy, metric,
    * date, segment) row yields exactly one bucket row with an in-BSI sum.
    */
  def bucketValuesSimple(exposeBsi: DataFrame, metricBsi: DataFrame,
                         dates: Seq[Int]): DataFrame = {
    val dDf = datesDf(exposeBsi.sparkSession, dates)
    exposeBsi
      .join(metricBsi, "segment_id")
      .join(dDf, col("date") === col("d"))
      .withColumn("expose",
        expr("bsi_cmp_const(offset_bsi, '<=', cast(d - min_expose_date + 1 as bigint))"))
      .withColumn("filtered_value", expr("bsi_mul(value_bsi, expose)"))
      .select(
        col("strategy_id"), col("metric_id"), col("date"),
        col("segment_id").as("bucket_id"),
        expr("bsi_sum(filtered_value)").as("bucket_sum"),
        expr("bsi_count(expose)").as("exposed_cnt"))
  }

  /** The general case (§4.2, segment ≠ bucket): per-segment per-bucket partial
    * sums via the bucket BSI, then merged across segments.
    */
  def bucketValuesBucketed(exposeBsi: DataFrame, metricBsi: DataFrame,
                           dates: Seq[Int], nBuckets: Int): DataFrame = {
    val dDf = datesDf(exposeBsi.sparkSession, dates)
    exposeBsi
      .join(metricBsi, "segment_id")
      .join(dDf, col("date") === col("d"))
      .withColumn("expose",
        expr("bsi_cmp_const(offset_bsi, '<=', cast(d - min_expose_date + 1 as bigint))"))
      .withColumn("filtered_value", expr("bsi_mul(value_bsi, expose)"))
      .withColumn("bs",
        expr(s"explode(bsi_bucket_stats(filtered_value, expose, bucket_bsi, $nBuckets))"))
      .groupBy(col("strategy_id"), col("metric_id"), col("date"), col("bs._1").as("bucket_id"))
      .agg(sum(col("bs._2")).as("bucket_sum"), sum(col("bs._3")).as("exposed_cnt"))
  }

  /** Roll bucket rows up to one scorecard row per (strategy, metric, date):
    * the metric value `Σ sum / Σ cnt` plus the bucket-replicate moments the
    * [[Stats]] inference consumes.
    */
  def metricValues(bucketValues: DataFrame): DataFrame =
    bucketValues
      .groupBy("strategy_id", "metric_id", "date")
      .agg(
        sum(col("bucket_sum")).as("total_sum"),
        sum(col("exposed_cnt")).as("total_cnt"),
        count(lit(1)).as("n_buckets"))
      .withColumn("metric_value", col("total_sum") / col("total_cnt"))

  private def datesDf(spark: org.apache.spark.sql.SparkSession, dates: Seq[Int]): DataFrame = {
    import spark.implicits._
    dates.toDF("d")
  }
}
