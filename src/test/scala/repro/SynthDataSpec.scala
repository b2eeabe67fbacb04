package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators plus the experiment-schema extensions. */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates the TPC-H-lite schema at the requested scale") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.toSet.contains("l_orderkey"))
    assert(li.count() == 6000L)
  }

  test("orders/customer/part row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() == 1500L)
    assert(SynthData.customer(spark, 0.001).count() == 150L)
    assert(SynthData.part(spark, 0.001).count() == 200L)
  }

  test("zipf keys are skewed: top key dominates uniform share") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect().head.getLong(1)
    assert(top > 20000 / 1000 * 5)
  }

  test("experiment expose log delegates with the documented schema") {
    val e = SynthData.exposeLog(spark, sf = 0.001, nExperiments = 1)
    assert(e.columns.toSeq == Seq("strategy_id", "unit_id", "first_expose_date", "bucket_id"))
    assert(e.count() > 0)
    assert(e.select("strategy_id").distinct().count() == 2)
  }

  test("experiment metric log delegates with the documented schema") {
    val m = SynthData.metricLog(spark, sf = 0.001, nMetrics = 3, nDays = 2)
    assert(m.columns.toSeq == Seq("date", "metric_id", "unit_id", "value"))
    assert(m.select("metric_id").distinct().count() == 3)
    assert(m.agg(min("value")).collect().head.getLong(0) >= 1)
  }

  test("experiment dimension log delegates with the documented schema") {
    val d = SynthData.dimensionLog(spark, sf = 0.001, nDays = 1)
    assert(d.columns.toSeq == Seq("date", "dim_name", "unit_id", "value"))
    assert(d.select("dim_name").distinct().count() == 2)
  }

  test("dictionary covers the sf-scaled universe with dense positions") {
    val dict = SynthData.dictionary(spark, sf = 0.001, nSegments = 4)
    assert(dict.count() == 1500L)
    assert(dict.agg(min("pos")).collect().head.getInt(0) == 0)
  }
}
