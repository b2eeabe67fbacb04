package repro.core

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}

/** Scorecard correctness (§4.2): the BSI pipeline must match both the
  * normal-format Spark SQL baseline and an independent DuckDB evaluation of
  * the same query over the normal logs.
  */
class ScorecardSpec extends SparkSpec {

  private lazy val d = TestFixtures.data(spark)
  private val dates = Seq(3, 6) // day 3 is mid-rollout: the expose filter bites

  /** DuckDB scorecard over the normal logs — the independent oracle. */
  private def oracleSql(dates: Seq[Int]): String = {
    val dlist = dates.mkString("(", "), (", ")")
    s"""WITH dates(d) AS (VALUES $dlist),
       |counts AS (
       |  SELECT e.strategy_id AS strategy_id, d.d AS date, e.bucket_id AS bucket_id,
       |         COUNT(*) AS exposed_cnt
       |  FROM expose e, dates d
       |  WHERE CAST(e.first_expose_date AS INT) <= d.d
       |  GROUP BY 1, 2, 3),
       |sums AS (
       |  SELECT e.strategy_id AS strategy_id, m.metric_id AS metric_id,
       |         CAST(m.date AS INT) AS date, e.bucket_id AS bucket_id,
       |         SUM(CAST(m.value AS BIGINT)) AS s
       |  FROM expose e JOIN metric m ON e.unit_id = m.unit_id
       |  WHERE CAST(e.first_expose_date AS INT) <= CAST(m.date AS INT)
       |    AND CAST(m.date AS INT) IN (${dates.mkString(", ")})
       |  GROUP BY 1, 2, 3, 4),
       |metrics AS (SELECT DISTINCT metric_id FROM metric)
       |SELECT c.strategy_id AS strategy_id, mt.metric_id AS metric_id, c.date AS date,
       |       c.bucket_id AS bucket_id, COALESCE(s.s, 0) AS bucket_sum,
       |       c.exposed_cnt AS exposed_cnt
       |FROM counts c CROSS JOIN metrics mt
       |LEFT JOIN sums s ON s.strategy_id = c.strategy_id AND s.metric_id = mt.metric_id
       |                AND s.date = c.date AND s.bucket_id = c.bucket_id
       |""".stripMargin
  }

  test("BSI scorecard (simple case) matches the DuckDB oracle") {
    val bsi = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, dates)
      .select(col("strategy_id").cast("long"), col("metric_id").cast("int"),
              col("date").cast("int"), col("bucket_id").cast("int"),
              col("bucket_sum").cast("long"), col("exposed_cnt").cast("long"))
    Oracle.assertEquivalent(bsi, oracleSql(dates), "expose" -> d.expose, "metric" -> d.metric)
  }

  test("normal-format Spark SQL baseline matches the DuckDB oracle") {
    val base = ScorecardBaseline.bucketValues(d.expose, d.metric, dates)
    Oracle.assertEquivalent(base, oracleSql(dates), "expose" -> d.expose, "metric" -> d.metric)
  }

  test("BSI scorecard equals the Spark SQL baseline row-for-row") {
    val bsi  = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, dates)
    val base = ScorecardBaseline.bucketValues(d.expose, d.metric, dates)
    val key  = Seq("strategy_id", "metric_id", "date", "bucket_id")
    assert(bsi.count() == base.count())
    val joined = bsi.alias("a").join(base.alias("b"), key)
      .where(col("a.bucket_sum") =!= col("b.bucket_sum") ||
             col("a.exposed_cnt") =!= col("b.exposed_cnt"))
    assert(joined.count() == 0)
  }

  test("bucketed scorecard (segment ≠ bucket) aggregates to the same totals") {
    val nB = TestFixtures.NSegments // bucket ids 1..8 from the generator
    // the fixture's exposeBsi carries segment-as-bucket ids (0-based, invalid
    // inside a BSI where 0 = absent); use the generator's true 1-based buckets
    val raw = repro.expgen.ExperimentGen.exposeLog(
      spark, TestFixtures.NUsers, TestFixtures.Strategies, TestFixtures.NSegments, TestFixtures.Seed)
    val eBsiTrue = BsiConvert.exposeLogToBsi(raw, d.dict)
    val bucketed = Scorecard.bucketValuesBucketed(eBsiTrue, d.metricBsi, dates, nB)
    val simple   = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, dates)
    val tb = bucketed.groupBy("strategy_id", "metric_id", "date")
      .agg(sum("bucket_sum").as("s"), sum("exposed_cnt").as("c"))
    val ts = simple.groupBy("strategy_id", "metric_id", "date")
      .agg(sum("bucket_sum").as("s"), sum("exposed_cnt").as("c"))
    assert(tb.count() == ts.count())
    assert(tb.alias("a").join(ts.alias("b"), Seq("strategy_id", "metric_id", "date"))
      .where(col("a.s") =!= col("b.s") || col("a.c") =!= col("b.c")).count() == 0)
  }

  test("bucketed scorecard matches a bucket-grain DuckDB oracle") {
    // true bucket ids (1..8 hash buckets from the generator), not segment ids:
    // rebuild the expose BSI with the generator's bucket_id intact
    val raw = repro.expgen.ExperimentGen.exposeLog(
      spark, TestFixtures.NUsers, TestFixtures.Strategies, TestFixtures.NSegments, TestFixtures.Seed)
    val eBsi = BsiConvert.exposeLogToBsi(raw, d.dict)
    val bsi = Scorecard.bucketValuesBucketed(eBsi, d.metricBsi, dates, TestFixtures.NSegments)
      .select(col("strategy_id").cast("long"), col("metric_id").cast("int"),
              col("date").cast("int"), col("bucket_id").cast("int"),
              col("bucket_sum").cast("long"), col("exposed_cnt").cast("long"))
    Oracle.assertEquivalent(bsi, oracleSql(dates), "expose" -> raw, "metric" -> d.metric)
  }

  test("metricValues rolls buckets up to Σsum/Σcnt") {
    val bv = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, Seq(6))
    val mv = Scorecard.metricValues(bv).collect()
    assert(mv.nonEmpty)
    mv.foreach { r =>
      val s = r.getAs[Long]("total_sum"); val c = r.getAs[Long]("total_cnt")
      assert(r.getAs[Double]("metric_value") == s.toDouble / c)
      assert(r.getAs[Long]("n_buckets") <= TestFixtures.NSegments)
    }
  }

  test("expose filter: earlier dates expose fewer units, sums are monotone in date") {
    val bv = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, Seq(1, 6))
      .groupBy("strategy_id", "metric_id", "date")
      .agg(sum("exposed_cnt").as("cnt"))
      .collect()
      .groupBy(r => (r.getAs[Long]("strategy_id"), r.getAs[Int]("metric_id")))
    bv.values.foreach { rows =>
      val byDate = rows.map(r => r.getAs[Int]("date") -> r.getAs[Long]("cnt")).toMap
      assert(byDate(1) < byDate(6), s"exposure should grow over the rollout: $byDate")
    }
  }

  test("A/A inference on scorecard outputs: all metrics have p > 0.001") {
    val bv = Scorecard.bucketValuesSimple(d.exposeBsi, d.metricBsi, Seq(6))
    val byKey = PreExperiment.collectBucketed(bv, TestFixtures.NSegments, firstBucketId = 0)
    val es = TestFixtures.Strategies.grouped(2).toSeq
    for (pair <- es; spec <- TestFixtures.Specs) {
      val t = byKey((pair(1).strategyId, spec.metricId))
      val c = byKey((pair(0).strategyId, spec.metricId))
      val r = Stats.welchTTest(t, c)
      assert(r.pValue > 0.001,
        s"A/A rejected for strategy pair ${pair.map(_.strategyId)} metric ${spec.metricId}: $r")
    }
  }
}
