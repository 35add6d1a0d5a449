package repro.data

import org.apache.spark.sql.functions._
import repro.core.Tables
import repro.{Oracle, SparkSpec}

class DatasetsSpec extends SparkSpec {

  test("column counts match the paper's datasets") {
    val expected = Map("FL" -> 31, "CY" -> 15, "SP" -> 15, "CC" -> 31,
      "USF" -> 298, "BL" -> 19)
    val got = Seq(
      Datasets.flights(spark, 0.0001), Datasets.cyber(spark, 0.01),
      Datasets.spotify(spark, 0.01), Datasets.creditcard(spark, 0.001),
      Datasets.usfunds(spark, 0.01), Datasets.bankloans(spark, 0.001),
    ).map { case (df, meta) => meta.name -> Tables.dataCols(df).size }.toMap
    assert(got == expected)
  }

  test("row counts scale with sf (above the floor)") {
    val (a, _) = Datasets.cyber(spark, 0.2)
    val (b, _) = Datasets.cyber(spark, 0.4)
    assert(a.count() == 6000L && b.count() == 12000L)
  }

  test("target columns exist in their schemas") {
    Seq(
      Datasets.flights(spark, 0.0001), Datasets.spotify(spark, 0.05),
      Datasets.creditcard(spark, 0.001), Datasets.bankloans(spark, 0.01),
    ).foreach { case (df, meta) =>
      meta.targets.foreach(t => assert(df.columns.contains(t), s"${meta.name}: $t"))
    }
  }

  test("every pattern's columns exist and patterns are recorded in meta") {
    Seq(Datasets.flights(spark, 0.0001), Datasets.cyber(spark, 0.01),
      Datasets.spotify(spark, 0.01), Datasets.creditcard(spark, 0.001),
      Datasets.usfunds(spark, 0.01), Datasets.bankloans(spark, 0.001))
      .foreach { case (df, meta) =>
        assert(meta.patterns.nonEmpty)
        meta.patterns.foreach(p =>
          p.cells.keys.foreach(c => assert(df.columns.contains(c), s"${meta.name}: $c")))
      }
  }

  test("FL: cancelled-pattern rows have the NaN cluster (paper Example 1.1)") {
    val (df, _) = Datasets.flights(spark, 0.0005)
    val cancelled = df.where(col("CANCELLED") === "1" && col("DEPARTURE_TIME").isNull)
    assert(cancelled.count() > 0)
    // among those, the operational columns are predominantly null too
    val c = cancelled.count().toDouble
    val airNull = cancelled.where(col("AIR_TIME").isNull).count() / c
    assert(airNull > 0.8, s"AIR_TIME null rate among cancelled: $airNull")
  }

  test("FL: delay-breakdown columns are null jointly") {
    val (df, _) = Datasets.flights(spark, 0.0005)
    val a = df.where(col("AIR_SYSTEM_DELAY").isNull)
    // late_cascade claims LATE_AIRCRAFT_DELAY, so compare within unclaimed cols
    val joint = a.where(col("SECURITY_DELAY").isNull && col("WEATHER_DELAY").isNull).count()
    assert(joint == a.count())
  }

  test("CY: ddos pattern support matches DuckDB count (oracle)") {
    import spark.implicits._
    val (df, _) = Datasets.cyber(spark, 0.1)
    val n = df.count()
    val sparkCount = df.where(col("protocol") === "UDP" && col("dst_port") === "53" &&
      col("attack_type") === "ddos").agg(count(lit(1)).cast("long").as("n"))
    Oracle.assertEquivalent(sparkCount,
      "SELECT CAST(COUNT(*) AS BIGINT) AS n FROM cy " +
        "WHERE protocol = 'UDP' AND dst_port = '53' AND attack_type = 'ddos'",
      "cy" -> df.select("protocol", "dst_port", "attack_type"))
    // and the support is in the expected band: 0.15 * (1-fuzz)^3 ±
    val got = sparkCount.collect().head.getLong(0).toDouble / n
    assert(got > 0.10 && got < 0.17, s"ddos support $got")
  }

  test("SP: planted popularity pattern is prominent") {
    val (df, _) = Datasets.spotify(spark, 0.1)
    val n = df.count().toDouble
    val hit = df.where(col("genre") === "pop" && col("popularity") === 88.0).count() / n
    assert(hit > 0.1, s"dance_pop_hit support $hit")
  }

  test("generation is deterministic across invocations") {
    val a = Datasets.bankloans(spark, 0.01)._1.agg(
      sum(hash(col("loan_status"), col("credit_score"))).as("h")).collect().head.getLong(0)
    val b = Datasets.bankloans(spark, 0.01)._1.agg(
      sum(hash(col("loan_status"), col("credit_score"))).as("h")).collect().head.getLong(0)
    assert(a == b)
  }

  test("all() yields the six datasets") {
    val all = Datasets.all(spark, 0.01)
    assert(all.map(_._2.name) == Seq("FL", "CY", "SP", "CC", "USF", "BL"))
  }
}
