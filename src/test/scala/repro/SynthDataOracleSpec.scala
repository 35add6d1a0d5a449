package repro

import org.apache.spark.sql.functions._
import repro.core.Tables

/** The provided TPC-H-lite generators + DuckDB oracle, exercised on the
  * selection/projection/aggregation query shapes this repo's EDA layer
  * uses — guards the Oracle harness itself as much as the generators.
  */
class SynthDataOracleSpec extends SparkSpec {

  lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  lazy val orders = SynthData.orders(spark, sf = 0.002).cache()

  test("selection-projection query matches DuckDB") {
    val got = li.where(col("l_quantity") > 45.0)
      .select(col("l_orderkey").cast("long").as("l_orderkey"),
        col("l_linenumber").cast("int").as("l_linenumber"))
    Oracle.assertEquivalent(got,
      "SELECT CAST(l_orderkey AS BIGINT) AS l_orderkey, " +
        "CAST(l_linenumber AS INT) AS l_linenumber " +
        "FROM lineitem WHERE CAST(l_quantity AS DOUBLE) > 45.0",
      "lineitem" -> li)
  }

  test("group-by aggregation matches DuckDB") {
    // Sum in DECIMAL on both sides: double summation order differs between
    // engines and the oracle compares at 1e-6 precision.
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("long").as("n"),
        sum(col("l_extendedprice").cast("decimal(18,2)")).cast("double").as("total"))
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, CAST(COUNT(*) AS BIGINT) AS n, " +
        "CAST(SUM(CAST(l_extendedprice AS DECIMAL(18,2))) AS DOUBLE) AS total " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("join-aggregate query matches DuckDB") {
    val got = li.join(orders, col("l_orderkey") === col("o_orderkey"))
      .groupBy("o_orderstatus")
      .agg(count(lit(1)).cast("long").as("n"))
    Oracle.assertEquivalent(got,
      "SELECT o_orderstatus, CAST(COUNT(*) AS BIGINT) AS n " +
        "FROM lineitem JOIN orders ON l_orderkey = o_orderkey " +
        "GROUP BY o_orderstatus",
      "lineitem" -> li.select("l_orderkey"), "orders" -> orders)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, 0.01).agg(
      sum(hash(col("c_custkey"), col("c_mktsegment")))).collect().head.getLong(0)
    val b = SynthData.customer(spark, 0.01).agg(
      sum(hash(col("c_custkey"), col("c_mktsegment")))).collect().head.getLong(0)
    assert(a == b)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .collect().head.getLong(1).toDouble / 20000
    assert(topShare(z) > 5 * topShare(u), "zipf not skewed vs uniform")
  }

  test("withRid is idempotent and materialize projects in order") {
    val df = Tables.withRid(li.select("l_returnflag", "l_linestatus"))
    assert(Tables.withRid(df).columns.count(_ == Tables.Rid) == 1)
    val rids = df.select(Tables.Rid).limit(3).collect().map(_.getLong(0)).toSeq
    val sub = core.SubTable(rids, Seq("l_linestatus"))
    val mat = Tables.materialize(df, sub)
    assert(mat.columns.toSeq == Seq(Tables.Rid, "l_linestatus"))
    assert(mat.count() == 3)
  }
}
