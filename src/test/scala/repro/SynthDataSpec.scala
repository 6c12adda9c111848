package repro

import org.apache.spark.sql.functions._
import repro.core.{AggFunc, FeatureQueryExecutor, Predicate, QuerySpec}

/** Sanity for the provided TPC-H-lite generators and the DuckDB oracle,
  * plus a FeatAug query over TPC-H shapes (lineitem is a one-to-many
  * relevant table for orders).
  */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.002

  test("lineitem scales with sf and has the TPC-H-lite schema") {
    val li = SynthData.lineitem(spark, sf)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_extendedprice"))
    assert(li.count() == (6000000 * sf).toLong)
  }

  test("orders/customer/part have unique primary keys") {
    assert(SynthData.orders(spark, sf).select("o_orderkey").distinct.count() == (1500000 * sf).toLong)
    assert(SynthData.customer(spark, sf).select("c_custkey").distinct.count() == (150000 * sf).toLong)
    assert(SynthData.part(spark, sf).select("p_partkey").distinct.count() == (200000 * sf).toLong)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 5000, 100).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 5000, 100).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > u * 2, s"zipf max $z vs uniform max $u")
  }

  test("a predicate-aware FeatAug query over lineitem matches DuckDB") {
    // DateType columns cannot be collected in this image (JDK17 method
    // handle access issue in Spark's date decoder); the oracle only needs
    // the queried columns anyway.
    val li = SynthData.lineitem(spark, sf).drop("l_shipdate").cache()
    val orders = SynthData.orders(spark, sf).drop("o_orderdate").limit(200).cache()
    val ex = new FeatureQueryExecutor(orders, li, Vector("l_orderkey"))
    val q = QuerySpec(AggFunc.Avg, "l_extendedprice",
      Vector(Predicate("l_returnflag", Some("R"), None, None),
        Predicate("l_quantity", None, Some(10.0), Some(40.0))),
      Vector("l_orderkey"))
    Oracle.assertEquivalent(ex.featureDf(q), ex.duckSql(q, "lineitem"), "lineitem" -> li)
  }

  test("the oracle catches a wrong result") {
    val s = spark
    import s.implicits._
    val t = Seq((1, 2.0), (1, 4.0)).toDF("k", "v")
    val wrong = Seq((1, 5.0)).toDF("k", "feature") // truth: sum = 6
    intercept[IllegalArgumentException](
      Oracle.assertEquivalent(wrong,
        "SELECT k, CAST(SUM(CAST(v AS DOUBLE)) AS DOUBLE) AS feature FROM t GROUP BY k",
        "t" -> t))
  }

  test("the oracle catches a column-name mismatch") {
    val s = spark
    import s.implicits._
    val t = Seq((1, 2.0)).toDF("k", "v")
    val df = Seq((1, 2.0)).toDF("k", "other")
    intercept[IllegalArgumentException](
      Oracle.assertEquivalent(df, "SELECT k, CAST(v AS DOUBLE) AS feature FROM t", "t" -> t))
  }
}
