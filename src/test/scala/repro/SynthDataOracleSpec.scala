package repro

/** Sanity coverage of the provided TPC-H-lite generators and the DuckDB
  * oracle harness itself (the rest of the suite leans on both).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem at SF=0.001 has ~6000 rows with valid domains") {
    val li = SynthData.lineitem(spark, 0.001)
    assert(li.count() == 6000)
    assert(li.where("l_discount < 0 OR l_discount > 0.1").count() == 0)
    assert(li.where("l_returnflag NOT IN ('N','R','A')").count() == 0)
  }

  test("orders/customer/part cardinalities scale with SF") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.01).count() == 1500)
    assert(SynthData.part(spark, 0.01).count() == 2000)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted
    val b = SynthData.orders(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000)
    val top = z.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(1).collect()(0).getLong(1)
    assert(top > 20000 / 1000 * 5, s"zipf top key should dominate, got $top")
    val u = SynthData.uniformKeys(spark, 20000, 1000)
    val utop = u.groupBy("k").count().orderBy(org.apache.spark.sql.functions.desc("count"))
      .limit(1).collect()(0).getLong(1)
    assert(utop < 100)
  }

  test("oracle accepts a correct aggregate") {
    val li = SynthData.lineitem(spark, 0.0005)
    val agg = li.groupBy("l_returnflag")
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) as "cnt")
    Oracle.assertEquivalent(
      agg,
      "SELECT l_returnflag AS l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle rejects a wrong result") {
    val li = SynthData.lineitem(spark, 0.0005)
    val wrong = li.groupBy("l_returnflag")
      .agg((org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) + 1) as "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag AS l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("oracle rejects column-name mismatches") {
    val li = SynthData.lineitem(spark, 0.0005)
    val agg = li.groupBy("l_returnflag")
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) as "n")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        agg,
        "SELECT l_returnflag AS l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
