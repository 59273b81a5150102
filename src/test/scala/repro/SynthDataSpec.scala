package repro

/** Provided TPC-H-lite generators + DuckDB oracle plumbing.
  *
  * The paper under reproduction is graph-analytic, not OLAP, so these
  * tables are not its evaluation data (the graph generators in
  * `repro.graph` are) — but the scaffold contract is that SynthData and
  * Oracle work together, and the zipf/uniform key generators are the
  * template the Chung–Lu endpoint sampler follows.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem row count scales with sf") {
    assert(SynthData.lineitem(spark, sf = 0.001).count() == 6000L)
  }

  test("lineitem columns match the TPC-H-lite schema") {
    val cols = SynthData.lineitem(spark, sf = 0.001).columns.toSet
    assert(Set("l_orderkey", "l_partkey", "l_quantity", "l_extendedprice",
      "l_discount", "l_returnflag", "l_shipdate").subsetOf(cols))
  }

  test("orders keys are dense from 1") {
    val df = SynthData.orders(spark, sf = 0.001)
    assert(df.selectExpr("min(o_orderkey)").head().getLong(0) == 1L)
    assert(df.count() == 1500L)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.customer(spark, sf = 0.001, seed = 2).collect().map(_.toString).sorted
    val b = SynthData.customer(spark, sf = 0.001, seed = 2).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("oracle validates a grouped aggregate over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).persist()
    val sparkDf = li.groupBy("l_returnflag")
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT l_returnflag, count(*) as cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle validates a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001).persist()
    val c = SynthData.customer(spark, sf = 0.001).persist()
    val sparkDf = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT c_mktsegment, count(*) as cnt FROM orders JOIN customer " +
        "ON cast(o_custkey as bigint) = cast(c_custkey as bigint) GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c,
    )
  }

  test("zipfKeys skews mass toward low ranks") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.1, seed = 3)
    val top = df.where("k <= 10").count().toDouble
    assert(top / 20000 > 0.3, s"top-10 keys carry ${top / 20000} of the mass — not zipfian")
  }

  test("uniformKeys covers the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10, seed = 4)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    counts.foreach(c => assert(math.abs(c - 2000) < 300, s"bucket $c"))
  }

  test("oracle rejects mismatched results (negative control)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val wrong = li.groupBy("l_returnflag")
      .agg((org.apache.spark.sql.functions.count(org.apache.spark.sql.functions.lit(1)) + 1).as("cnt"))
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, count(*) as cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li,
      )
    }
  }

  test("oracle rejects mismatched column sets (negative control)") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        li.selectExpr("count(*) as total"),
        "SELECT count(*) as other_name FROM lineitem",
        "lineitem" -> li,
      )
    }
  }
}
