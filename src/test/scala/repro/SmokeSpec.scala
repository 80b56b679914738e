package repro

import org.apache.spark.sql.functions._
import repro.core._
import repro.s3._
import repro.tpch.Tpch

/** End-to-end smoke: catalog, connector pushdown, one op per family, one
  * TPC-H query both ways, all oracle-checked at SF 0.01.
  */
class SmokeSpec extends SparkSpec {

  private def ensure(): Unit = TableCatalog.ensureTpch(spark, 0.01)

  test("catalog registers tpch tables") {
    ensure()
    val client = new S3Client()
    assert(client.tableRows("lineitem") == 60000L)
    assert(client.objectKeys("lineitem").size == 8)
    assert(client.tableRows("customer") == 1500L)
  }

  test("connector: full read matches synthetic data") {
    ensure()
    val df = Plans.read(spark, "customer", pushdown = false)
    assert(df.count() == 1500)
    assert(df.schema.fieldNames.toSeq.contains("c_acctbal"))
  }

  test("connector: filter pushdown reduces returned bytes") {
    ensure()
    Sim.reset()
    val n1 = Sim.inPhase("a") {
      Plans.read(spark, "customer", pushdown = true).where(col("c_acctbal") <= -950).count()
    }
    val a = Sim.get("a")
    Sim.reset()
    val n2 = Sim.inPhase("b") {
      Plans.read(spark, "customer", pushdown = false).where(col("c_acctbal") <= -950).count()
    }
    val b = Sim.get("b")
    assert(n1 == n2)
    assert(a.returnedBytes < b.returnedBytes / 10, s"pushdown ${a.returnedBytes} vs ${b.returnedBytes}")
    assert(a.scannedBytes > 0 && b.scannedBytes == 0)
  }

  test("connector: aggregate pushdown computes the right sum") {
    ensure()
    Sim.reset()
    val row = Sim.inPhase("agg") {
      Plans.read(spark, "lineitem", pushdown = true)
        .where(col("l_quantity") < 10)
        .agg(sum(col("l_extendedprice") * col("l_discount")).as("r"))
        .collect()(0)
    }
    val expected = SynthData.lineitem(spark, 0.01)
      .where(col("l_quantity") < 10)
      .agg(sum(col("l_extendedprice") * col("l_discount"))).collect()(0).getDouble(0)
    assert(math.abs(row.getDouble(0) - expected) / expected < 1e-9)
    val m = Sim.get("agg")
    info(s"agg pushdown returned ${m.returnedBytes} bytes over ${m.selectRequests} requests")
    assert(m.returnedBytes < 1000, "aggregate was not pushed down")
  }

  test("filter ops agree with each other and the oracle") {
    ensure()
    val li = SynthData.lineitem(spark, 0.01)
    val hi = 900 + 0.01 * 90000 // selectivity 1e-2
    val server = FilterOps.serverSide(spark, "lineitem", col("l_extendedprice") <= hi, 100)
    val s3side = FilterOps.s3Side(spark, "lineitem", col("l_extendedprice") <= hi, 100)
    val index  = FilterOps.indexed(spark, "lineitem", "l_extendedprice", s"val <= $hi", 100)
    assert(server.df.count() == s3side.df.count())
    assert(server.df.count() == index.df.count())
    val sql = s"SELECT count(*) AS n FROM lineitem WHERE CAST(l_extendedprice AS DOUBLE) <= $hi"
    Oracle.assertEquivalent(s3side.df.agg(count(lit(1)).as("n")), sql, "lineitem" -> li)
    assert(s3side.runtimeSeconds < server.runtimeSeconds)
  }

  test("join ops agree with the oracle") {
    ensure()
    val cust = SynthData.customer(spark, 0.01)
    val ords = SynthData.orders(spark, 0.01)
    val p = JoinOps.Params(-950, None)
    for (r <- Seq(JoinOps.baseline(spark, p, 100), JoinOps.filtered(spark, p, 100),
                  JoinOps.bloom(spark, p, 100))) {
      Oracle.assertEquivalent(r.df.select(round(col("total"), 2).as("total")),
        JoinOps.duckSql(p).replace("AS total", "AS total0")
          .replace("SELECT SUM", "SELECT ROUND(SUM")
          .replace("AS total0", ", 2) AS total"),
        "customer" -> cust, "orders" -> ords)
    }
  }

  test("group-by ops agree with the oracle") {
    ensure()
    val cust = SynthData.customer(spark, 0.01)
    val duck =
      """SELECT c_nationkey, ROUND(SUM(CAST(c_acctbal AS DOUBLE)), 2) AS sum_c_acctbal
        |FROM customer GROUP BY c_nationkey""".stripMargin
    for (r <- Seq(
        GroupByOps.serverSide(spark, "customer", "c_nationkey", Seq("c_acctbal"), 100),
        GroupByOps.filtered(spark, "customer", "c_nationkey", Seq("c_acctbal"), 100),
        GroupByOps.s3Side(spark, "customer", "c_nationkey", Seq("c_acctbal"), 100),
        GroupByOps.hybrid(spark, "customer", "c_nationkey", Seq("c_acctbal"), 8, 100))) {
      Oracle.assertEquivalent(
        r.df.select(col("c_nationkey"), round(col("sum_c_acctbal"), 2).as("sum_c_acctbal")),
        duck, "customer" -> cust)
    }
  }

  test("top-k ops return the true top K values") {
    ensure()
    val li = SynthData.lineitem(spark, 0.01)
    val expected = li.orderBy(asc("l_extendedprice")).limit(100)
      .select("l_extendedprice").collect().map(_.getDouble(0)).sorted.toSeq
    val server = TopKOps.serverSide(spark, "lineitem", "l_extendedprice", 100, 100)
    val sample = TopKOps.sampling(spark, "lineitem", "l_extendedprice", 100,
      TopKOps.optimalSampleSize(100, 60000, 0.1), 100)
    for (r <- Seq(server, sample)) {
      val got = r.df.select("l_extendedprice").collect().map(_.getDouble(0)).sorted.toSeq
      assert(got == expected)
    }
  }

  test("tpch q1 baseline and optimized agree with the oracle") {
    ensure()
    val li = SynthData.lineitem(spark, 0.01)
    val base = Tpch.baseline(spark, Tpch.q1, 100)
    val opt  = Tpch.optimized(spark, "Q1", 100)
    val norm = (df: org.apache.spark.sql.DataFrame) => df.select(
      col("l_returnflag"), col("l_linestatus"),
      round(col("sum_qty"), 2).as("sum_qty"),
      round(col("sum_base_price"), 2).as("sum_base_price"),
      round(col("sum_disc_price"), 2).as("sum_disc_price"),
      round(col("sum_charge"), 2).as("sum_charge"),
      col("count_order"))
    val duck = Tpch.q1.duckSql
      .replace("sum(CAST(l_quantity AS DOUBLE)) AS sum_qty", "ROUND(sum(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty")
      .replace("sum(CAST(l_extendedprice AS DOUBLE)) AS sum_base_price", "ROUND(sum(CAST(l_extendedprice AS DOUBLE)), 2) AS sum_base_price")
      .replace("sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))) AS sum_disc_price", "ROUND(sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE))), 2) AS sum_disc_price")
      .replace("sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) * (1 + CAST(l_tax AS DOUBLE))) AS sum_charge", "ROUND(sum(CAST(l_extendedprice AS DOUBLE) * (1 - CAST(l_discount AS DOUBLE)) * (1 + CAST(l_tax AS DOUBLE))), 2) AS sum_charge")
    Oracle.assertEquivalent(norm(base.df), duck, "lineitem" -> li)
    Oracle.assertEquivalent(norm(opt.df), duck, "lineitem" -> li)
    assert(opt.runtimeSeconds < base.runtimeSeconds)
  }
}
