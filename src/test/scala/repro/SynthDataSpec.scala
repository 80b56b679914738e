package repro

import org.apache.spark.sql.functions._
import repro.SynthData._

class SynthDataSpec extends SparkSpec {

  test("lineitem row count and schema extensions") {
    val df = lineitem(spark, 0.001)
    assert(df.count() == 6000)
    val cols = df.columns.toSet
    assert(Set("l_orderkey", "l_extendedprice", "l_shipdate", "l_shipmode", "l_shipinstruct")
      .subsetOf(cols))
  }

  test("orders has shippriority; part has brand and container") {
    assert(orders(spark, 0.001).columns.contains("o_shippriority"))
    val p = part(spark, 0.01).select("p_brand", "p_container").distinct().collect()
    assert(p.forall(_.getString(0).startsWith("Brand#")))
    assert(p.exists(_.getString(1) == "MED BOX"))
  }

  test("generators are deterministic in (sf, seed)") {
    val a = customer(spark, 0.001).collect().map(_.toString).sorted
    val b = customer(spark, 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("c_acctbal spans [-1000, 9000] so the paper's join sweep applies") {
    val mm = customer(spark, 0.01).agg(min("c_acctbal"), max("c_acctbal")).collect()(0)
    assert(mm.getDouble(0) < -900 && mm.getDouble(1) > 8000)
  }

  test("l_extendedprice is uniform in [900, 90900] so selectivity maps linearly") {
    val n = lineitem(spark, 0.01).where(col("l_extendedprice") <= 900 + 0.1 * 90000).count()
    assert(math.abs(n / 60000.0 - 0.1) < 0.02)
  }

  test("zipfCdf: uniform at theta 0, normalized, monotone") {
    val cdf = zipfCdf(100, 0.0)
    assert(math.abs(cdf(0) - 0.01) < 1e-9)
    assert(cdf.last == 1.0)
    assert(cdf.sliding(2).forall(w => w(1) >= w(0)))
  }

  test("zipfCdf at theta 1.3: top-4 of 100 groups hold ~59% (paper's anchor)") {
    val cdf = zipfCdf(100, 1.3)
    assert(math.abs(cdf(3) - 0.59) < 0.03, s"top-4 mass ${cdf(3)}")
  }

  test("zipfLookup inverts the CDF") {
    val cdf = zipfCdf(4, 0.0) // 0.25, 0.5, 0.75, 1.0
    assert(zipfLookup(cdf, 0.1) == 0)
    assert(zipfLookup(cdf, 0.26) == 1)
    assert(zipfLookup(cdf, 0.99) == 3)
  }

  test("groupTable: group columns have the requested cardinalities") {
    val df = groupTable(spark, 5000, Seq(2, 4, 8), 2, theta = 0.0)
    assert(df.columns.toSeq == Seq("g0", "g1", "g2", "v0", "v1"))
    assert(df.select("g0").distinct().count() == 2)
    assert(df.select("g2").distinct().count() == 8)
  }

  test("groupTable skew concentrates rows in small group ids") {
    val df = groupTable(spark, 20000, Seq(100), 1, theta = 1.3)
    val top4 = df.where(col("g0") < 4).count().toDouble / 20000
    assert(top4 > 0.5 && top4 < 0.7, s"top-4 mass $top4")
  }

  test("floatTable: values in [0,1) with 4-decimal rounding") {
    val df = floatTable(spark, 1000, 3)
    assert(df.columns.toSeq == Seq("c0", "c1", "c2"))
    val bad = df.where(col("c0") < 0 || col("c0") > 1).count()
    assert(bad == 0)
    val v = df.select("c0").head().getDouble(0)
    assert(math.abs(v * 10000 - math.rint(v * 10000)) < 1e-6)
  }
}
