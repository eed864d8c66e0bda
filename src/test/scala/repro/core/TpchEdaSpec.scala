package repro.core

import repro.{Oracle, SparkSpec, SynthData, TestHelpers}

/** Integration: the task-centric API over the provided TPC-H-lite
  * generators (SynthData) — an OLAP-shaped workload, different from the
  * Kaggle-shaped EdaData tables (wide numerics, dates-as-categoricals,
  * multiplicative key skew).
  */
class TpchEdaSpec extends SparkSpec with TestHelpers {
  import spark.implicits._

  private val sf = 0.001
  private lazy val lineitem = SynthData.lineitem(spark, sf).cache()
  private lazy val orders = SynthData.orders(spark, sf).cache()
  private lazy val customer = SynthData.customer(spark, sf).cache()

  test("overview of lineitem: types split as expected") {
    val o = Overview.compute(lineitem, EdaConfig.default)
    assert(o.dataset.rows == 6000)
    // returnflag/linestatus strings + shipdate date are categorical
    assert(o.dataset.categoricalColumns == 3)
    assert(o.dataset.numericColumns == 7)
    assert(o.frequencies("l_returnflag").topK.map(_._1).toSet == Set("N", "R", "A"))
  }

  test("univariate on l_extendedprice matches DuckDB") {
    val u = Univariate.numeric(lineitem, "l_extendedprice", EdaConfig.default)
    val got = Seq((u.stats.count, u.stats.mean, u.stats.min, u.stats.max))
      .toDF("cnt", "m", "mn", "mx")
    Oracle.assertEquivalent(got,
      "SELECT count(l_extendedprice) AS cnt, avg(CAST(l_extendedprice AS DOUBLE)) AS m, " +
      "min(CAST(l_extendedprice AS DOUBLE)) AS mn, max(CAST(l_extendedprice AS DOUBLE)) AS mx " +
      "FROM li", "li" -> lineitem)
  }

  test("univariate on l_quantity: uniform insight fires on the uniform column") {
    val u = Univariate.numeric(lineitem, "l_quantity", EdaConfig.default)
    assert(u.insights.exists(_.kind == "uniform"), u.insights.map(_.kind))
  }

  test("bivariate quantity vs extendedprice grid counts all rows") {
    val b = Bivariate.numNum(lineitem, "l_quantity", "l_extendedprice", EdaConfig.default)
    assert(b.grid.counts.map(_.sum).sum == 6000)
  }

  test("bivariate returnflag vs quantity groups per flag") {
    val b = Bivariate.catNum(lineitem, "l_returnflag", "l_quantity", EdaConfig.default)
    assert(b.boxes.boxes.map(_._1).toSet == Set("N", "R", "A"))
  }

  test("correlation on orders: totalprice uncorrelated with custkey") {
    val c = Correlation.matrix(orders, EdaConfig.default)
    val p = c.matrices.find(_.method == "pearson").get
    val i = p.columns.indexOf("o_custkey"); val j = p.columns.indexOf("o_totalprice")
    assert(math.abs(p(i, j)) < 0.1)
  }

  test("correlation pair pearson matches DuckDB on customer") {
    val c = Correlation.pair(customer, "c_nationkey", "c_acctbal", EdaConfig.default)
    val got = Seq(Tuple1(c.coefficients("pearson"))).toDF("r")
    Oracle.assertEquivalent(got,
      "SELECT corr(CAST(c_nationkey AS DOUBLE), CAST(c_acctbal AS DOUBLE)) AS r FROM c",
      "c" -> customer)
  }

  test("missing overview on complete TPC-H data reports zero missing") {
    val m = Missing.overview(lineitem, EdaConfig.default)
    assert(m.bar.missingCounts.forall(_ == 0))
    assert(m.insights.isEmpty)
  }

  test("full report over a zipf-skewed key table flags the skew") {
    val z = SynthData.zipfKeys(spark, rows = 5000, nKeys = 1000).cache()
    val ri = Eda.computeReportIntermediates(z, EdaConfig.default)
    val kStats = ri.overview.numericStats.find(_.name == "k").get
    assert(kStats.skewness > 1.0)
    assert(ri.overview.insights.exists(i => i.kind == "skewed" && i.columns == Seq("k")))
    z.unpersist()
  }

  test("full report over lineitem renders every section") {
    val r = Eda.createReport(lineitem)
    assert(r.tabs.exists(_.name.startsWith("Variables/Univariate: l_shipdate/")))
    assert(r.tabs.exists(_.name.startsWith("Correlations/")))
  }
}
