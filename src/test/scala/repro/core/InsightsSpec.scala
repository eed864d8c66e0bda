package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Intermediates._

/** Insight engine thresholds (Section 4.2.2). */
class InsightsSpec extends AnyFunSuite {
  private val cfg = EdaConfig.default

  private def numStats(name: String = "x", count: Long = 100, missing: Long = 0,
                       distinct: Long = 50, mean: Double = 0, std: Double = 1,
                       skew: Double = 0, kurt: Double = 0, zeros: Long = 0,
                       negatives: Long = 0, infinites: Long = 0): NumericStats =
    NumericStats(name, count, missing, distinct, mean, std, -1, 1, skew, kurt,
      zeros, negatives, infinites, 0.0, Array.fill(101)(0.0))

  test("missing insight above 5% threshold") {
    val in = Insights.numeric(numStats(missing = 10), None, 0, cfg)
    assert(in.exists(_.kind == "missing"))
  }
  test("no missing insight below threshold") {
    val in = Insights.numeric(numStats(missing = 2), None, 0, cfg)
    assert(!in.exists(_.kind == "missing"))
  }
  test("missing threshold is configurable") {
    val strict = EdaConfig.from(Map("insight.missing.threshold" -> 0.001))
    val in = Insights.numeric(numStats(missing = 2), None, 0, strict)
    assert(in.exists(_.kind == "missing"))
  }
  test("infinite insight") {
    assert(Insights.numeric(numStats(infinites = 3), None, 0, cfg).exists(_.kind == "infinite"))
  }
  test("constant insight") {
    assert(Insights.numeric(numStats(distinct = 1), None, 0, cfg).exists(_.kind == "constant"))
  }
  test("unique insight") {
    assert(Insights.numeric(numStats(distinct = 100), None, 0, cfg).exists(_.kind == "unique"))
  }
  test("skewed insight beyond |skew| > 1") {
    assert(Insights.numeric(numStats(skew = 2.5), None, 0, cfg).exists(_.kind == "skewed"))
    assert(!Insights.numeric(numStats(skew = 0.5), None, 0, cfg).exists(_.kind == "skewed"))
  }
  test("zeros insight above 10%") {
    assert(Insights.numeric(numStats(zeros = 20), None, 0, cfg).exists(_.kind == "zeros"))
  }
  test("negatives insight") {
    assert(Insights.numeric(numStats(negatives = 5), None, 0, cfg).exists(_.kind == "negatives"))
  }
  test("outlier insight above 1% of values") {
    assert(Insights.numeric(numStats(), None, outliers = 5, cfg).exists(_.kind == "outliers"))
    assert(!Insights.numeric(numStats(), None, outliers = 0, cfg).exists(_.kind == "outliers"))
  }
  test("approximately-normal insight for small skew and kurtosis") {
    assert(Insights.numeric(numStats(skew = 0.1, kurt = 0.2), None, 0, cfg).exists(_.kind == "normal"))
    assert(!Insights.numeric(numStats(skew = 0.5, kurt = 0.2), None, 0, cfg).exists(_.kind == "normal"))
  }
  test("uniform insight from a flat histogram") {
    val flat = Histogram("x", Array.tabulate(11)(_.toDouble), Array.fill(10)(100L))
    assert(Insights.numeric(numStats(), Some(flat), 0, cfg).exists(_.kind == "uniform"))
    val peaked = Histogram("x", Array.tabulate(11)(_.toDouble),
      Array(1000L, 1L, 1L, 1L, 1L, 1L, 1L, 1L, 1L, 1L))
    assert(!Insights.numeric(numStats(), Some(peaked), 0, cfg).exists(_.kind == "uniform"))
  }

  private def catStats(distinct: Long, count: Long = 100, missing: Long = 0) =
    CategoricalStats("c", count, missing, distinct, 1, 5, 3.0)

  test("high-cardinality insight above 50 distinct") {
    assert(Insights.categorical(catStats(80), cfg).exists(_.kind == "high-cardinality"))
    assert(!Insights.categorical(catStats(10), cfg).exists(_.kind == "high-cardinality"))
  }
  test("categorical missing insight") {
    assert(Insights.categorical(catStats(10, missing = 10), cfg).exists(_.kind == "missing"))
  }
  test("categorical constant/unique insights") {
    assert(Insights.categorical(catStats(1), cfg).exists(_.kind == "constant"))
    assert(Insights.categorical(catStats(100), cfg).exists(_.kind == "unique"))
  }

  test("similar-distribution insight on near-identical histograms") {
    val e = Array.tabulate(6)(_.toDouble)
    val a = Histogram("a", e, Array(10L, 20L, 30L, 20L, 10L))
    val b = Histogram("b", e, Array(11L, 19L, 31L, 19L, 10L))
    val c = Histogram("c", e, Array(90L, 0L, 0L, 0L, 0L))
    val in = Insights.similarDistributions(Seq(a, b, c), cfg)
    assert(in.exists(_.columns.toSet == Set("a", "b")))
    assert(!in.exists(_.columns.contains("c")))
  }

  test("high-correlation insight above 0.8") {
    val m = CorrelationMatrix("pearson", Seq("x", "y"),
      Array(Array(1.0, 0.95), Array(0.95, 1.0)))
    assert(Insights.highCorrelations(m, cfg).nonEmpty)
    val weak = CorrelationMatrix("pearson", Seq("x", "y"),
      Array(Array(1.0, 0.3), Array(0.3, 1.0)))
    assert(Insights.highCorrelations(weak, cfg).isEmpty)
  }

  test("high-correlation threshold is configurable") {
    val m = CorrelationMatrix("pearson", Seq("x", "y"),
      Array(Array(1.0, 0.5), Array(0.5, 1.0)))
    assert(Insights.highCorrelations(m, EdaConfig.from(
      Map("insight.correlation.threshold" -> 0.4))).nonEmpty)
  }

  test("correlated-missingness insight") {
    val m = CorrelationMatrix("nullity", Seq("x", "y"),
      Array(Array(1.0, 0.9), Array(0.9, 1.0)))
    assert(Insights.correlatedMissingness(m, cfg).exists(_.kind == "correlated-missingness"))
  }

  test("NaN correlations never produce insights") {
    val m = CorrelationMatrix("pearson", Seq("x", "y"),
      Array(Array(1.0, Double.NaN), Array(Double.NaN, 1.0)))
    assert(Insights.highCorrelations(m, cfg).isEmpty)
  }
}
