package repro.core

import repro.{SparkSpec, TestHelpers}
import repro.core.ReportModel._

/** Render module: tabbed layout, insight highlights, how-to guides, HTML. */
class RenderSpec extends SparkSpec with TestHelpers {
  import spark.implicits._

  private lazy val cfg = EdaConfig.default
  private lazy val numDf = (Seq.tabulate(50)(_.toDouble) ++ Seq(1000.0)).toDF("price").cache()
  private lazy val uniReport = Render.univariateReport(
    Univariate.compute(numDf, "price", cfg), cfg)

  test("numeric univariate report has the five Figure-2 tabs") {
    assert(uniReport.tabs.map(_.name) ==
      Seq("Stats", "Histogram", "KDE", "Normal Q-Q", "Box Plot"))
  }

  test("stats tab carries the column statistics table") {
    val t = uniReport.tab("Stats").components.collectFirst { case s: StatsTable => s }.get
    val keys = t.rows.map(_._1)
    assert(keys.contains("Mean") && keys.contains("Q1") && keys.contains("Skewness"))
  }

  test("each chart carries its kind and its how-to guide") {
    val hist = uniReport.tab("Histogram").components.collectFirst { case c: ChartComponent => c }.get
    assert(hist.kind == "histogram")
    assert(hist.howTo.exists(_.contains("hist.bins")))
  }

  test("how-to guide reflects a user override (the Figure 1 flow)") {
    val custom = Render.univariateReport(
      Univariate.compute(numDf, "price", EdaConfig.from(Map("hist.bins" -> 200))),
      EdaConfig.from(Map("hist.bins" -> 200)))
    val hist = custom.tab("Histogram").components.collectFirst { case c: ChartComponent => c }.get
    assert(hist.howTo.exists(_.contains("\"hist.bins\": 200")))
  }

  test("insight-flagged stats rows are highlighted") {
    val skewed = spark.range(2000).selectExpr("exp(randn(5) * 2) as v")
    val rep = Render.univariateReport(Univariate.compute(skewed, "v", cfg), cfg)
    val t = rep.tab("Stats").components.collectFirst { case s: StatsTable => s }.get
    assert(t.highlights.contains("Skewness"))
  }

  test("categorical univariate report has bar/pie/word tabs") {
    val catDf = Seq("a", "a", "b").toDF("c")
    val rep = Render.univariateReport(Univariate.compute(catDf, "c", cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Stats", "Bar Chart", "Pie Chart", "Word Frequencies"))
  }

  test("overview report: stats tab plus one tab per column") {
    val df = Seq((1.0, "a"), (2.0, "b")).toDF("n", "c")
    val rep = Render.overviewReport(Overview.compute(df, cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Stats", "n", "c"))
    assert(rep.tab("n").components.exists {
      case ch: ChartComponent => ch.kind == "histogram"; case _ => false
    })
    assert(rep.tab("c").components.exists {
      case ch: ChartComponent => ch.kind == "bar"; case _ => false
    })
  }

  test("bivariate NN report tabs") {
    val df = (1 to 30).map(i => (i.toDouble, i * 2.0)).toDF("x", "y")
    val rep = Render.bivariateReport(Bivariate.compute(df, "x", "y", cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Scatter Plot", "Hexbin Plot", "Binned Box Plot"))
  }

  test("bivariate CC report tabs") {
    val df = Seq(("a", "x"), ("b", "y")).toDF("p", "q")
    val rep = Render.bivariateReport(Bivariate.compute(df, "p", "q", cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Nested Bar Chart", "Stacked Bar Chart", "Heat Map"))
  }

  test("correlation report: one tab per method") {
    val df = (1 to 30).map(i => (i.toDouble, i * 2.0, (i % 7).toDouble)).toDF("x", "y", "z")
    val rep = Render.correlationReport(Correlation.matrix(df, cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Pearson", "Spearman", "Kendall"))
  }

  test("missing report: bar/spectrum/heatmap/dendrogram tabs") {
    val df = Seq((Option(1.0), Option("a")), (None: Option[Double], None: Option[String]))
      .toDF("x", "s")
    val rep = Render.missingReport(Missing.overview(df, cfg), cfg)
    assert(rep.tabs.map(_.name) == Seq("Bar Chart", "Spectrum", "Heat Map", "Dendrogram"))
  }

  test("HTML: self-contained page with highlighted insights and how-to") {
    val html = Render.toHtml(uniReport)
    assert(html.startsWith("<!DOCTYPE html>"))
    assert(html.contains("<h1>Univariate: price</h1>"))
    assert(html.contains("data-chart='histogram'"))
    assert(html.contains("How-to guide"))
    assert(html.contains("class='hl'")) // the outlier-driven highlight
  }

  test("HTML escapes markup in data") {
    val r = Report("t", Seq(Tab("a<b", Seq(StatsTable("x<y", Seq("k" -> "<v>"))))))
    val html = Render.toHtml(r)
    assert(html.contains("a&lt;b") && html.contains("&lt;v&gt;"))
    assert(!html.contains("<v>"))
  }

  test("text rendering lists tabs and marks insights") {
    val txt = Render.toText(uniReport)
    assert(txt.contains("== Univariate: price =="))
    assert(txt.contains("[Histogram]"))
  }

  test("report helpers: tab lookup error lists available tabs") {
    val e = intercept[NoSuchElementException](uniReport.tab("nope"))
    assert(e.getMessage.contains("Stats"))
  }
}
