package repro.core

import repro.{SparkSpec, TestHelpers}
import repro.data.EdaData

/** The task-centric facade and the fused create_report pipeline. */
class EdaSpec extends SparkSpec with TestHelpers {
  import spark.implicits._

  private lazy val df = EdaData.dataset(spark, rows = 500, nNumeric = 3, nCategorical = 2).cache()

  test("plot(df) renders an overview") {
    val r = Eda.plot(df)
    assert(r.title == "Overview")
    assert(r.tabs.map(_.name).contains("num_0"))
  }

  test("plot(df, col) dispatches on column type") {
    assert(Eda.plot(df, "num_1").title == "Univariate: num_1")
    assert(Eda.plot(df, "cat_0").tabs.map(_.name).contains("Pie Chart"))
  }

  test("plot(df, col1, col2) dispatches NN / NC / CC") {
    assert(Eda.plot(df, "num_1", "num_2").tabs.map(_.name).contains("Hexbin Plot"))
    assert(Eda.plot(df, "cat_0", "num_1").tabs.map(_.name).contains("Multi-Line Chart"))
    assert(Eda.plot(df, "cat_0", "cat_1").tabs.map(_.name).contains("Heat Map"))
  }

  test("plotCorrelation(df) / (df, col) / (df, col1, col2)") {
    assert(Eda.plotCorrelation(df).tabs.map(_.name) == Seq("Pearson", "Spearman", "Kendall"))
    assert(Eda.plotCorrelation(df, "num_0").title.contains("num_0"))
    assert(Eda.plotCorrelation(df, "num_0", "num_1").tabs.head.components.nonEmpty)
  }

  test("plotMissing(df) / (df, col) / (df, col1, col2)") {
    assert(Eda.plotMissing(df).tabs.map(_.name).contains("Dendrogram"))
    assert(Eda.plotMissing(df, "num_0").title.contains("num_0"))
    assert(Eda.plotMissing(df, "num_0", "num_1").tabs.map(_.name).contains("CDF"))
  }

  test("config map customizes a call (Figure 1 flow)") {
    val r = Eda.plot(df, "num_1", Map("hist.bins" -> 20))
    val hist = r.tab("Histogram").components.collectFirst {
      case c: ReportModel.ChartComponent => c
    }.get
    assert(hist.data.asInstanceOf[Intermediates.Histogram].bins == 20)
  }

  test("unknown config key fails fast") {
    intercept[IllegalArgumentException](Eda.plot(df, Map("no.such.key" -> 1)))
  }

  test("createReport: has Overview, Variables, Interactions, Correlations, Missing sections") {
    val r = Eda.createReport(df)
    val names = r.tabs.map(_.name)
    assert(names.exists(_.startsWith("Overview/")))
    assert(names.exists(_.startsWith("Variables/")))
    assert(names.contains("Interactions"))
    assert(names.exists(_.startsWith("Correlations/")))
    assert(names.exists(_.startsWith("Missing/")))
  }

  test("createReport: one Variables section per column") {
    val r = Eda.createReport(df)
    df.columns.foreach { c =>
      assert(r.tabs.exists(_.name.startsWith(s"Variables/Univariate: $c/")), c)
    }
  }

  test("createReport intermediates: shared pass-1 values are consistent") {
    val ri = Eda.computeReportIntermediates(df, EdaConfig.default)
    assert(ri.overview.dataset.rows == 500)
    // the same NumericStats object feeds overview and variables
    val fromOverview = ri.overview.numericStats.find(_.name == "num_0").get
    val fromVariables = ri.variables.collectFirst {
      case n: Univariate.NumericUnivariate if n.stats.name == "num_0" => n.stats
    }.get
    assert(fromOverview eq fromVariables)
  }

  test("createReport intermediates: interactions bounded by config") {
    val ri = Eda.computeReportIntermediates(df, EdaConfig.from(Map("report.interactions" -> 2)))
    assert(ri.interactions.size == 2)
  }

  test("createReport on an all-numeric table") {
    val d = EdaData.dataset(spark, 200, 4, 0)
    val r = Eda.createReport(d)
    assert(!r.tabs.exists(_.name.contains("cat_")))
  }

  test("createReport on an all-categorical table skips correlations") {
    val d = EdaData.dataset(spark, 200, 0, 3)
    val ri = Eda.computeReportIntermediates(d, EdaConfig.default)
    assert(ri.correlations.matrices.isEmpty)
    assert(ri.interactions.isEmpty)
  }

  test("createReport HTML round-trips") {
    val html = Render.toHtml(Eda.createReport(df))
    assert(html.contains("Profile Report") && html.length > 2000)
  }
}
