package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.Intermediates._

/** Bivariate task — plot(df, col1, col2) (Figure 2, row 3).
  *
  * NN → scatter plot, hexbin-substitute 2-D grid, binned box plot.
  * NC/CN → categorical box plot, multi-line chart.
  * CC → nested bar chart / stacked bar chart / heat map, all rendered from
  * one shared contingency-table reduction.
  */
object Bivariate {

  sealed trait BivariateIntermediates { def insights: Seq[Insight] }

  final case class NumNumBivariate(
      xStats: NumericStats, yStats: NumericStats,
      scatter: ScatterPlot, grid: Grid2D, binnedBox: BinnedBoxPlot,
      insights: Seq[Insight]) extends BivariateIntermediates

  final case class CatNumBivariate(
      catColumn: String, numColumn: String,
      boxes: CategoricalBoxPlot, lines: MultiLineChart,
      insights: Seq[Insight]) extends BivariateIntermediates

  final case class CatCatBivariate(
      table: ContingencyTable,
      insights: Seq[Insight]) extends BivariateIntermediates

  def compute(df: DataFrame, c1: String, c2: String, cfg: EdaConfig): BivariateIntermediates =
    (TypeDetector.typeOf(df, c1), TypeDetector.typeOf(df, c2)) match {
      case (ColumnType.Numerical, ColumnType.Numerical)     => numNum(df, c1, c2, cfg)
      case (ColumnType.Categorical, ColumnType.Numerical)   => catNum(df, c1, c2, cfg)
      case (ColumnType.Numerical, ColumnType.Categorical)   => catNum(df, c2, c1, cfg)
      case (ColumnType.Categorical, ColumnType.Categorical) => catCat(df, c1, c2, cfg)
    }

  def numNum(df: DataFrame, x: String, y: String, cfg: EdaConfig): NumNumBivariate = {
    val aggs = SparkStage.columnAggregates(df, Seq(x, y), Nil, withDuplicates = false)
    val xs = aggs.numeric(x); val ys = aggs.numeric(y)

    val moments = SparkStage.pairwiseMoments(df, Seq((x, y)))((x, y))
    val (slope, intercept) = moments.regression
    val points = SparkStage.scatterSample(df, x, y, cfg.int("scatter.sample"))
    val scatter = ScatterPlot(x, y, points, slope, intercept, moments.pearson)

    val grid = SparkStage.grid2d(df, x, y, xs.min, xs.max, ys.min, ys.max,
      cfg.int("grid2d.xbins"), cfg.int("grid2d.ybins"))

    val (edges, binned) = SparkStage.binnedQuantiles(df, x, y, xs.min, xs.max,
      cfg.int("box.bins"))
    val boxes = binned.map { case (bin, qs, _) =>
      LocalStage.boxFromFiveNumbers(s"$x[$bin]", qs)
    }
    val binnedBox = BinnedBoxPlot(x, y, edges, boxes)

    val insights =
      if (!moments.pearson.isNaN &&
          math.abs(moments.pearson) > cfg.double("insight.correlation.threshold"))
        Seq(Insight("high-correlation", Seq(x, y),
          f"$x and $y are highly correlated (pearson = ${moments.pearson}%.3f)",
          moments.pearson))
      else Nil
    NumNumBivariate(xs, ys, scatter, grid, binnedBox, insights)
  }

  def catNum(df: DataFrame, cat: String, num: String, cfg: EdaConfig): CatNumBivariate = {
    val aggs = SparkStage.columnAggregates(df, Seq(num), Nil, withDuplicates = false)
    val ns = aggs.numeric(num)
    val topK = cfg.int("nc.topk")

    val grouped = SparkStage.groupedNumericStats(df, cat, num, topK)
    val boxes = CategoricalBoxPlot(cat, num, grouped.map { case (g, _, _, qs) =>
      g -> LocalStage.boxFromFiveNumbers(s"$num|$cat=$g", qs)
    })

    val cats = grouped.map(_._1)
    val lineHists = SparkStage.groupedHistograms(df, cat, num, cats,
      ns.min, ns.max, cfg.int("hist.bins"))
    val edges = Array.tabulate(cfg.int("hist.bins") + 1) { i =>
      val w = if (ns.max > ns.min) (ns.max - ns.min) / cfg.int("hist.bins") else 1.0
      ns.min + i * w
    }
    val lines = MultiLineChart(cat, num, edges, cats.map(c => c -> lineHists(c)))

    CatNumBivariate(cat, num, boxes, lines, Nil)
  }

  def catCat(df: DataFrame, c1: String, c2: String, cfg: EdaConfig): CatCatBivariate = {
    val cells = SparkStage.contingency(df, c1, c2)
    val table = LocalStage.contingencyTable(c1, c2, cells, cfg.int("cc.topk"))
    CatCatBivariate(table, Nil)
  }
}
