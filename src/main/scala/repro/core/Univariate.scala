package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.Intermediates._

/** Univariate task — plot(df, col1) (Figure 2, row 2).
  *
  * Numerical: column statistics, histogram, KDE plot, normal Q-Q plot, box
  * plot. The quantile grid from pass 1 is computed once and shared by the
  * stats table, the box plot, and the Q-Q plot; the histogram reduction is
  * shared by the histogram plot, the KDE, and the uniformity insight — the
  * paper's computation-sharing optimization.
  *
  * Categorical: column statistics, bar chart, pie chart, word cloud / word
  * frequencies (the bar and pie charts share one frequency reduction).
  */
object Univariate {

  sealed trait UnivariateIntermediates { def insights: Seq[Insight] }

  final case class NumericUnivariate(
      stats: NumericStats,
      histogram: Histogram,
      kde: KdeCurve,
      qq: QQPlot,
      box: BoxPlot,
      insights: Seq[Insight]) extends UnivariateIntermediates

  final case class CategoricalUnivariate(
      stats: CategoricalStats,
      frequencies: CategoryFrequencies,
      words: WordFrequencies,
      insights: Seq[Insight]) extends UnivariateIntermediates

  def compute(df: DataFrame, column: String, cfg: EdaConfig): UnivariateIntermediates =
    TypeDetector.typeOf(df, column) match {
      case ColumnType.Numerical   => numeric(df, column, cfg)
      case ColumnType.Categorical => categorical(df, column, cfg)
    }

  def numeric(df: DataFrame, column: String, cfg: EdaConfig): NumericUnivariate = {
    val aggs = SparkStage.columnAggregates(df, Seq(column), Nil, withDuplicates = false)
    fromStats(df, aggs.numeric(column), cfg)
  }

  /** Numeric univariate from already-computed pass-1 stats (createReport
    * shares pass 1; histograms/outliers may also be shared via the
    * `sharedHistogram`/`sharedOutliers` hooks).
    */
  def fromStats(df: DataFrame, s: NumericStats, cfg: EdaConfig,
                sharedHistogram: Option[Histogram] = None,
                sharedOutliers: Option[Long] = None): NumericUnivariate = {
    val bins = cfg.int("hist.bins")
    val hist = sharedHistogram.getOrElse {
      if (s.count == 0) Histogram(s.name, Array(0.0, 1.0), Array(0L))
      else SparkStage.histograms(df, Seq(s.name), Seq(s.min), Seq(s.max), bins)(s.name)
    }
    val outliers = sharedOutliers.getOrElse {
      if (s.count == 0) 0L
      else {
        val (lo, hi) = LocalStage.fences(s)
        SparkStage.outlierCounts(df, Seq((s.name, lo, hi)))(s.name)
      }
    }
    val kde = LocalStage.kdeCurve(s, hist, cfg.int("hist.gridpoints"))
    val qq = LocalStage.qqPlot(s, cfg.int("qq.points"))
    val box = LocalStage.boxPlot(s, outliers)
    val insights = Insights.numeric(s, Some(hist), outliers, cfg)
    NumericUnivariate(s, hist, kde, qq, box, insights)
  }

  def categorical(df: DataFrame, column: String, cfg: EdaConfig): CategoricalUnivariate = {
    val aggs = SparkStage.columnAggregates(df, Nil, Seq(column), withDuplicates = false)
    fromCatStats(df, aggs.categorical(column), cfg, sharedFrequencies = None)
  }

  /** Categorical univariate; `withWords = false` skips the word-frequency
    * pass (createReport omits word clouds, matching the profile report).
    */
  def fromCatStats(df: DataFrame, s: CategoricalStats, cfg: EdaConfig,
                sharedFrequencies: Option[Seq[(String, Long)]],
                withWords: Boolean = true): CategoricalUnivariate = {
    val raw = sharedFrequencies.getOrElse(
      SparkStage.frequencies(df, Seq(s.name), cfg.int("freq.maxdistinct"))(s.name))
    val freq = CategoryFrequencies(s.name, raw.take(cfg.int("bar.topk")), s.distinct, s.count)
    val words =
      if (withWords) SparkStage.wordFrequencies(df, s.name, cfg.int("wordfreq.topk"))
      else WordFrequencies(s.name, Nil, 0L)
    CategoricalUnivariate(s, freq, words, Insights.categorical(s, cfg))
  }
}
