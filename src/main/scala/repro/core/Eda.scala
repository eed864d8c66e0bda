package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.Intermediates._
import repro.core.ReportModel.Report

/** DataPrep.EDA's task-centric API (Section 3.2), ported to Scala/Spark:
  *
  * - `plot(df)` — "I want an overview of the dataset"
  * - `plot(df, col1)` — "I want to understand col1"
  * - `plot(df, col1, col2)` — "I want to understand their relationship"
  * - `plotCorrelation(df[, col1[, col2]])` — correlation analysis
  * - `plotMissing(df[, col1[, col2]])` — missing-value analysis
  * - `createReport(df)` — the full profile report (Table 2's workload)
  *
  * Every call takes an optional config map of dotted keys (e.g.
  * `Map("hist.bins" -> 200)`), exactly the customization flow of Figure 1.
  */
object Eda {

  /** Validate the user config and tune the session for the interactive
    * small-data regime (see EngineTuning) — the paper's engine-choice step.
    */
  private def cfgOf(df: DataFrame, config: Map[String, Any]): EdaConfig = {
    EngineTuning.tune(df.sparkSession)
    EdaConfig.from(config)
  }

  // ---- plot --------------------------------------------------------------

  def plot(df: DataFrame): Report = plot(df, Map.empty[String, Any])
  def plot(df: DataFrame, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.overviewReport(Overview.compute(df, cfg), cfg)
  }

  def plot(df: DataFrame, col1: String): Report = plot(df, col1, Map.empty[String, Any])
  def plot(df: DataFrame, col1: String, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.univariateReport(Univariate.compute(df, col1, cfg), cfg)
  }

  def plot(df: DataFrame, col1: String, col2: String): Report =
    plot(df, col1, col2, Map.empty[String, Any])
  def plot(df: DataFrame, col1: String, col2: String, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.bivariateReport(Bivariate.compute(df, col1, col2, cfg), cfg)
  }

  // ---- plot_correlation ---------------------------------------------------

  def plotCorrelation(df: DataFrame): Report = plotCorrelation(df, Map.empty[String, Any])
  def plotCorrelation(df: DataFrame, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.correlationReport(Correlation.matrix(df, cfg), cfg)
  }

  def plotCorrelation(df: DataFrame, col1: String): Report =
    plotCorrelation(df, col1, Map.empty[String, Any])
  def plotCorrelation(df: DataFrame, col1: String, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.correlationVectorReport(Correlation.vector(df, col1, cfg), cfg)
  }

  def plotCorrelation(df: DataFrame, col1: String, col2: String): Report =
    plotCorrelation(df, col1, col2, Map.empty[String, Any])
  def plotCorrelation(df: DataFrame, col1: String, col2: String,
                      config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.correlationPairReport(Correlation.pair(df, col1, col2, cfg), cfg)
  }

  // ---- plot_missing ---------------------------------------------------------

  def plotMissing(df: DataFrame): Report = plotMissing(df, Map.empty[String, Any])
  def plotMissing(df: DataFrame, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.missingReport(Missing.overview(df, cfg), cfg)
  }

  def plotMissing(df: DataFrame, col1: String): Report =
    plotMissing(df, col1, Map.empty[String, Any])
  def plotMissing(df: DataFrame, col1: String, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.missingImpactReport(Missing.impact(df, col1, cfg), cfg)
  }

  def plotMissing(df: DataFrame, col1: String, col2: String): Report =
    plotMissing(df, col1, col2, Map.empty[String, Any])
  def plotMissing(df: DataFrame, col1: String, col2: String,
                  config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.missingPairReport(Missing.pair(df, col1, col2, cfg), cfg)
  }

  // ---- create_report ---------------------------------------------------------

  /** Everything the profile report needs, computed with shared passes. */
  final case class ReportIntermediates(
      overview: Overview.OverviewIntermediates,
      variables: Seq[Univariate.UnivariateIntermediates],
      interactions: Seq[Grid2D],
      correlations: Correlation.CorrelationIntermediates,
      missing: Missing.MissingOverviewIntermediates)

  /** The optimized report pipeline (the DataPrep.EDA column of Table 2):
    * O(1) Spark actions regardless of column count —
    *
    *  1. fused per-column aggregates over every column (precompute stage;
    *     shared by the Overview section, every Variables section, and the
    *     correlation variance bookkeeping),
    *  2. one job for all histograms, one for all frequency tables, one for
    *     all outlier counts,
    *  3. one moment agg for Pearson, one reduce-to-driver collect shared by
    *     local Spearman and Kendall,
    *  4. one agg + one spectrum job + one nullity moment agg for missing,
    *  5. `report.interactions` small 2-D grid jobs.
    */
  def computeReportIntermediates(df: DataFrame, cfg: EdaConfig): ReportIntermediates = {
    EngineTuning.tune(df.sparkSession)
    val numCols = TypeDetector.numericColumns(df)
    val catCols = TypeDetector.categoricalColumns(df)

    // pass 1 (shared by everything below)
    val aggs = SparkStage.columnAggregates(df, numCols, catCols)
    val numStats = numCols.map(aggs.numeric)
    val withData = numStats.filter(_.count > 0)

    // fused per-column reductions
    val hists = SparkStage.histograms(df, withData.map(_.name),
      withData.map(_.min), withData.map(_.max), cfg.int("hist.bins"))
    val rawFreqs = SparkStage.frequencies(df, catCols, cfg.int("freq.maxdistinct"))
    val outliers = SparkStage.outlierCounts(df, withData.map { s =>
      val (lo, hi) = LocalStage.fences(s); (s.name, lo, hi)
    })

    val overview = Overview.fromAggregates(df, cfg, numCols, catCols, aggs,
      sharedHists = Some(hists), sharedFreqs = Some(rawFreqs))

    // Variables: all local — every reduction is shared from above
    val variables: Seq[Univariate.UnivariateIntermediates] =
      numCols.map { c =>
        Univariate.fromStats(df, aggs.numeric(c), cfg,
          sharedHistogram = Some(hists.getOrElse(c, Histogram(c, Array(0.0, 1.0), Array(0L)))),
          sharedOutliers = Some(outliers.getOrElse(c, 0L)))
      } ++ catCols.map { c =>
        Univariate.fromCatStats(df, aggs.categorical(c), cfg,
          sharedFrequencies = Some(rawFreqs.getOrElse(c, Nil)), withWords = false)
      }

    // Interactions: 2-D grids for the first k numeric pairs
    val k = cfg.int("report.interactions")
    val pairs = (for (i <- withData.indices; j <- i + 1 until withData.size)
      yield (withData(i), withData(j))).take(k)
    val interactions = pairs.map { case (a, b) =>
      SparkStage.grid2d(df, a.name, b.name, a.min, a.max, b.min, b.max,
        cfg.int("grid2d.xbins"), cfg.int("grid2d.ybins"))
    }

    val corrCols = numCols.take(cfg.int("corr.maxcols"))
    val correlations = Correlation.matrixFromAggregates(df, corrCols, aggs, cfg)

    val missing = Missing.overview(df, cfg)

    ReportIntermediates(overview, variables, interactions, correlations, missing)
  }

  def createReport(df: DataFrame): Report = createReport(df, Map.empty[String, Any])
  def createReport(df: DataFrame, config: Map[String, Any]): Report = {
    val cfg = cfgOf(df, config)
    Render.fullReport(computeReportIntermediates(df, cfg), cfg)
  }
}
