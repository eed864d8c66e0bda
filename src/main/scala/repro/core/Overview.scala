package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.Intermediates._

/** Overview task — plot(df): dataset statistics plus a histogram per
  * numerical column and a bar chart per categorical column (Figure 2, row 1).
  *
  * Pipeline: pass 1 = one wide agg over every column (the precompute stage);
  * pass 2 = one job for ALL histograms + one job for ALL bar charts. Three
  * Spark actions total, independent of the number of columns.
  */
object Overview {

  final case class OverviewIntermediates(
      dataset: DatasetStats,
      numericStats: Seq[NumericStats],
      categoricalStats: Seq[CategoricalStats],
      histograms: Map[String, Histogram],
      frequencies: Map[String, CategoryFrequencies],
      insights: Seq[Insight])

  def compute(df: DataFrame, cfg: EdaConfig): OverviewIntermediates = {
    val numCols = TypeDetector.numericColumns(df)
    val catCols = TypeDetector.categoricalColumns(df)

    val aggs = SparkStage.columnAggregates(df, numCols, catCols)
    fromAggregates(df, cfg, numCols, catCols, aggs)
  }

  /** Build the overview from an already-computed pass 1 — createReport
    * shares one `columnAggregates` across every report section.
    */
  def fromAggregates(df: DataFrame, cfg: EdaConfig, numCols: Seq[String],
                     catCols: Seq[String],
                     aggs: SparkStage.TableAggregates,
                     sharedHists: Option[Map[String, Histogram]] = None,
                     sharedFreqs: Option[Map[String, Seq[(String, Long)]]] = None): OverviewIntermediates = {
    val bins = cfg.int("hist.bins")
    val numStats = numCols.map(aggs.numeric)
    val catStats = catCols.map(aggs.categorical)

    val withData = numStats.filter(s => s.count > 0)
    val hists = sharedHists.getOrElse(SparkStage.histograms(df, withData.map(_.name),
      withData.map(_.min), withData.map(_.max), bins))

    val rawFreqs = sharedFreqs.getOrElse(
      SparkStage.frequencies(df, catCols, cfg.int("freq.maxdistinct")))
    val topK = cfg.int("bar.topk")
    val freqs = catStats.map { s =>
      s.name -> CategoryFrequencies(s.name,
        rawFreqs.getOrElse(s.name, Nil).take(topK), s.distinct, s.count)
    }.toMap

    val dataset = DatasetStats(
      rows = aggs.rows, columns = numCols.size + catCols.size,
      numericColumns = numCols.size, categoricalColumns = catCols.size,
      missingCells = numStats.map(_.missing).sum + catStats.map(_.missing).sum,
      totalCells = aggs.rows * (numCols.size + catCols.size),
      duplicateRows = aggs.duplicateRows)

    val insights =
      numStats.flatMap(s => Insights.numeric(s, hists.get(s.name), outliers = 0L, cfg)) ++
      catStats.flatMap(s => Insights.categorical(s, cfg)) ++
      Insights.similarDistributions(numCols.flatMap(hists.get), cfg)

    OverviewIntermediates(dataset, numStats, catStats, hists, freqs, insights)
  }
}
