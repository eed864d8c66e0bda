package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Intermediates._
import repro.stats.Dendrogram

/** Missing-value task — plot_missing(df[, col1[, col2]]) (Figure 2).
  *
  * Overview: bar chart of missing counts, missing spectrum, nullity
  * correlation heatmap, dendrogram. The nullity moment pass is shared by
  * the heatmap and the dendrogram (disagreement distances come from the
  * same sums — computation sharing).
  *
  * Impact (col1): the distribution of every other column before vs. after
  * dropping the rows where col1 is missing — ALL columns in one pass per
  * column kind, split by a keep-flag.
  *
  * Pair (col1, col2): histogram, PDF, CDF, and box plot of col2 before vs.
  * after dropping col1-missing rows.
  */
object Missing {

  final case class MissingOverviewIntermediates(
      bar: MissingBarChart,
      spectrum: MissingSpectrum,
      nullityCorrelation: CorrelationMatrix,
      dendrogram: MissingDendrogram,
      insights: Seq[Insight])

  final case class MissingImpactIntermediates(
      column: String,
      rowsTotal: Long,
      rowsKept: Long,
      histograms: Map[String, ImpactHistogram],
      frequencies: Map[String, ImpactFrequencies],
      insights: Seq[Insight])

  final case class MissingPairIntermediates(
      col1: String, col2: String,
      rowsTotal: Long, rowsKept: Long,
      histogram: Option[ImpactHistogram],
      pdfBefore: Array[Double], pdfAfter: Array[Double],
      cdfBefore: Array[Double], cdfAfter: Array[Double],
      boxes: Option[ImpactBoxPlot],
      frequencies: Option[ImpactFrequencies],
      insights: Seq[Insight])

  /** plot_missing(df). Columns with no missing values are kept in the bar
    * chart and spectrum but — like missingno — excluded from the nullity
    * correlation/dendrogram unless fewer than two columns have any missing.
    */
  def overview(df: DataFrame, cfg: EdaConfig): MissingOverviewIntermediates = {
    val cols = df.columns.toSeq
    // pass 1: rows + missing count per column, one action
    val exprs = count(lit(1)) +: cols.map(c =>
      count(when(SparkStage.isMissing(df, c), 1)))
    val row = df.agg(exprs.head, exprs.tail: _*).head()
    val rows = row.getLong(0)
    val missingCounts = cols.indices.map(i => row.getLong(i + 1))
    val bar = MissingBarChart(cols, missingCounts, rows)

    val spectrum = SparkStage.missingSpectrum(df, cols, cfg.int("spectrum.bins"))

    val withMissing = cols.zip(missingCounts).filter(_._2 > 0).map(_._1)
    val nullityCols = if (withMissing.size >= 2) withMissing else cols
    val moments = SparkStage.nullityMoments(df, nullityCols)
    val missingOf = cols.zip(missingCounts).toMap
    val nullityCorr = LocalStage.correlationMatrix("nullity", nullityCols,
      LocalStage.pearsonFromMoments(moments),
      hasVariance = c => missingOf(c) > 0 && missingOf(c) < rows)
    val distances = LocalStage.nullityDistances(nullityCols, rows, moments)
    val dendrogram = MissingDendrogram(nullityCols,
      Dendrogram.singleLinkage(nullityCols, distances))

    val missingT = cfg.double("insight.missing.threshold")
    val insights = cols.zip(missingCounts).collect {
      case (c, m) if rows > 0 && m.toDouble / rows > missingT =>
        Insight("missing", Seq(c),
          f"$c has ${m.toDouble / rows * 100}%.1f%% missing values", m.toDouble / rows)
    } ++ Insights.correlatedMissingness(nullityCorr, cfg)

    MissingOverviewIntermediates(bar, spectrum, nullityCorr, dendrogram, insights)
  }

  /** plot_missing(df, col1). */
  def impact(df: DataFrame, col1: String, cfg: EdaConfig): MissingImpactIntermediates = {
    require(df.columns.contains(col1), s"column '$col1' not found")
    val numCols = TypeDetector.numericColumns(df).filterNot(_ == col1)
    val catCols = TypeDetector.categoricalColumns(df).filterNot(_ == col1)
    val aggs = SparkStage.columnAggregates(df, numCols, catCols, withDuplicates = false)
    val keep = !SparkStage.isMissing(df, col1)

    val withData = numCols.map(aggs.numeric).filter(_.count > 0)
    val hists = SparkStage.impactHistograms(df, withData.map(_.name),
      withData.map(_.min), withData.map(_.max), cfg.int("hist.bins"), keep)

    val freqsRaw = SparkStage.impactFrequencies(df, catCols,
      cfg.int("freq.maxdistinct"), keep)
    val topK = cfg.int("bar.topk")
    val freqs = catCols.map(c =>
      c -> ImpactFrequencies(c, freqsRaw.getOrElse(c, Nil).take(topK))).toMap

    // rows kept = rows where col1 present; derivable from a numeric/cat agg
    // of col1 would need col1 in pass 1 — use a dedicated tiny agg instead.
    val row = df.agg(count(lit(1)), count(when(keep, 1))).head()
    val (rowsTotal, rowsKept) = (row.getLong(0), row.getLong(1))

    val simT = cfg.double("insight.similarity.threshold")
    val insights = hists.values.toSeq.sortBy(_.column).flatMap { h =>
      val d = repro.stats.LocalStats.l1Distance(h.before.toSeq, h.after.toSeq)
      if (d > simT)
        Some(Insight("missing-impact", Seq(col1, h.column),
          f"dropping missing rows of $col1 changes the distribution of ${h.column} (L1 = $d%.3f)", d))
      else None
    }
    MissingImpactIntermediates(col1, rowsTotal, rowsKept, hists, freqs, insights)
  }

  /** plot_missing(df, col1, col2). */
  def pair(df: DataFrame, col1: String, col2: String, cfg: EdaConfig): MissingPairIntermediates = {
    require(df.columns.contains(col1), s"column '$col1' not found")
    val keep = !SparkStage.isMissing(df, col1)
    val row = df.agg(count(lit(1)), count(when(keep, 1))).head()
    val (rowsTotal, rowsKept) = (row.getLong(0), row.getLong(1))

    TypeDetector.typeOf(df, col2) match {
      case ColumnType.Numerical =>
        val aggs = SparkStage.columnAggregates(df, Seq(col2), Nil, withDuplicates = false)
        val s = aggs.numeric(col2)
        val hist = SparkStage.impactHistograms(df, Seq(col2), Seq(s.min), Seq(s.max),
          cfg.int("hist.bins"), keep).get(col2)
        val (pdfB, cdfB) = hist.map(h => LocalStage.pdfCdf(h.before)).getOrElse((Array.empty[Double], Array.empty[Double]))
        val (pdfA, cdfA) = hist.map(h => LocalStage.pdfCdf(h.after)).getOrElse((Array.empty[Double], Array.empty[Double]))

        // five-number summaries before/after in one action
        val yc = SparkStage.cleanNum(col2)
        val probs = lit(Array(0.0, 0.25, 0.5, 0.75, 1.0))
        val qRow = df.agg(
          percentile_approx(yc, probs, lit(10000)),
          percentile_approx(when(keep, yc), probs, lit(10000))).head()
        def qs(i: Int): Option[Array[Double]] =
          if (qRow.isNullAt(i)) None else Some(qRow.getSeq[Double](i).toArray)
        val boxes = for (b <- qs(0); a <- qs(1)) yield ImpactBoxPlot(col2,
          LocalStage.boxFromFiveNumbers(s"$col2 (all rows)", b),
          LocalStage.boxFromFiveNumbers(s"$col2 ($col1 present)", a))

        val insights = hist.toSeq.flatMap { h =>
          val d = repro.stats.LocalStats.l1Distance(h.before.toSeq, h.after.toSeq)
          if (d > cfg.double("insight.similarity.threshold"))
            Some(Insight("missing-impact", Seq(col1, col2),
              f"dropping missing rows of $col1 changes the distribution of $col2 (L1 = $d%.3f)", d))
          else None
        }
        MissingPairIntermediates(col1, col2, rowsTotal, rowsKept,
          hist, pdfB, pdfA, cdfB, cdfA, boxes, None, insights)

      case ColumnType.Categorical =>
        val freq = SparkStage.impactFrequencies(df, Seq(col2),
          cfg.int("freq.maxdistinct"), keep).get(col2)
          .map(v => ImpactFrequencies(col2, v.take(cfg.int("bar.topk"))))
        MissingPairIntermediates(col1, col2, rowsTotal, rowsKept,
          None, Array.empty, Array.empty, Array.empty, Array.empty, None, freq, Nil)
    }
  }
}
