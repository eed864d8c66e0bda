package repro.core

import repro.core.Intermediates._
import repro.stats.{Kde, LocalStats}
import repro.stats.LocalStats.PairMoments

/** The local stage of the Compute module (Section 5.2's "Pandas
  * computation"): plain Scala over the small results the distributed stage
  * collected. Scheduling distributed work for these would cost more than
  * the computation itself — the paper's "Dask is slow on tiny data" point.
  */
object LocalStage {

  /** Assemble a symmetric correlation matrix from per-pair coefficients.
    * The diagonal is 1 where the column has variance, NaN otherwise.
    */
  def correlationMatrix(method: String, cols: Seq[String],
                        coeff: Map[(String, String), Double],
                        hasVariance: String => Boolean): CorrelationMatrix = {
    val m = cols.size
    val values = Array.ofDim[Double](m, m)
    for (i <- 0 until m; j <- 0 until m) {
      values(i)(j) =
        if (i == j) { if (hasVariance(cols(i))) 1.0 else Double.NaN }
        else coeff.getOrElse((cols(math.min(i, j)), cols(math.max(i, j))), Double.NaN)
    }
    CorrelationMatrix(method, cols, values)
  }

  def pearsonFromMoments(moments: Map[(String, String), PairMoments]): Map[(String, String), Double] =
    moments.map { case (p, m) => p -> m.pearson }

  /** Pairwise-complete (x, y) arrays of columns i, j of the collected
    * numeric matrix (column-major, NaN = missing).
    */
  private def completePairs(matrix: Array[Array[Double]], i: Int, j: Int): (Array[Double], Array[Double]) = {
    val xi = matrix(i); val yj = matrix(j)
    val xs = new scala.collection.mutable.ArrayBuilder.ofDouble
    val ys = new scala.collection.mutable.ArrayBuilder.ofDouble
    var r = 0
    while (r < xi.length) {
      if (!xi(r).isNaN && !yj(r).isNaN) { xs += xi(r); ys += yj(r) }
      r += 1
    }
    (xs.result(), ys.result())
  }

  /** Evaluate `f` for every column pair of the collected matrix, fanning the
    * pairs across a thread pool — the local stage's answer to the engine
    * stage's parallelism (hundreds of O(n log n) pair computations would
    * otherwise serialize on one core).
    */
  private def perPair(cols: Seq[String], matrix: Array[Array[Double]])(
      f: (Array[Double], Array[Double]) => Double): Map[(String, String), Double] = {
    import scala.concurrent.{Await, ExecutionContext, Future}
    import scala.concurrent.duration.Duration
    implicit val ec: ExecutionContext = ExecutionContext.global
    val pairs = for (i <- cols.indices; j <- i + 1 until cols.size) yield (i, j)
    val futures = pairs.map { case (i, j) => Future {
      val (xs, ys) = completePairs(matrix, i, j)
      (cols(i), cols(j)) -> f(xs, ys)
    }}
    Await.result(Future.sequence(futures), Duration.Inf).toMap
  }

  /** Pearson per pair from the collected numeric matrix (pairwise-complete
    * deletion) — the local side of the §5.2 engine/local boundary: below the
    * sampling threshold, one collect feeds all three coefficient matrices.
    */
  def pearsonFromMatrix(cols: Seq[String],
                        matrix: Array[Array[Double]]): Map[(String, String), Double] =
    perPair(cols, matrix)((xs, ys) =>
      if (xs.length > 1) LocalStats.pearsonArrays(xs, ys) else Double.NaN)

  /** Kendall tau-b per pair from the collected numeric matrix;
    * pairwise-complete deletion per pair.
    */
  def kendallFromMatrix(cols: Seq[String],
                        matrix: Array[Array[Double]]): Map[(String, String), Double] =
    perPair(cols, matrix)(LocalStats.kendallTauB)

  /** Spearman per pair from the collected numeric matrix: pairwise-complete
    * deletion, then re-rank within the pair (pandas semantics). Shares the
    * one matrix collect with Pearson and Kendall.
    */
  def spearmanFromMatrix(cols: Seq[String],
                         matrix: Array[Array[Double]]): Map[(String, String), Double] =
    perPair(cols, matrix)((xs, ys) =>
      if (xs.length > 1) LocalStats.spearmanArrays(xs, ys) else Double.NaN)

  /** Tukey box plot from the quantile grid; whiskers clamp the 1.5·IQR
    * fences to the observed min/max; `outliers` counted by the distributed
    * outlier pass.
    */
  def boxPlot(stats: NumericStats, outliers: Long): BoxPlot = {
    val iqr = stats.iqr
    val lowerFence = stats.q1 - 1.5 * iqr
    val upperFence = stats.q3 + 1.5 * iqr
    BoxPlot(stats.name, stats.min, stats.q1, stats.median, stats.q3, stats.max,
      lowerWhisker = math.max(stats.min, lowerFence),
      upperWhisker = math.min(stats.max, upperFence),
      outliers = outliers)
  }

  /** Tukey fences (lo, hi) for the distributed outlier count pass. */
  def fences(stats: NumericStats): (Double, Double) =
    (stats.q1 - 1.5 * stats.iqr, stats.q3 + 1.5 * stats.iqr)

  /** Box plot assembled from a five-number summary [min q1 med q3 max]
    * (grouped/binned box plots; no outlier pass — whiskers are the fences
    * clamped to the summary extremes, outlier count not computed).
    */
  def boxFromFiveNumbers(name: String, qs: Array[Double]): BoxPlot = {
    require(qs.length == 5, s"five-number summary expected, got ${qs.length}")
    val iqr = qs(3) - qs(1)
    BoxPlot(name, qs(0), qs(1), qs(2), qs(3), qs(4),
      lowerWhisker = math.max(qs(0), qs(1) - 1.5 * iqr),
      upperWhisker = math.min(qs(4), qs(3) + 1.5 * iqr),
      outliers = 0L)
  }

  /** KDE curve from the histogram reduction (shared computation: the same
    * histogram feeds the histogram plot, the KDE, and the insights).
    */
  def kdeCurve(stats: NumericStats, hist: Histogram, gridPoints: Int): KdeCurve = {
    val (grid, density) = Kde.fromHistogram(hist.centers, hist.counts,
      stats.min, stats.max, stats.std, gridPoints)
    KdeCurve(stats.name, grid, density)
  }

  /** Normal Q-Q plot from the precomputed quantile grid: sample quantiles at
    * p = 1..99 % vs. mean + std · Φ⁻¹(p).
    */
  def qqPlot(stats: NumericStats, points: Int): QQPlot = {
    if (stats.count < 2 || stats.std.isNaN || stats.std <= 0 || stats.percentiles.isEmpty)
      return QQPlot(stats.name, Array.empty, Array.empty)
    val ps = (1 to math.min(points, 99)).map(_ / 100.0)
    val theoretical = ps.map(p => stats.mean + stats.std * LocalStats.normalPpf(p)).toArray
    val sample = ps.map { p =>
      val idx = math.round(p * 100).toInt // grid index of p is p*100 (0.0, 0.01..0.99, 1.0)
      stats.percentiles(math.min(idx, stats.percentiles.length - 1))
    }.toArray
    QQPlot(stats.name, theoretical, sample)
  }

  /** Normalized PDF and cumulative CDF of a histogram. */
  def pdfCdf(hist: Array[Long]): (Array[Double], Array[Double]) = {
    val total = math.max(1L, hist.sum).toDouble
    val pdf = hist.map(_ / total)
    val cdf = pdf.scanLeft(0.0)(_ + _).drop(1)
    (pdf, cdf)
  }

  /** Contingency cells → dense table over the top-K categories per axis
    * (by marginal count).
    */
  def contingencyTable(c1: String, c2: String, cells: Seq[(String, String, Long)],
                       topK: Int): ContingencyTable = {
    val rowMarg = cells.groupBy(_._1).map { case (v, g) => v -> g.map(_._3).sum }
    val colMarg = cells.groupBy(_._2).map { case (v, g) => v -> g.map(_._3).sum }
    val rows = rowMarg.toSeq.sortBy(t => (-t._2, t._1)).take(topK).map(_._1)
    val cols = colMarg.toSeq.sortBy(t => (-t._2, t._1)).take(topK).map(_._1)
    val rIdx = rows.zipWithIndex.toMap
    val cIdx = cols.zipWithIndex.toMap
    val counts = Array.ofDim[Long](rows.size, cols.size)
    cells.foreach { case (a, b, n) =>
      (rIdx.get(a), cIdx.get(b)) match {
        case (Some(i), Some(j)) => counts(i)(j) += n
        case _ => ()
      }
    }
    ContingencyTable(c1, c2, rows, cols, counts)
  }

  /** Nullity-disagreement distance matrix for the missing dendrogram: the
    * fraction of rows where exactly one of the two columns is missing,
    * derived from indicator pair moments (0/1 values ⇒ disagreements =
    * sx + sy − 2·sxy).
    */
  def nullityDistances(cols: Seq[String], rows: Long,
                       moments: Map[(String, String), PairMoments]): Array[Array[Double]] = {
    val m = cols.size
    val dist = Array.ofDim[Double](m, m)
    for (i <- 0 until m; j <- i + 1 until m) {
      val pm = moments((cols(i), cols(j)))
      val disagreements = pm.sx + pm.sy - 2 * pm.sxy
      val d = if (rows == 0) 0.0 else disagreements / rows
      dist(i)(j) = d; dist(j)(i) = d
    }
    dist
  }
}
