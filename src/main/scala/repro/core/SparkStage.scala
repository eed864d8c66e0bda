package repro.core

import org.apache.spark.sql.{Column, DataFrame, Row}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types.{DoubleType, StringType}

import repro.core.Intermediates._
import repro.stats.LocalStats.PairMoments

/** The distributed stage of the Compute module (Section 5.2's "Dask
  * computation"), expressed as Spark DataFrame plans.
  *
  * Design rule, mirroring the paper's single-graph optimization: each public
  * method issues exactly ONE Spark action, no matter how many columns are
  * involved. Multi-column work is fused either into one wide `agg` (hundreds
  * of aggregate expressions, which Catalyst evaluates in a single pass) or
  * into one `posexplode → groupBy(columnIndex, …)` job. Values the plan
  * needs as literals (bin widths, rank denominators) come from a prior
  * `columnAggregates` pass — the analog of the paper's eager chunk-size
  * precompute stage.
  */
object SparkStage {

  /** Quantile grid computed for every numeric column: 0, 0.01..0.99, 1. */
  val PercentileProbs: Array[Double] =
    (0.0 +: (1 to 99).map(_ / 100.0) :+ 1.0).toArray

  private val PercentileAccuracy = 10000

  /** Numeric column normalized to Double with NaN/±Inf mapped to null, so
    * every moment/histogram/rank sees only finite values.
    */
  private[repro] def cleanNum(c: String): Column = {
    val x = col(c).cast(DoubleType)
    when(isnan(x) || x === Double.PositiveInfinity || x === Double.NegativeInfinity,
      lit(null).cast(DoubleType)).otherwise(x)
  }

  /** Missing test that also treats NaN as missing for numeric columns. */
  private[repro] def isMissing(df: DataFrame, c: String): Column =
    TypeDetector.typeOf(df, c) match {
      case ColumnType.Numerical =>
        val x = col(c).cast(DoubleType)
        x.isNull || isnan(x)
      case ColumnType.Categorical => col(c).isNull
    }

  /** All pass-1 aggregates of a table, computed in one action. */
  final case class TableAggregates(rows: Long, duplicateRows: Long,
                                   numeric: Map[String, NumericStats],
                                   categorical: Map[String, CategoricalStats])

  private def getLong(r: Row, i: Int): Long = if (r.isNullAt(i)) 0L else r.get(i) match {
    case l: Long => l
    case n: Number => n.longValue
    case other => throw new IllegalStateException(s"expected long at $i, got $other")
  }

  private def getDouble(r: Row, i: Int): Double = if (r.isNullAt(i)) Double.NaN else r.get(i) match {
    case d: Double => d
    case n: Number => n.doubleValue
    case other => throw new IllegalStateException(s"expected double at $i, got $other")
  }

  /** Pass-1 aggregates of every column: totals, missing, distincts, moments,
    * quantile grids, zero/negative/infinite counts, string-length stats, the
    * table row count and the duplicate-row count.
    *
    * Execution shape: `df.count()` (the chunk-size precompute analog), one
    * `posexplode → groupBy(columnIndex)` job for ALL numeric columns, one
    * for ALL categorical columns, and one duplicate-count agg — four Spark
    * actions total regardless of column count. Grouping by column index
    * keeps the aggregate-expression set constant-size, so Catalyst planning
    * and codegen stay O(1) as tables get wider (a wide flat `agg` with
    * 14 expressions *per column* spends tens of seconds in planning/janino
    * before touching any data).
    */
  def columnAggregates(df: DataFrame, numCols: Seq[String], catCols: Seq[String],
                       withDuplicates: Boolean = true): TableAggregates = {
    val rows = df.count()

    val numeric: Map[String, NumericStats] = if (numCols.isEmpty) Map.empty else {
      val structs = numCols.map { c =>
        struct(col(c).cast(DoubleType).as("raw"), cleanNum(c).as("v"))
      }
      val raw = col("s.raw"); val v = col("s.v")
      val exploded = df.select(posexplode(array(structs: _*)).as(Seq("pos", "s")))
      val out = exploded
        .groupBy(col("pos"))
        .agg(
          count(v),                                             // finite count
          count(when(raw.isNull || isnan(raw), 1)),             // missing (null+NaN)
          count(when(abs(raw) === Double.PositiveInfinity, 1)), // infinites
          avg(v), stddev_samp(v), min(v), max(v), skewness(v), kurtosis(v), sum(v),
          count(when(v === 0.0, 1)),
          count(when(v < 0.0, 1)),
          percentile_approx(v, lit(PercentileProbs), lit(PercentileAccuracy)),
        )
        .collect()
      // distinct counts separately: a distinct aggregate next to the
      // TypedImperative percentile forces a sort-aggregate over the
      // expanded rows — two fast hash aggs beat one slow sort agg.
      val distincts = exploded.groupBy(col("pos")).agg(count_distinct(v)).collect()
        .map(r => r.getInt(0) -> getLong(r, 1)).toMap
      val byPos = out.map(r => r.getInt(0) -> r).toMap
      numCols.zipWithIndex.map { case (c, p) =>
        c -> (byPos.get(p) match {
          case Some(r) => NumericStats(
            name = c,
            count = getLong(r, 1), missing = getLong(r, 2),
            infinites = getLong(r, 3), distinct = distincts.getOrElse(p, 0L),
            mean = getDouble(r, 4), std = getDouble(r, 5),
            min = getDouble(r, 6), max = getDouble(r, 7),
            skewness = getDouble(r, 8), kurtosis = getDouble(r, 9),
            sum = getDouble(r, 10),
            zeros = getLong(r, 11), negatives = getLong(r, 12),
            percentiles =
              if (r.isNullAt(13)) Array.empty[Double]
              else r.getSeq[Double](13).toArray)
          case None => NumericStats(c, 0, 0, 0, Double.NaN, Double.NaN, Double.NaN,
            Double.NaN, Double.NaN, Double.NaN, 0, 0, 0, Double.NaN, Array.empty)
        })
      }.toMap
    }

    val categorical: Map[String, CategoricalStats] = if (catCols.isEmpty) Map.empty else {
      val arr = array(catCols.map(c => col(c).cast(StringType)): _*)
      val v = col("value")
      val out = df.select(posexplode(arr).as(Seq("pos", "value")))
        .groupBy(col("pos"))
        .agg(count(v), count(when(v.isNull, 1)), count_distinct(v),
          min(length(v)), max(length(v)), avg(length(v)))
        .collect()
      val byPos = out.map(r => r.getInt(0) -> r).toMap
      catCols.zipWithIndex.map { case (c, p) =>
        c -> (byPos.get(p) match {
          case Some(r) => CategoricalStats(c, getLong(r, 1), getLong(r, 2), getLong(r, 3),
            getLong(r, 4), getLong(r, 5), getDouble(r, 6))
          case None => CategoricalStats(c, 0, 0, 0, 0, 0, Double.NaN)
        })
      }.toMap
    }

    val dups =
      if (withDuplicates && df.columns.nonEmpty && rows > 0) {
        val allCols = df.columns.toSeq
        rows - getLong(df.agg(
          count_distinct(struct(allCols.map(c => col(c).cast(StringType)): _*))).head(), 0)
      } else 0L

    TableAggregates(rows, dups, numeric, categorical)
  }

  // ---------------------------------------------------------------------
  // Histograms: ALL numeric columns in one posexplode → groupBy job.
  // ---------------------------------------------------------------------

  private def binExpr(mins: Seq[Double], widths: Seq[Double], bins: Int): Column = {
    val minArr = array(mins.map(lit(_)): _*)
    val widthArr = array(widths.map(lit(_)): _*)
    least(lit(bins - 1), greatest(lit(0),
      floor((col("value") - element_at(minArr, col("pos") + 1)) /
            element_at(widthArr, col("pos") + 1)))).cast("int")
  }

  private def widthsOf(mins: Seq[Double], maxs: Seq[Double], bins: Int): Seq[Double] =
    mins.zip(maxs).map { case (lo, hi) =>
      val w = (hi - lo) / bins
      if (w.isNaN || w.isInfinite || w <= 0) 1.0 else w
    }

  private def edgesOf(lo: Double, width: Double, bins: Int): Array[Double] =
    Array.tabulate(bins + 1)(i => lo + i * width)

  /** Histograms of every listed numeric column, one Spark action.
    * `mins`/`maxs` come from `columnAggregates` (the precompute stage).
    */
  def histograms(df: DataFrame, cols: Seq[String], mins: Seq[Double],
                 maxs: Seq[Double], bins: Int): Map[String, Histogram] = {
    if (cols.isEmpty) return Map.empty
    val widths = widthsOf(mins, maxs, bins)
    val arr = array(cols.map(cleanNum): _*)
    val rows = df.select(posexplode(arr).as(Seq("pos", "value")))
      .where(col("value").isNotNull)
      .groupBy(col("pos"), binExpr(mins, widths, bins).as("bin"))
      .count()
      .collect()
    assembleHistograms(cols, mins, widths, bins, rows.map(r =>
      (r.getInt(0), r.getInt(1), r.getLong(2))))
  }

  private def assembleHistograms(cols: Seq[String], mins: Seq[Double], widths: Seq[Double],
                                 bins: Int, rows: Seq[(Int, Int, Long)]): Map[String, Histogram] = {
    val byPos = rows.groupBy(_._1)
    cols.zipWithIndex.map { case (c, p) =>
      val counts = new Array[Long](bins)
      byPos.getOrElse(p, Nil).foreach { case (_, b, n) =>
        if (b >= 0 && b < bins) counts(b) += n
      }
      c -> Histogram(c, edgesOf(mins(p), widths(p), bins), counts)
    }.toMap
  }

  /** Histograms of every listed column split by a boolean keep-flag, in one
    * action — feeds plot_missing(df, col1): before = keep + dropped rows,
    * after = keep only. Binning is fixed from the full data so the before
    * and after distributions are comparable.
    */
  def impactHistograms(df: DataFrame, cols: Seq[String], mins: Seq[Double],
                       maxs: Seq[Double], bins: Int,
                       keep: Column): Map[String, ImpactHistogram] = {
    if (cols.isEmpty) return Map.empty
    val widths = widthsOf(mins, maxs, bins)
    val arr = array(cols.map(cleanNum): _*)
    val rows = df.select(posexplode(arr).as(Seq("pos", "value")), keep.as("keep"))
      .where(col("value").isNotNull)
      .groupBy(col("pos"), binExpr(mins, widths, bins).as("bin"), col("keep"))
      .count()
      .collect()
    val byPos = rows.map(r => (r.getInt(0), r.getInt(1), r.getBoolean(2), r.getLong(3)))
      .toSeq.groupBy(_._1)
    cols.zipWithIndex.map { case (c, p) =>
      val before = new Array[Long](bins)
      val after = new Array[Long](bins)
      byPos.getOrElse(p, Nil).foreach { case (_, b, k, n) =>
        if (b >= 0 && b < bins) {
          before(b) += n
          if (k) after(b) += n
        }
      }
      c -> ImpactHistogram(c, edgesOf(mins(p), widths(p), bins), before, after)
    }.toMap
  }

  // ---------------------------------------------------------------------
  // Frequencies: ALL categorical columns in one job.
  // ---------------------------------------------------------------------

  /** Value counts of every listed categorical column in one action, capped
    * at `maxDistinct` values per column (most frequent first).
    */
  def frequencies(df: DataFrame, cols: Seq[String],
                  maxDistinct: Int): Map[String, Seq[(String, Long)]] = {
    if (cols.isEmpty) return Map.empty
    val arr = array(cols.map(c => col(c).cast(StringType)): _*)
    val counted = df.select(posexplode(arr).as(Seq("pos", "value")))
      .where(col("value").isNotNull)
      .groupBy(col("pos"), col("value"))
      .count()
    val w = Window.partitionBy(col("pos")).orderBy(col("count").desc, col("value"))
    val rows = counted
      .withColumn("rn", row_number().over(w))
      .where(col("rn") <= maxDistinct)
      .collect()
    val byPos = rows.map(r => (r.getInt(0), r.getString(1), r.getLong(2))).toSeq.groupBy(_._1)
    cols.zipWithIndex.map { case (c, p) =>
      c -> byPos.getOrElse(p, Nil).sortBy(t => (-t._3, t._2)).map(t => (t._2, t._3))
    }.toMap
  }

  /** Value counts split by a keep-flag (plot_missing impact on categorical
    * columns), one action. Returns (value, before, after) per column.
    */
  def impactFrequencies(df: DataFrame, cols: Seq[String], maxDistinct: Int,
                        keep: Column): Map[String, Seq[(String, Long, Long)]] = {
    if (cols.isEmpty) return Map.empty
    val arr = array(cols.map(c => col(c).cast(StringType)): _*)
    val rows = df.select(posexplode(arr).as(Seq("pos", "value")), keep.as("keep"))
      .where(col("value").isNotNull)
      .groupBy(col("pos"), col("value"), col("keep"))
      .count()
      .collect()
      .map(r => (r.getInt(0), r.getString(1), r.getBoolean(2), r.getLong(3)))
      .toSeq
    val byPos = rows.groupBy(_._1)
    cols.zipWithIndex.map { case (c, p) =>
      val byValue = byPos.getOrElse(p, Nil).groupBy(_._2).map { case (v, grp) =>
        val before = grp.map(_._4).sum
        val after = grp.filter(_._3).map(_._4).sum
        (v, before, after)
      }
      c -> byValue.toSeq.sortBy(t => (-t._2, t._1)).take(maxDistinct)
    }.toMap
  }

  /** Word frequencies of one text column (univariate categorical task). */
  def wordFrequencies(df: DataFrame, c: String, topK: Int): WordFrequencies = {
    val words = df
      .select(explode(split(lower(col(c).cast(StringType)), "[^a-z0-9]+")).as("word"))
      .where(length(col("word")) > 0)
      .groupBy("word").count()
    // single action: total + topK via sorted collect of capped rows
    val rows = words.orderBy(col("count").desc, col("word")).limit(math.max(topK, 1000))
      .collect().map(r => (r.getString(0), r.getLong(1)))
    WordFrequencies(c, rows.take(topK).toSeq, rows.map(_._2).sum)
  }

  // ---------------------------------------------------------------------
  // Pairwise moments: ALL column pairs in one wide agg.
  // ---------------------------------------------------------------------

  /** Sufficient statistics of every listed pair over pairwise-complete rows,
    * one action. Feeds Pearson matrices, regression lines, and — run over
    * rank columns — Spearman matrices.
    *
    * Execution shape: each row fans out to one (x, y) struct per pair via
    * `posexplode`, then ONE six-expression agg grouped by pair index — the
    * expression set stays constant-size no matter how many pairs there are
    * (m² pairs as a flat agg would melt Catalyst planning/codegen).
    */
  def pairwiseMoments(df: DataFrame,
                      pairs: Seq[(String, String)]): Map[(String, String), PairMoments] = {
    if (pairs.isEmpty) return Map.empty
    val structs = pairs.map { case (a, b) =>
      val x = cleanNum(a); val y = cleanNum(b)
      val both = x.isNotNull && y.isNotNull
      struct(when(both, x).as("x"), when(both, y).as("y"))
    }
    val x = col("s.x"); val y = col("s.y")
    val rows = df.select(posexplode(array(structs: _*)).as(Seq("pos", "s")))
      .groupBy(col("pos"))
      .agg(count(x), sum(x), sum(y), sum(x * x), sum(y * y), sum(x * y))
      .collect()
    val byPos = rows.map { r =>
      r.getInt(0) -> PairMoments(getLong(r, 1),
        zeroIfNaN(getDouble(r, 2)), zeroIfNaN(getDouble(r, 3)),
        zeroIfNaN(getDouble(r, 4)), zeroIfNaN(getDouble(r, 5)),
        zeroIfNaN(getDouble(r, 6)))
    }.toMap
    pairs.zipWithIndex.map { case (p, k) =>
      p -> byPos.getOrElse(k, PairMoments(0, 0, 0, 0, 0, 0))
    }.toMap
  }

  private def zeroIfNaN(d: Double): Double = if (d.isNaN) 0.0 else d

  /** Rank-transform every listed column (average ranks, ties shared; nulls
    * preserved) in one plan, using the two-direction rank identity
    * avg = (rank_asc + k + 1 − rank_desc) / 2 so no per-column shuffle by
    * value is needed. `nonNullCounts` (k) comes from the precompute stage.
    */
  def rankColumns(df: DataFrame, cols: Seq[String],
                  nonNullCounts: Map[String, Long]): DataFrame = {
    val exprs = cols.map { c =>
      val x = cleanNum(c)
      val k = nonNullCounts(c)
      val rAsc = rank().over(Window.orderBy(x.asc_nulls_last))
      val rDesc = rank().over(Window.orderBy(x.desc_nulls_last))
      when(x.isNull, lit(null).cast(DoubleType))
        .otherwise((rAsc + lit(k + 1) - rDesc) / 2.0)
        .as(c)
    }
    df.select(exprs: _*)
  }

  /** Numeric columns collected to the driver (local Kendall stage), sampled
    * down to ~`maxRows` rows when the table is larger. Returns column-major
    * arrays aligned with `cols`; nulls arrive as NaN.
    */
  def collectNumericMatrix(df: DataFrame, cols: Seq[String], totalRows: Long,
                           maxRows: Long, seed: Long = 42): Array[Array[Double]] = {
    val proj = df.select(cols.map(c => coalesce(cleanNum(c), lit(Double.NaN))): _*)
    val sampled =
      if (totalRows > maxRows && totalRows > 0)
        proj.sample(withReplacement = false, maxRows.toDouble / totalRows, seed)
      else proj
    val rows = sampled.collect()
    val out = Array.fill(cols.size)(new Array[Double](rows.length))
    var r = 0
    while (r < rows.length) {
      var c = 0
      while (c < cols.size) { out(c)(r) = rows(r).getDouble(c); c += 1 }
      r += 1
    }
    out
  }

  // ---------------------------------------------------------------------
  // Missing-value reductions.
  // ---------------------------------------------------------------------

  /** Missing fraction per column per row-bucket (the missing spectrum),
    * one action. Row order follows the DataFrame's partition order.
    */
  def missingSpectrum(df: DataFrame, cols: Seq[String], nBuckets: Int): MissingSpectrum = {
    val withId = df.withColumn("__mid", monotonically_increasing_id())
    val w = Window.orderBy(col("__mid"))
    val bucketed = withId.withColumn("__b", ntile(nBuckets).over(w))
    val aggs = count(lit(1)).as("__cnt") +:
      cols.zipWithIndex.map { case (c, i) =>
        sum(when(isMissing(df, c), 1).otherwise(0)).as(s"__m$i")
      }
    val rows = bucketed.groupBy(col("__b")).agg(aggs.head, aggs.tail: _*)
      .orderBy(col("__b")).collect()
    val fractions = Array.ofDim[Double](rows.length, cols.size)
    val buckets = new Array[(Long, Long)](rows.length)
    var start = 0L
    rows.zipWithIndex.foreach { case (r, bi) =>
      val cnt = getLong(r, 1)
      buckets(bi) = (start, start + cnt - 1)
      start += cnt
      cols.indices.foreach { ci =>
        fractions(bi)(ci) = if (cnt == 0) 0.0 else getLong(r, 2 + ci).toDouble / cnt
      }
    }
    MissingSpectrum(cols, buckets.toSeq, fractions)
  }

  /** Pairwise moments of the 0/1 missing indicators of every column pair,
    * one action. Feeds both the nullity correlation heatmap and (via
    * disagreement counts sx + sy − 2·sxy) the dendrogram distances.
    */
  def nullityMoments(df: DataFrame,
                     cols: Seq[String]): Map[(String, String), PairMoments] = {
    val ind = df.select(cols.map(c =>
      when(isMissing(df, c), 1.0).otherwise(0.0).as(c)): _*)
    val pairs = for (i <- cols.indices; j <- i + 1 until cols.size)
      yield (cols(i), cols(j))
    pairwiseMoments(ind, pairs)
  }

  // ---------------------------------------------------------------------
  // Bivariate reductions.
  // ---------------------------------------------------------------------

  /** 2-D density grid of two numeric columns (hexbin substitute), one action. */
  def grid2d(df: DataFrame, x: String, y: String,
             xMin: Double, xMax: Double, yMin: Double, yMax: Double,
             xBins: Int, yBins: Int): Grid2D = {
    val xw = widthsOf(Seq(xMin), Seq(xMax), xBins).head
    val yw = widthsOf(Seq(yMin), Seq(yMax), yBins).head
    val xc = cleanNum(x); val yc = cleanNum(y)
    val xb = least(lit(xBins - 1), greatest(lit(0), floor((xc - xMin) / xw))).cast("int")
    val yb = least(lit(yBins - 1), greatest(lit(0), floor((yc - yMin) / yw))).cast("int")
    val rows = df.where(xc.isNotNull && yc.isNotNull)
      .groupBy(xb.as("xb"), yb.as("yb")).count().collect()
    val counts = Array.ofDim[Long](xBins, yBins)
    rows.foreach { r =>
      val i = r.getInt(0); val j = r.getInt(1)
      if (i >= 0 && i < xBins && j >= 0 && j < yBins) counts(i)(j) += r.getLong(2)
    }
    Grid2D(x, y, edgesOf(xMin, xw, xBins), edgesOf(yMin, yw, yBins), counts)
  }

  /** Quantiles + count of `y` within each `x` bin (binned box plot), one
    * action. Returns (bin index, [min q1 median q3 max], count).
    */
  def binnedQuantiles(df: DataFrame, x: String, y: String,
                      xMin: Double, xMax: Double,
                      bins: Int): (Array[Double], Seq[(Int, Array[Double], Long)]) = {
    val w = widthsOf(Seq(xMin), Seq(xMax), bins).head
    val xc = cleanNum(x); val yc = cleanNum(y)
    val xb = least(lit(bins - 1), greatest(lit(0), floor((xc - xMin) / w))).cast("int")
    val rows = df.where(xc.isNotNull && yc.isNotNull)
      .groupBy(xb.as("xb"))
      .agg(percentile_approx(yc, lit(Array(0.0, 0.25, 0.5, 0.75, 1.0)),
             lit(PercentileAccuracy)).as("qs"),
           count(lit(1)).as("cnt"))
      .collect()
    val out = rows.map { r =>
      (r.getInt(0), r.getSeq[Double](1).toArray, r.getLong(2))
    }.toSeq.sortBy(_._1)
    (edgesOf(xMin, w, bins), out)
  }

  /** Per-category count, mean and quantiles of a numeric column (NC
    * bivariate: categorical box plot + per-category lines), one action.
    */
  def groupedNumericStats(df: DataFrame, cat: String, num: String,
                          maxGroups: Int): Seq[(String, Long, Double, Array[Double])] = {
    val yc = cleanNum(num)
    val g = df.where(col(cat).isNotNull && yc.isNotNull)
      .groupBy(col(cat).cast(StringType).as("g"))
      .agg(count(lit(1)).as("cnt"), avg(yc).as("mean"),
           percentile_approx(yc, lit(Array(0.0, 0.25, 0.5, 0.75, 1.0)),
             lit(PercentileAccuracy)).as("qs"))
      .orderBy(col("cnt").desc, col("g"))
      .limit(maxGroups)
    g.collect().map(r =>
      (r.getString(0), r.getLong(1), r.getDouble(2), r.getSeq[Double](3).toArray)).toSeq
  }

  /** Histogram of a numeric column within each of the given categories
    * (multi-line chart), one action. Binning fixed from full min/max.
    */
  def groupedHistograms(df: DataFrame, cat: String, num: String,
                        categories: Seq[String], min: Double, max: Double,
                        bins: Int): Map[String, Array[Long]] = {
    if (categories.isEmpty) return Map.empty
    val w = widthsOf(Seq(min), Seq(max), bins).head
    val yc = cleanNum(num)
    val bin = least(lit(bins - 1), greatest(lit(0), floor((yc - min) / w))).cast("int")
    val catStr = col(cat).cast(StringType)
    val rows = df.where(catStr.isin(categories: _*) && yc.isNotNull)
      .groupBy(catStr.as("g"), bin.as("bin")).count().collect()
    val byCat = rows.map(r => (r.getString(0), r.getInt(1), r.getLong(2))).toSeq.groupBy(_._1)
    categories.map { c =>
      val counts = new Array[Long](bins)
      byCat.getOrElse(c, Nil).foreach { case (_, b, n) =>
        if (b >= 0 && b < bins) counts(b) += n
      }
      c -> counts
    }.toMap
  }

  /** Cross tabulation of two categorical columns, one action, capped at the
    * `maxCells` most frequent cells.
    */
  def contingency(df: DataFrame, c1: String, c2: String,
                  maxCells: Int = 100000): Seq[(String, String, Long)] = {
    df.where(col(c1).isNotNull && col(c2).isNotNull)
      .groupBy(col(c1).cast(StringType).as("a"), col(c2).cast(StringType).as("b"))
      .count()
      .orderBy(col("count").desc, col("a"), col("b"))
      .limit(maxCells)
      .collect()
      .map(r => (r.getString(0), r.getString(1), r.getLong(2))).toSeq
  }

  /** Count of values beyond the given Tukey fences, every column in one
    * action. Fences come from the precompute-stage quantiles.
    */
  def outlierCounts(df: DataFrame,
                    fences: Seq[(String, Double, Double)]): Map[String, Long] = {
    if (fences.isEmpty) return Map.empty
    val exprs = fences.map { case (c, lo, hi) =>
      val x = cleanNum(c)
      count(when(x < lo || x > hi, 1))
    }
    val row = df.agg(exprs.head, exprs.tail: _*).head()
    fences.zipWithIndex.map { case ((c, _, _), i) => c -> getLong(row, i) }.toMap
  }

  /** Up to `n` (x, y) points for a scatter plot, one action. */
  def scatterSample(df: DataFrame, x: String, y: String, n: Int): Seq[(Double, Double)] = {
    val xc = cleanNum(x); val yc = cleanNum(y)
    df.where(xc.isNotNull && yc.isNotNull)
      .select(xc.as("x"), yc.as("y"))
      .limit(n)
      .collect()
      .map(r => (r.getDouble(0), r.getDouble(1))).toSeq
  }
}
