package repro.core

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec, TestHelpers}
import repro.stats.LocalStats

/** Distributed-stage reductions, oracle-checked against DuckDB. */
class SparkStageSpec extends SparkSpec with TestHelpers {
  import spark.implicits._

  /** Mixed fixture with nulls and a duplicate row. */
  private lazy val df: DataFrame = Seq(
    (Option(1.0), Option("a")),
    (Option(2.0), Option("b")),
    (Option(2.0), Option("b")), // duplicate row
    (None: Option[Double], Option("a")),
    (Option(-4.0), None: Option[String]),
    (Option(0.0), Option("ccc")),
    (Option(10.5), Option("a")),
  ).toDF("x", "s").cache()

  private lazy val aggs = SparkStage.columnAggregates(df, Seq("x"), Seq("s"))
  private lazy val xs = aggs.numeric("x")
  private lazy val ss = aggs.categorical("s")

  test("columnAggregates: count and missing match DuckDB") {
    val got = Seq((xs.count, xs.missing)).toDF("cnt", "mis")
    Oracle.assertEquivalent(got,
      "SELECT count(x) AS cnt, count(*) - count(x) AS mis FROM t", "t" -> df)
  }

  test("columnAggregates: mean, min, max match DuckDB") {
    val got = Seq((xs.mean, xs.min, xs.max)).toDF("m", "mn", "mx")
    Oracle.assertEquivalent(got,
      "SELECT avg(CAST(x AS DOUBLE)) AS m, min(CAST(x AS DOUBLE)) AS mn, " +
      "max(CAST(x AS DOUBLE)) AS mx FROM t", "t" -> df)
  }

  test("columnAggregates: sum and distinct match DuckDB") {
    val got = Seq((xs.sum, xs.distinct)).toDF("sm", "d")
    Oracle.assertEquivalent(got,
      "SELECT sum(CAST(x AS DOUBLE)) AS sm, count(DISTINCT x) AS d FROM t", "t" -> df)
  }

  test("columnAggregates: stddev matches DuckDB sample stddev") {
    val got = Seq(Tuple1(xs.std)).toDF("sd")
    Oracle.assertEquivalent(got,
      "SELECT stddev_samp(CAST(x AS DOUBLE)) AS sd FROM t", "t" -> df)
  }

  test("columnAggregates: zeros and negatives counted") {
    assert(xs.zeros == 1 && xs.negatives == 1)
  }

  test("columnAggregates: row count and duplicate rows") {
    assert(aggs.rows == 7)
    assert(aggs.duplicateRows == 1)
  }

  test("columnAggregates: duplicate rows match DuckDB distinct") {
    val got = Seq((aggs.rows, aggs.duplicateRows)).toDF("r", "dup")
    Oracle.assertEquivalent(got,
      "SELECT (SELECT count(*) FROM t) AS r, " +
      "(SELECT count(*) FROM t) - (SELECT count(*) FROM (SELECT DISTINCT x, s FROM t) q) AS dup",
      "t" -> df)
  }

  test("columnAggregates: skewness matches local population formula") {
    val vals = collectDoubles(df, "x")
    assertApprox(xs.skewness, LocalStats.skewness(vals), 1e-6, "skewness")
  }

  test("columnAggregates: median from the percentile grid is exact on odd data") {
    val odd = Seq(5.0, 1.0, 3.0, 9.0, 7.0).toDF("x")
    val s = SparkStage.columnAggregates(odd, Seq("x"), Nil).numeric("x")
    assert(s.median == 5.0)
    assert(s.percentiles.head == 1.0 && s.percentiles.last == 9.0)
  }

  test("columnAggregates: quantile grid is monotone") {
    assert(xs.percentiles.sliding(2).forall(p => p(0) <= p(1)))
  }

  test("columnAggregates: categorical count/missing/distinct match DuckDB") {
    val got = Seq((ss.count, ss.missing, ss.distinct)).toDF("cnt", "mis", "d")
    Oracle.assertEquivalent(got,
      "SELECT count(s) AS cnt, count(*) - count(s) AS mis, count(DISTINCT s) AS d FROM t",
      "t" -> df)
  }

  test("columnAggregates: string length stats match DuckDB") {
    val got = Seq((ss.minLength, ss.maxLength, ss.avgLength)).toDF("mn", "mx", "av")
    Oracle.assertEquivalent(got,
      "SELECT min(length(s)) AS mn, max(length(s)) AS mx, avg(length(s)) AS av FROM t",
      "t" -> df)
  }

  test("columnAggregates: NaN counts as missing, infinity counted separately") {
    val special = Seq(1.0, Double.NaN, Double.PositiveInfinity, Double.NegativeInfinity, 5.0).toDF("x")
    val s = SparkStage.columnAggregates(special, Seq("x"), Nil).numeric("x")
    assert(s.count == 2)       // finite values only
    assert(s.missing == 1)     // the NaN
    assert(s.infinites == 2)
    assert(s.total == 5)
    assert(s.mean == 3.0)      // moments over finite values
    assert(s.min == 1.0 && s.max == 5.0)
  }

  test("columnAggregates: empty DataFrame") {
    val empty = Seq.empty[Double].toDF("x")
    val a = SparkStage.columnAggregates(empty, Seq("x"), Nil)
    assert(a.rows == 0)
    val s = a.numeric("x")
    assert(s.count == 0 && s.missing == 0 && s.mean.isNaN && s.percentiles.isEmpty)
  }

  test("columnAggregates: single-row DataFrame") {
    val one = Seq(42.0).toDF("x")
    val s = SparkStage.columnAggregates(one, Seq("x"), Nil).numeric("x")
    assert(s.count == 1 && s.mean == 42.0 && s.min == 42.0 && s.max == 42.0)
    assert(s.std.isNaN) // sample stddev of one value
  }

  // ---------------------------------------------------------------------

  test("histograms: bin counts match DuckDB") {
    val bins = 5
    val h = SparkStage.histograms(df, Seq("x"), Seq(xs.min), Seq(xs.max), bins)("x")
    val width = (xs.max - xs.min) / bins
    val got = h.counts.zipWithIndex.collect { case (c, b) if c > 0 => (b, c) }
      .toSeq.toDF("bin", "cnt")
    Oracle.assertEquivalent(got,
      s"SELECT LEAST(${bins - 1}, GREATEST(0, CAST(FLOOR((CAST(x AS DOUBLE) - (${xs.min})) / ($width)) AS INT))) AS bin, " +
      "count(*) AS cnt FROM t WHERE x IS NOT NULL GROUP BY 1", "t" -> df)
  }

  test("histograms: total equals non-null count and edges span min/max") {
    val h = SparkStage.histograms(df, Seq("x"), Seq(xs.min), Seq(xs.max), 7)("x")
    assert(h.total == xs.count)
    assert(h.edges.head == xs.min)
    assertApprox(h.edges.last, xs.max, 1e-9, "last edge")
    assert(h.edges.length == 8 && h.counts.length == 7)
  }

  test("histograms: several columns in one call") {
    val two = Seq((1.0, 10.0), (2.0, 20.0), (3.0, 30.0)).toDF("a", "b")
    val hs = SparkStage.histograms(two, Seq("a", "b"), Seq(1.0, 10.0), Seq(3.0, 30.0), 2)
    assert(hs("a").counts.toSeq == Seq(1L, 2L)) // [1,2): {1}, [2,3]: {2,3}
    assert(hs("b").counts.toSeq == Seq(1L, 2L))
  }

  test("histograms: constant column lands in bin 0") {
    val const = Seq(5.0, 5.0, 5.0).toDF("x")
    val h = SparkStage.histograms(const, Seq("x"), Seq(5.0), Seq(5.0), 4)("x")
    assert(h.counts.toSeq == Seq(3L, 0L, 0L, 0L))
  }

  test("impactHistograms: before = full histogram, after = kept rows only") {
    val d2 = Seq(
      (Option(1.0), Option(10.0)), (Option(2.0), None),
      (Option(3.0), Option(30.0)), (Option(4.0), None),
    ).toDF("v", "flag")
    val keep = org.apache.spark.sql.functions.col("flag").isNotNull
    val h = SparkStage.impactHistograms(d2, Seq("v"), Seq(1.0), Seq(4.0), 3, keep)("v")
    assert(h.before.sum == 4 && h.after.sum == 2)
    assert(h.before.zip(h.after).forall { case (b, a) => b >= a })
  }

  // ---------------------------------------------------------------------

  test("frequencies: counts match DuckDB") {
    val f = SparkStage.frequencies(df, Seq("s"), 100)("s")
    val got = f.toDF("v", "cnt")
    Oracle.assertEquivalent(got,
      "SELECT s AS v, count(*) AS cnt FROM t WHERE s IS NOT NULL GROUP BY s", "t" -> df)
  }

  test("frequencies: ordered most-frequent-first and capped") {
    val f = SparkStage.frequencies(df, Seq("s"), 2)("s")
    assert(f.size == 2)
    assert(f.head == ("a", 3L))
  }

  test("frequencies: several columns in one call") {
    val two = Seq(("x", "p"), ("x", "q"), ("y", "q")).toDF("c1", "c2")
    val fs = SparkStage.frequencies(two, Seq("c1", "c2"), 10)
    assert(fs("c1").toMap == Map("x" -> 2L, "y" -> 1L))
    assert(fs("c2").toMap == Map("p" -> 1L, "q" -> 2L))
  }

  test("impactFrequencies: before/after counts") {
    val d2 = Seq(
      (Option("a"), Option(1.0)), (Option("a"), None),
      (Option("b"), Option(2.0)),
    ).toDF("c", "flag")
    val keep = org.apache.spark.sql.functions.col("flag").isNotNull
    val f = SparkStage.impactFrequencies(d2, Seq("c"), 10, keep)("c")
    assert(f.toSet == Set(("a", 2L, 1L), ("b", 1L, 1L)))
  }

  test("wordFrequencies: tokenizes, lowercases, counts") {
    val d = Seq("Hello world", "hello there; world!", "WORLD").toDF("txt")
    val w = SparkStage.wordFrequencies(d, "txt", 10)
    assert(w.topK.head == ("world", 3L))
    assert(w.topK.toMap == Map("world" -> 3L, "hello" -> 2L, "there" -> 1L))
    assert(w.totalWords == 6)
  }

  // ---------------------------------------------------------------------

  test("pairwiseMoments: pearson matches DuckDB corr") {
    val d2 = Seq((1.0, 2.1), (2.0, 3.9), (3.0, 6.2), (4.0, 8.1), (5.0, 9.7)).toDF("x", "y")
    val m = SparkStage.pairwiseMoments(d2, Seq(("x", "y")))(("x", "y"))
    val got = Seq(Tuple1(m.pearson)).toDF("r")
    Oracle.assertEquivalent(got,
      "SELECT corr(CAST(x AS DOUBLE), CAST(y AS DOUBLE)) AS r FROM t", "t" -> d2)
  }

  test("pairwiseMoments: pairwise-complete deletion on nulls") {
    val d2 = Seq(
      (Option(1.0), Option(1.0)), (Option(2.0), None),
      (None: Option[Double], Option(3.0)), (Option(4.0), Option(4.0)),
      (Option(5.0), Option(6.0)),
    ).toDF("x", "y")
    val m = SparkStage.pairwiseMoments(d2, Seq(("x", "y")))(("x", "y"))
    assert(m.n == 3) // rows where both present
    assertApprox(m.pearson,
      LocalStats.pearson(Seq(1.0, 4.0, 5.0), Seq(1.0, 4.0, 6.0)), 1e-9, "pairwise pearson")
  }

  test("pairwiseMoments: many pairs in one action") {
    val d3 = Seq((1.0, 2.0, -1.0), (2.0, 4.0, -2.0), (3.0, 6.5, -3.5)).toDF("a", "b", "c")
    val pairs = Seq(("a", "b"), ("a", "c"), ("b", "c"))
    val ms = SparkStage.pairwiseMoments(d3, pairs)
    assert(ms.size == 3)
    assert(ms(("a", "b")).pearson > 0.99)
    assert(ms(("a", "c")).pearson < -0.99)
  }

  test("rankColumns: average ranks match the local reference") {
    val d = Seq(3.0, 1.0, 4.0, 1.0, 5.0, 9.0, 2.0, 6.0).toDF("x")
    val ranked = SparkStage.rankColumns(d, Seq("x"), Map("x" -> 8L))
    val got = collectDoubles(ranked, "x").sorted
    val exp = LocalStats.averageRanks(collectDoubles(d, "x")).toSeq.sorted
    assertApproxSeq(got, exp, 1e-9, "ranks")
  }

  test("rankColumns: ties share the average rank") {
    val d = Seq(10.0, 20.0, 20.0, 30.0).toDF("x")
    val ranked = SparkStage.rankColumns(d, Seq("x"), Map("x" -> 4L))
    assert(collectDoubles(ranked, "x").sorted == Seq(1.0, 2.5, 2.5, 4.0))
  }

  test("rankColumns: nulls stay null and do not shift ranks") {
    val d = Seq(Option(5.0), None, Option(1.0), Option(3.0)).toDF("x")
    val ranked = SparkStage.rankColumns(d, Seq("x"), Map("x" -> 3L))
    val all = ranked.collect().map(r => if (r.isNullAt(0)) None else Some(r.getDouble(0)))
    assert(all.count(_.isEmpty) == 1)
    assert(all.flatten.sorted.toSeq == Seq(1.0, 2.0, 3.0))
  }

  test("collectNumericMatrix: column-major values with NaN for null") {
    val d = Seq((Option(1.0), Option(2.0)), (None: Option[Double], Option(4.0))).toDF("a", "b")
    val m = SparkStage.collectNumericMatrix(d, Seq("a", "b"), 2, 100)
    assert(m.length == 2 && m(0).length == 2)
    val aVals = m(0).toSeq
    assert(aVals.count(_.isNaN) == 1 && aVals.contains(1.0))
    assert(m(1).sorted.toSeq == Seq(2.0, 4.0))
  }

  test("collectNumericMatrix: sampling bounds the row count") {
    val d = spark.range(10000).selectExpr("cast(id as double) as x")
    val m = SparkStage.collectNumericMatrix(d, Seq("x"), 10000, 1000)
    assert(m(0).length < 3000) // fraction-based sample, loose upper bound
    assert(m(0).length > 200)
  }

  // ---------------------------------------------------------------------

  test("missingSpectrum: per-column missing totals match the bar counts") {
    val sp = SparkStage.missingSpectrum(df, Seq("x", "s"), 3)
    val missX = sp.buckets.indices.map(b =>
      sp.missingFraction(b)(0) * (sp.buckets(b)._2 - sp.buckets(b)._1 + 1)).sum
    val missS = sp.buckets.indices.map(b =>
      sp.missingFraction(b)(1) * (sp.buckets(b)._2 - sp.buckets(b)._1 + 1)).sum
    assertApprox(missX, 1.0, 1e-9, "x missing")
    assertApprox(missS, 1.0, 1e-9, "s missing")
  }

  test("missingSpectrum: buckets partition the rows") {
    val sp = SparkStage.missingSpectrum(df, Seq("x"), 3)
    assert(sp.buckets.head._1 == 0)
    assert(sp.buckets.last._2 == 6)
    assert(sp.buckets.sliding(2).forall(p => p(0)._2 + 1 == p(1)._1))
  }

  test("nullityMoments: disagreement counts recoverable from sums") {
    val d = Seq(
      (Option(1.0), Option("a")), (None: Option[Double], Option("b")),
      (None: Option[Double], None: Option[String]), (Option(2.0), Option("c")),
    ).toDF("x", "s")
    val m = SparkStage.nullityMoments(d, Seq("x", "s"))(("x", "s"))
    // indicators: x = (0,1,1,0), s = (0,0,1,0) -> disagreements = 1
    assert(m.sx == 2.0 && m.sy == 1.0 && m.sxy == 1.0)
    assert(m.sx + m.sy - 2 * m.sxy == 1.0)
  }

  // ---------------------------------------------------------------------

  test("grid2d: total count equals pairwise-complete rows") {
    val d2 = Seq((Option(1.0), Option(1.0)), (Option(2.0), None),
      (Option(3.0), Option(2.0))).toDF("x", "y")
    val g = SparkStage.grid2d(d2, "x", "y", 1, 3, 1, 2, 4, 4)
    assert(g.counts.map(_.sum).sum == 2)
    assert(g.xEdges.length == 5 && g.yEdges.length == 5)
  }

  test("grid2d: counts match DuckDB cross-binning") {
    val d2 = (1 to 50).map(i => (i.toDouble, (i * 7 % 13).toDouble)).toDF("x", "y")
    val g = SparkStage.grid2d(d2, "x", "y", 1, 50, 0, 12, 5, 5)
    val got = (for (i <- 0 until 5; j <- 0 until 5 if g.counts(i)(j) > 0)
      yield (i, j, g.counts(i)(j))).toDF("xb", "yb", "cnt")
    val xw = (50.0 - 1.0) / 5; val yw = 12.0 / 5
    Oracle.assertEquivalent(got,
      s"SELECT LEAST(4, GREATEST(0, CAST(FLOOR((CAST(x AS DOUBLE) - 1.0) / $xw) AS INT))) AS xb, " +
      s"LEAST(4, GREATEST(0, CAST(FLOOR((CAST(y AS DOUBLE) - 0.0) / $yw) AS INT))) AS yb, " +
      "count(*) AS cnt FROM t GROUP BY 1, 2", "t" -> d2)
  }

  test("binnedQuantiles: per-bin counts sum to pairwise-complete rows") {
    val d2 = (1 to 40).map(i => (i.toDouble, i * 2.0)).toDF("x", "y")
    val (edges, qs) = SparkStage.binnedQuantiles(d2, "x", "y", 1, 40, 4)
    assert(edges.length == 5)
    assert(qs.map(_._3).sum == 40)
    qs.foreach { case (_, q, _) => assert(q.length == 5 && q.sliding(2).forall(p => p(0) <= p(1))) }
  }

  test("groupedNumericStats: count and mean match DuckDB") {
    val d2 = Seq(("a", 1.0), ("a", 3.0), ("b", 10.0)).toDF("g", "v")
    val got = SparkStage.groupedNumericStats(d2, "g", "v", 10)
      .map(t => (t._1, t._2, t._3)).toDF("g", "cnt", "m")
    Oracle.assertEquivalent(got,
      "SELECT g, count(*) AS cnt, avg(CAST(v AS DOUBLE)) AS m FROM t GROUP BY g", "t" -> d2)
  }

  test("groupedNumericStats: caps at the most frequent groups") {
    val d2 = Seq(("a", 1.0), ("a", 2.0), ("b", 3.0), ("c", 4.0)).toDF("g", "v")
    val out = SparkStage.groupedNumericStats(d2, "g", "v", 1)
    assert(out.size == 1 && out.head._1 == "a")
  }

  test("groupedHistograms: per-category totals") {
    val d2 = Seq(("a", 1.0), ("a", 2.0), ("b", 3.0)).toDF("g", "v")
    val hs = SparkStage.groupedHistograms(d2, "g", "v", Seq("a", "b"), 1.0, 3.0, 2)
    assert(hs("a").sum == 2 && hs("b").sum == 1)
  }

  test("contingency: matches DuckDB cross tabulation") {
    val d2 = Seq(("a", "x"), ("a", "x"), ("a", "y"), ("b", "y")).toDF("c1", "c2")
    val got = SparkStage.contingency(d2, "c1", "c2").toDF("a", "b", "count")
    Oracle.assertEquivalent(got,
      "SELECT c1 AS a, c2 AS b, count(*) AS count FROM t GROUP BY c1, c2", "t" -> d2)
  }

  test("outlierCounts: counts beyond fences match DuckDB") {
    val d = Seq(1.0, 2.0, 3.0, 100.0, -50.0).toDF("x")
    val n = SparkStage.outlierCounts(d, Seq(("x", 0.0, 10.0)))("x")
    val got = Seq(Tuple1(n)).toDF("n")
    Oracle.assertEquivalent(got,
      "SELECT count(*) FILTER (WHERE CAST(x AS DOUBLE) < 0.0 OR CAST(x AS DOUBLE) > 10.0) AS n FROM t",
      "t" -> d)
  }

  test("scatterSample: bounded size, complete pairs only") {
    val d2 = Seq((Option(1.0), Option(1.0)), (None: Option[Double], Option(2.0)),
      (Option(3.0), Option(3.0)), (Option(4.0), Option(4.0))).toDF("x", "y")
    val pts = SparkStage.scatterSample(d2, "x", "y", 2)
    assert(pts.size == 2)
    val all = SparkStage.scatterSample(d2, "x", "y", 100)
    assert(all.size == 3)
  }
}
