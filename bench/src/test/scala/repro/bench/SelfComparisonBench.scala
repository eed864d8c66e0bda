package repro.bench

import repro.core.Eda
import repro.core.TypeDetector
import repro.data.EdaData

/** Figure 5 reproduction (as a table): the fraction of fine-grained tasks
  * finishing within 0.5 / 1 / 2 / 5 seconds.
  *
  * The paper runs every plot function for each column and column pair of
  * all 15 datasets; we use three representative datasets (small / medium /
  * wide) and cap pairs at 10 per dataset per function to bound bench time —
  * the measured quantity (per-task interactive latency) is unaffected by
  * the number of samples. The paper's finding: the majority of tasks finish
  * within 1 s for every function except plot_missing(df, col1), which is
  * the heaviest (two frequency distributions per column).
  */
class SelfComparisonBench extends BenchHarness {

  private val datasetNames = Seq("titanic", "solar", "chess")
  private val maxPairs = 10

  test("Figure 5: per-task latency distribution of the fine-grained functions") {
    warmUp()
    val timings = scala.collection.mutable.Map[String, Vector[Double]]().withDefaultValue(Vector.empty)
    def record(fn: String)(f: => Any): Unit = {
      val (_, t) = time(f)
      timings(fn) = timings(fn) :+ t
    }

    datasetNames.foreach { name =>
      val spec = EdaData.table2.find(_.name == name).get
      val df = materialize(EdaData.dataset(spark, spec))
      val numCols = TypeDetector.numericColumns(df)
      val allCols = df.columns.toSeq

      allCols.foreach(c => record("plot(df, col1)")(Eda.plot(df, c)))
      numCols.foreach(c => record("plot_correlation(df, col1)")(Eda.plotCorrelation(df, c)))
      allCols.foreach(c => record("plot_missing(df, col1)")(Eda.plotMissing(df, c)))

      val pairs = (for (i <- allCols.indices; j <- i + 1 until allCols.size)
        yield (allCols(i), allCols(j))).take(maxPairs)
      pairs.foreach { case (a, b) => record("plot(df, col1, col2)")(Eda.plot(df, a, b)) }
      val numPairs = (for (i <- numCols.indices; j <- i + 1 until numCols.size)
        yield (numCols(i), numCols(j))).take(maxPairs)
      numPairs.foreach { case (a, b) =>
        record("plot_correlation(df, col1, col2)")(Eda.plotCorrelation(df, a, b))
      }
      pairs.take(maxPairs).foreach { case (a, b) =>
        record("plot_missing(df, col1, col2)")(Eda.plotMissing(df, a, b))
      }
      record("plot(df)")(Eda.plot(df))
      record("plot_correlation(df)")(Eda.plotCorrelation(df))
      record("plot_missing(df)")(Eda.plotMissing(df))
      df.unpersist()
    }

    val thresholds = Seq(0.5, 1.0, 2.0, 5.0)
    def pct(ts: Vector[Double], lim: Double): String =
      f"${ts.count(_ <= lim) * 100.0 / ts.size}%.0f%%"

    val fns = timings.keys.toSeq.sorted
    emitTable("figure5",
      Seq("Function", "#Tasks") ++ thresholds.map(t => s"<= ${t}s"),
      fns.map { fn =>
        val ts = timings(fn)
        Seq(fn, ts.size.toString) ++ thresholds.map(t => pct(ts, t))
      })

    // Shape assertions: fine-grained tasks are interactive.
    val all = timings.values.flatten.toVector
    assert(all.count(_ <= 5.0) >= all.size * 0.9,
      "at least 90% of fine-grained tasks should finish within 5s")
    val uni = timings("plot(df, col1)")
    assert(uni.count(_ <= 2.0) >= uni.size * 0.8,
      "univariate tasks should overwhelmingly finish within 2s")
  }
}
