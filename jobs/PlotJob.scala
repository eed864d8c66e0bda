package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.core.{Eda, Render}
import repro.data.EdaData

/** spark-submit entry point for the fine-grained tasks:
  *
  * Usage: PlotJob <plot|plot_correlation|plot_missing> <dataset> [col1] [col2]
  *
  * Prints the rendered report as text (the Figure 1 flow, headless).
  */
object PlotJob {
  def main(args: Array[String]): Unit = {
    require(args.length >= 2, "usage: PlotJob <plot|plot_correlation|plot_missing> <dataset> [col1] [col2]")
    val func = args(0)
    val name = args(1)
    val cols = args.drop(2).toSeq
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"$func-$name")
      .getOrCreate()
    try {
      val spec = EdaData.table2.find(_.name == name).getOrElse(
        throw new IllegalArgumentException(s"unknown dataset '$name'"))
      val df = EdaData.dataset(spark, spec).cache()
      df.count()
      val t0 = System.nanoTime()
      val report = (func, cols) match {
        case ("plot", Seq())        => Eda.plot(df)
        case ("plot", Seq(a))       => Eda.plot(df, a)
        case ("plot", Seq(a, b))    => Eda.plot(df, a, b)
        case ("plot_correlation", Seq())     => Eda.plotCorrelation(df)
        case ("plot_correlation", Seq(a))    => Eda.plotCorrelation(df, a)
        case ("plot_correlation", Seq(a, b)) => Eda.plotCorrelation(df, a, b)
        case ("plot_missing", Seq())     => Eda.plotMissing(df)
        case ("plot_missing", Seq(a))    => Eda.plotMissing(df, a)
        case ("plot_missing", Seq(a, b)) => Eda.plotMissing(df, a, b)
        case other => throw new IllegalArgumentException(s"unsupported call: $other")
      }
      val elapsed = (System.nanoTime() - t0) / 1e9
      println(Render.toText(report))
      println(f"$func(${(name +: cols).mkString(", ")}) finished in $elapsed%.2f s")
    } finally spark.stop()
  }
}
