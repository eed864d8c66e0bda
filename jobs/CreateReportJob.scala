package repro.jobs

import java.nio.file.{Files, Paths}
import org.apache.spark.sql.SparkSession

import repro.core.{Eda, Render}
import repro.data.EdaData

/** spark-submit entry point: generate a full profile report for one of the
  * Table 2 dataset shapes and write it as HTML.
  *
  * Usage: CreateReportJob [datasetName=titanic] [outPath=/tmp/report.html]
  */
object CreateReportJob {
  def main(args: Array[String]): Unit = {
    val name = args.headOption.getOrElse("titanic")
    val out = args.lift(1).getOrElse("/tmp/report.html")
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"createReport-$name")
      .getOrCreate()
    try {
      val spec = EdaData.table2.find(_.name == name).getOrElse(
        throw new IllegalArgumentException(
          s"unknown dataset '$name'; known: ${EdaData.table2.map(_.name).mkString(", ")}"))
      val df = EdaData.dataset(spark, spec).cache()
      df.count() // materialize (load stage)
      val t0 = System.nanoTime()
      val report = Eda.createReport(df)
      val elapsed = (System.nanoTime() - t0) / 1e9
      Files.write(Paths.get(out), Render.toHtml(report).getBytes("UTF-8"))
      println(f"createReport($name): ${report.tabs.size} tabs in $elapsed%.2f s -> $out")
    } finally spark.stop()
  }
}
