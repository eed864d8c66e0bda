package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.types._

/** Column type as seen by the task-centric API (Figure 2's N / C split). */
sealed trait ColumnType
object ColumnType {
  /** Numerical — numeric Spark types. */
  case object Numerical extends ColumnType
  /** Categorical — strings, booleans, dates/timestamps (rendered as labels). */
  case object Categorical extends ColumnType
}

/** Detects the EDA type of each column from the DataFrame schema.
  *
  * The paper's system dispatches the mapping rules (Figure 2) on whether a
  * column is numerical or categorical; dates/timestamps and booleans are
  * treated as categorical labels (the synthetic workloads encode temporal
  * columns as strings, see DESIGN.md).
  */
object TypeDetector {

  def detect(dt: DataType): ColumnType = dt match {
    case _: NumericType => ColumnType.Numerical
    case _              => ColumnType.Categorical
  }

  /** Map every column name to its EDA type, preserving schema order. */
  def detectAll(df: DataFrame): Seq[(String, ColumnType)] =
    df.schema.fields.toSeq.map(f => f.name -> detect(f.dataType))

  def typeOf(df: DataFrame, col: String): ColumnType = {
    val field = df.schema.fields.find(_.name == col).getOrElse(
      throw new IllegalArgumentException(
        s"column '$col' not found; available: ${df.columns.mkString(", ")}"))
    detect(field.dataType)
  }

  def numericColumns(df: DataFrame): Seq[String] =
    detectAll(df).collect { case (c, ColumnType.Numerical) => c }

  def categoricalColumns(df: DataFrame): Seq[String] =
    detectAll(df).collect { case (c, ColumnType.Categorical) => c }
}
