package repro.core

import repro.{SparkSpec, TestHelpers}

class ColumnTypeSpec extends SparkSpec with TestHelpers {
  import spark.implicits._

  private lazy val df = Seq(
    (1, 2L, 3.0f, 4.0, BigDecimal(5), "s", true, java.sql.Date.valueOf("2020-01-01")),
  ).toDF("i", "l", "f", "d", "dec", "s", "b", "dt")

  test("integer columns are numerical") {
    assert(TypeDetector.typeOf(df, "i") == ColumnType.Numerical)
    assert(TypeDetector.typeOf(df, "l") == ColumnType.Numerical)
  }
  test("floating-point columns are numerical") {
    assert(TypeDetector.typeOf(df, "f") == ColumnType.Numerical)
    assert(TypeDetector.typeOf(df, "d") == ColumnType.Numerical)
  }
  test("decimal columns are numerical") {
    assert(TypeDetector.typeOf(df, "dec") == ColumnType.Numerical)
  }
  test("string columns are categorical") {
    assert(TypeDetector.typeOf(df, "s") == ColumnType.Categorical)
  }
  test("boolean columns are categorical") {
    assert(TypeDetector.typeOf(df, "b") == ColumnType.Categorical)
  }
  test("date columns are categorical (rendered as labels)") {
    assert(TypeDetector.typeOf(df, "dt") == ColumnType.Categorical)
  }
  test("detectAll preserves schema order") {
    assert(TypeDetector.detectAll(df).map(_._1) == df.columns.toSeq)
  }
  test("numericColumns / categoricalColumns partition the schema") {
    val n = TypeDetector.numericColumns(df)
    val c = TypeDetector.categoricalColumns(df)
    assert(n == Seq("i", "l", "f", "d", "dec"))
    assert(c == Seq("s", "b", "dt"))
    assert((n ++ c).toSet == df.columns.toSet)
  }
  test("unknown column raises a helpful error") {
    val e = intercept[IllegalArgumentException](TypeDetector.typeOf(df, "nope"))
    assert(e.getMessage.contains("nope") && e.getMessage.contains("available"))
  }
}
