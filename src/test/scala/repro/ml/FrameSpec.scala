package repro.ml

import repro.SparkSpec

class FrameSpec extends SparkSpec {
  import org.apache.spark.sql.Row
  import org.apache.spark.sql.types._

  private def df = {
    val schema = StructType(Array(
      StructField("y", DoubleType), StructField("a", DoubleType),
      StructField("b", DoubleType, nullable = true)))
    spark.createDataFrame(
      spark.sparkContext.parallelize(Seq(
        Row(1.0, 2.0, 3.0), Row(0.0, 4.0, null), Row(1.0, 6.0, 9.0))),
      schema)
  }

  test("fromDataFrame extracts labels and features") {
    val f = Frame.fromDataFrame(df, "y", Seq("a", "b"))
    assert(f.nRows == 3 && f.nCols == 2)
    assert(f.y.sorted.toSeq == Seq(0.0, 1.0, 1.0))
  }

  test("nulls become NaN") {
    val f = Frame.fromDataFrame(df, "y", Seq("a", "b"))
    assert(f.x.exists(_.exists(_.isNaN)))
  }

  test("columnMeans ignores NaN") {
    val f = Frame.fromDataFrame(df, "y", Seq("a", "b"))
    val means = f.columnMeans
    assert(math.abs(means(0) - 4.0) < 1e-9)
    assert(math.abs(means(1) - 6.0) < 1e-9)
  }

  test("imputed replaces NaN with fill values") {
    val f = Frame.fromDataFrame(df, "y", Seq("a", "b"))
    val g = f.imputed(f.columnMeans)
    assert(!g.x.exists(_.exists(_.isNaN)))
  }

  test("columnMeans of all-NaN column is 0") {
    val f = Frame(Vector("c"), Array(Array(Double.NaN), Array(Double.NaN)), Array(1.0, 2.0))
    assert(f.columnMeans.toSeq == Seq(0.0))
  }

  test("select projects columns by name") {
    val f = Frame.fromDataFrame(df, "y", Seq("a", "b"))
    val g = f.select(Seq("b"))
    assert(g.names == Vector("b") && g.nCols == 1 && g.nRows == 3)
  }

  test("select of unknown column fails") {
    val f = Frame.fromDataFrame(df, "y", Seq("a"))
    intercept[IllegalArgumentException](f.select(Seq("zzz")))
  }

  test("filterRows keeps matching rows") {
    val f = Frame.fromDataFrame(df, "y", Seq("a"))
    val g = f.filterRows(i => f.y(i) == 1.0)
    assert(g.nRows == 2)
  }

  test("label column is excluded from features even if listed") {
    val f = Frame.fromDataFrame(df, "y", Seq("y", "a"))
    assert(f.names == Vector("a"))
  }

  test("row count mismatch is rejected") {
    intercept[IllegalArgumentException](Frame(Vector("a"), Array(Array(1.0)), Array(1.0, 2.0)))
  }
}
