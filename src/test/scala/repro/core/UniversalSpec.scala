package repro.core

import repro.SparkSpec
import repro.Oracle
import repro.lake.DataLake

class UniversalSpec extends SparkSpec {

  private lazy val lake = DataLake.movie(spark, sf = 0.01)
  private lazy val uni = Universal.build(lake)

  test("universal table preserves every labelled base row") {
    assert(uni.df.count() == lake.base.df.count())
  }

  test("universal schema is the union of source schemas") {
    val expected = (lake.base.df.columns ++ lake.aux.flatMap(_.df.columns)).toSet
    assert(expected.subsetOf(uni.df.columns.toSet))
  }

  test("hidden cluster columns exist for every segment attr") {
    lake.segmentAttrs.foreach(a => assert(uni.df.columns.contains(s"__cl_$a")))
  }

  test("cluster ids are in range") {
    lake.segmentAttrs.foreach { a =>
      val k = uni.clusterings(a).k
      val ids = uni.df.select(s"__cl_$a").distinct().collect().map(_.getInt(0)).toSet
      assert(ids.forall(c => c >= 0 && c < k))
    }
  }

  test("segment clustering recovers the generated well-separated groups") {
    // seg_quality values were generated at c*2 + U(0,0.9) per cluster
    assert(uni.clusterings("seg_quality").k >= 3)
  }

  test("segCounts contingency sums to the row count") {
    assert(uni.segCounts.values.sum == uni.df.count())
  }

  test("rowCount of the full state equals the table size") {
    assert(uni.rowCount(State.full(uni.layout.width)) == uni.df.count())
  }

  test("rowCount after masking one cluster matches a Spark filter") {
    val seg = uni.layout.segAttrs.head
    val s = State.full(uni.layout.width).clear(uni.layout.clusterIdx(seg, 0))
    val expected = uni.df.filter(s"__cl_$seg <> 0").count()
    assert(uni.rowCount(s) == expected)
    assert(uni.materialize(s).count() == expected)
  }

  test("materialize keeps only selected attributes plus key and target") {
    val keep = uni.layout.attrs.take(2)
    var s = State.full(uni.layout.width)
    uni.layout.attrs.drop(2).foreach(a => s = s.clear(uni.layout.attrIdx(a)))
    val cols = uni.materialize(s).columns.toSet
    assert(cols == (Set(uni.key, uni.target) ++ keep))
  }

  test("materialize of an all-clusters-masked state is empty") {
    val seg = uni.layout.segAttrs.head
    var s = State.full(uni.layout.width)
    (0 until uni.clusterings(seg).k).foreach(c => s = s.clear(uni.layout.clusterIdx(seg, c)))
    assert(uni.materialize(s).count() == 0)
  }

  test("oracle: universal join equals DuckDB multi-way left join") {
    val a1 = lake.aux.head
    val a1Col = a1.df.columns.filterNot(_ == "id").head
    val sparkSide = lake.base.df.select("id", "target")
      .join(a1.df.select("id", a1Col), Seq("id"), "left_outer")
      .selectExpr("cast(id as long) as id", "cast(target as double) as target",
        s"cast($a1Col as double) as f")
    Oracle.assertEquivalent(
      sparkSide,
      s"""SELECT CAST(b.id AS BIGINT) AS id, CAST(b.target AS DOUBLE) AS target,
         |       CAST(a.$a1Col AS DOUBLE) AS f
         |FROM base b LEFT OUTER JOIN aux a ON b.id = a.id""".stripMargin,
      "base" -> lake.base.df.select("id", "target"),
      "aux" -> a1.df.select("id", a1Col))
  }

  test("oracle: cluster filter equals DuckDB range predicate") {
    val seg = "seg_quality"
    val cl = uni.clusterings(seg)
    // cluster 0 = values <= first boundary
    val bound = cl.boundaries.head
    val sparkSide = uni.df.filter(s"__cl_$seg = 0")
      .selectExpr("cast(id as long) as id")
    Oracle.assertEquivalent(
      sparkSide,
      s"SELECT CAST(id AS BIGINT) AS id FROM u WHERE CAST($seg AS DOUBLE) <= $bound",
      "u" -> uni.df.select("id", seg))
  }

  test("oracle: masked-cluster materialization equals DuckDB anti-range") {
    val seg = "seg_quality"
    val cl = uni.clusterings(seg)
    val bound = cl.boundaries.head
    val s = State.full(uni.layout.width).clear(uni.layout.clusterIdx(seg, 0))
    val sparkSide = uni.materialize(s).selectExpr("cast(id as long) as id")
    Oracle.assertEquivalent(
      sparkSide,
      s"SELECT CAST(id AS BIGINT) AS id FROM u WHERE CAST($seg AS DOUBLE) > $bound",
      "u" -> uni.df.select("id", seg))
  }

  test("layout cluster bits match the clustering sizes") {
    val expected = uni.layout.segAttrs.map(a => uni.clusterings(a).k).sum
    assert(uni.layout.clusters.size == expected)
  }
}
