package repro

/** Oracle-backed checks over the provided TPC-H-lite generators: the same
  * join/filter/aggregate patterns the MODis data plane uses, validated
  * against DuckDB. Aggregations stick to COUNT/MIN/MAX to avoid cross-engine
  * floating-point summation drift.
  */
class SynthDataOracleSpec extends SparkSpec {

  private val sf = 0.002
  private lazy val li = SynthData.lineitem(spark, sf).limit(2000).cache()
  private lazy val ord = SynthData.orders(spark, sf).cache()

  test("oracle: filter + projection") {
    val q = li.filter("l_quantity > 40")
      .selectExpr("cast(l_orderkey as long) as k", "cast(l_quantity as double) as q")
    Oracle.assertEquivalent(
      q,
      "SELECT CAST(l_orderkey AS BIGINT) AS k, CAST(l_quantity AS DOUBLE) AS q " +
        "FROM li WHERE CAST(l_quantity AS DOUBLE) > 40",
      "li" -> li.select("l_orderkey", "l_quantity"))
  }

  test("oracle: group-by count per returnflag") {
    val q = li.groupBy("l_returnflag").count()
      .selectExpr("l_returnflag as f", "cast(count as long) as c")
    Oracle.assertEquivalent(
      q,
      "SELECT l_returnflag AS f, CAST(COUNT(*) AS BIGINT) AS c FROM li GROUP BY l_returnflag",
      "li" -> li.select("l_returnflag"))
  }

  test("oracle: inner join lineitem-orders row multiplicity") {
    val q = li.select("l_orderkey").join(ord.select("o_orderkey", "o_orderstatus"),
        li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").count()
      .selectExpr("o_orderstatus as s", "cast(count as long) as c")
    Oracle.assertEquivalent(
      q,
      """SELECT o.o_orderstatus AS s, CAST(COUNT(*) AS BIGINT) AS c
        |FROM li l JOIN ord o ON l.l_orderkey = o.o_orderkey
        |GROUP BY o.o_orderstatus""".stripMargin,
      "li" -> li.select("l_orderkey"),
      "ord" -> ord.select("o_orderkey", "o_orderstatus"))
  }

  test("oracle: min/max aggregates survive the round trip") {
    val q = li.groupBy("l_linestatus")
      .agg(org.apache.spark.sql.functions.expr("min(l_discount)").cast("double").as("mn"),
           org.apache.spark.sql.functions.expr("max(l_discount)").cast("double").as("mx"))
      .selectExpr("l_linestatus as s", "mn", "mx")
    Oracle.assertEquivalent(
      q,
      """SELECT l_linestatus AS s, CAST(MIN(CAST(l_discount AS DOUBLE)) AS DOUBLE) AS mn,
        |       CAST(MAX(CAST(l_discount AS DOUBLE)) AS DOUBLE) AS mx
        |FROM li GROUP BY l_linestatus""".stripMargin,
      "li" -> li.select("l_linestatus", "l_discount"))
  }

  test("zipf keys are skewed toward low ranks") {
    val df = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100)
    val top = df.filter("k = 1").count()
    val tail = df.filter("k = 50").count()
    assert(top > tail)
  }

  test("uniform keys cover the key range roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 5000, nKeys = 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max < counts.min * 3)
  }
}
