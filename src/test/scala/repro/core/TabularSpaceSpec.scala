package repro.core

import repro.SparkSpec
import repro.lake.DataLake

class TabularSpaceSpec extends SparkSpec {

  private lazy val lake = DataLake.movie(spark, sf = 0.01)
  private lazy val uni = Universal.build(lake)
  private lazy val task = TabularTask.forLake(lake)
    .calibrated(uni.materialize(State.full(uni.layout.width)))
  private lazy val space = new TabularSpace(uni, task)

  test("full state is admissible") {
    assert(space.admissible(space.full))
  }

  test("a state without attributes is inadmissible") {
    var s = space.full
    space.layout.attrs.foreach(a => s = s.clear(space.layout.attrIdx(a)))
    assert(!space.admissible(s))
  }

  test("a state with an empty segment is inadmissible") {
    val seg = space.layout.segAttrs.head
    var s = space.full
    (0 until uni.clusterings(seg).k).foreach(c => s = s.clear(space.layout.clusterIdx(seg, c)))
    assert(!space.admissible(s))
  }

  test("neighborsReduct flips exactly one bit down") {
    val kids = space.neighborsReduct(space.full)
    assert(kids.nonEmpty)
    kids.foreach(k => assert(k.popCount == space.full.popCount - 1))
  }

  test("neighborsAugment flips exactly one bit up") {
    val sb = space.backStart
    val kids = space.neighborsAugment(sb)
    assert(kids.nonEmpty)
    kids.foreach(k => assert(k.popCount == sb.popCount + 1))
  }

  test("neighborsReduct of full covers all admissible single flips") {
    val kids = space.neighborsReduct(space.full).toSet
    // flipping any single attr bit (with >1 attrs) is admissible
    assert(kids.size >= space.layout.attrs.size)
  }

  test("backStart keeps only base attributes") {
    val baseCols = lake.base.df.columns.toSet
    val sb = space.backStart
    assert(space.layout.attrsOf(sb).forall(baseCols.contains))
  }

  test("backStart evaluates successfully (class coverage)") {
    assert(space.evaluate(space.backStart).isDefined)
  }

  test("rowCountEstimate equals materialized count on sample states") {
    val seg = space.layout.segAttrs.head
    val states = Seq(
      space.full,
      space.full.clear(space.layout.clusterIdx(seg, 0)),
      space.backStart)
    states.foreach { s =>
      assert(space.rowCountEstimate(s) == uni.materialize(s).count(), s"state $s")
    }
  }

  test("features vector has bitmap + 2 fractions") {
    val f = space.features(space.full)
    assert(f.length == space.layout.width + 2)
    assert(f.last == 1.0) // all columns kept
    assert(f(space.layout.width) == 1.0) // all rows kept
  }

  test("evaluate is memoized (same instance back)") {
    val a = space.evaluate(space.full)
    val b = space.evaluate(space.full)
    assert(a eq b)
  }

  test("evaluate on full state yields usable metrics") {
    val r = space.evaluate(space.full).get
    assert(r.rows == uni.df.count())
    assert(r.norm.length == task.measureNames.length)
  }

  test("measures come from the task") {
    assert(space.measures.map(_.name) == task.measureNames)
  }
}
