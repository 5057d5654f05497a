package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.lake.GraphLake

class GraphSpaceSpec extends AnyFunSuite {

  private lazy val lake = GraphLake.generate(sf = 0.01)
  private lazy val space = new GraphSpace(lake, epochs = 8)

  test("lake edges are disjoint from test edges") {
    lake.edges.foreach { case (u, i, _) =>
      assert(!lake.testEdges(u).contains(i))
    }
  }

  test("lake cluster ids are within range") {
    assert(lake.edges.forall(e => e._3 >= 0 && e._3 < lake.nEdgeClusters))
  }

  test("noise clusters are the trailing ids") {
    assert(lake.noiseClusters.forall(_ >= lake.nEdgeClusters - 3))
  }

  test("every user has held-out positives") {
    assert((0 until lake.nUsers).forall(u => lake.testEdges(u).nonEmpty))
  }

  test("feature group matrices cover all nodes") {
    lake.featureGroups.foreach { g =>
      assert(lake.userFeatures(g).length == lake.nUsers)
      assert(lake.itemFeatures(g).length == lake.nItems)
    }
  }

  test("featuresOf concatenates group columns") {
    val (uf, itf) = lake.featuresOf(Seq("fg_lat1", "fg_noise1"))
    assert(uf(0).length == lake.userFeatures("fg_lat1")(0).length +
      lake.userFeatures("fg_noise1")(0).length)
    assert(itf.length == lake.nItems)
  }

  test("layout has one bit per feature group and edge cluster") {
    assert(space.layout.width == lake.featureGroups.size + lake.nEdgeClusters)
  }

  test("rowCountEstimate of full state counts all edges") {
    assert(space.rowCountEstimate(space.full) == lake.edges.size)
  }

  test("rowCountEstimate drops masked clusters") {
    val c0 = space.layout.clusterIdx("edge", 0)
    val without = space.full.clear(c0)
    val c0Size = lake.edges.count(_._3 == 0)
    assert(space.rowCountEstimate(without) == lake.edges.size - c0Size)
  }

  test("full state evaluates with all six ranking metrics") {
    val r = space.evaluate(space.full).get
    Seq("pc5", "pc10", "rc5", "rc10", "nc5", "nc10").foreach { k =>
      assert(r.raw.contains(k) && r.raw(k) >= 0.0 && r.raw(k) <= 1.0)
    }
    assert(r.rows == lake.edges.size)
  }

  test("a state with no feature groups is admissible and evaluates") {
    var s = space.full
    lake.featureGroups.foreach(g => s = s.clear(space.layout.attrIdx(g)))
    assert(space.admissible(s))
    val r = space.evaluate(s)
    assert(r.isDefined && r.get.cols == 0)
  }

  test("a state with no edge clusters is inadmissible") {
    var s = space.full
    (0 until lake.nEdgeClusters).foreach(c => s = s.clear(space.layout.clusterIdx("edge", c)))
    assert(!space.admissible(s))
  }

  test("backStart is admissible and evaluates") {
    val sb = space.backStart
    assert(space.admissible(sb))
    assert(space.evaluate(sb).isDefined)
  }

  test("evaluation is memoized and deterministic") {
    val a = space.evaluate(space.full).get
    val b = space.evaluate(space.full).get
    assert(a eq b)
  }

  test("dropping noise clusters does not hurt precision much") {
    var s = space.full
    lake.noiseClusters.foreach(c => s = s.clear(space.layout.clusterIdx("edge", c)))
    val full = space.evaluate(space.full).get.raw("pc5")
    val clean = space.evaluate(s).get.raw("pc5")
    assert(clean >= full - 0.1, s"clean=$clean full=$full")
  }
}
