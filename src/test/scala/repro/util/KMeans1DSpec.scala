package repro.util

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class KMeans1DSpec extends AnyFunSuite {

  test("fewer distinct values than k gives one cluster per value") {
    val cl = KMeans1D.fit(Array(1.0, 2.0, 1.0, 2.0), k = 5)
    assert(cl.k == 2)
    assert(cl.centroids.toSeq == Seq(1.0, 2.0))
  }

  test("single value collapses to one cluster") {
    val cl = KMeans1D.fit(Array(7.0, 7.0, 7.0), k = 3)
    assert(cl.k == 1)
    assert(cl.assign(7.0) == 0)
    assert(cl.assign(100.0) == 0)
  }

  test("empty input yields a single zero centroid") {
    val cl = KMeans1D.fit(Array.empty[Double], k = 3)
    assert(cl.k == 1)
  }

  test("well-separated groups are recovered") {
    val rng = new Random(1)
    val xs = Array.fill(100)(rng.nextDouble()) ++
      Array.fill(100)(10 + rng.nextDouble()) ++
      Array.fill(100)(20 + rng.nextDouble())
    val cl = KMeans1D.fit(xs, k = 3)
    assert(cl.k == 3)
    assert(cl.assign(0.5) == 0)
    assert(cl.assign(10.5) == 1)
    assert(cl.assign(20.5) == 2)
  }

  test("assign respects boundaries") {
    val cl = KMeans1D.Clustering(Array(0.0, 10.0), Array(5.0))
    assert(cl.assign(4.9) == 0)
    assert(cl.assign(5.0) == 0)
    assert(cl.assign(5.1) == 1)
  }

  test("boundaries are midpoints of sorted centroids") {
    val cl = KMeans1D.fit(Array(0.0, 10.0), k = 2)
    assert(cl.boundaries.toSeq == Seq(5.0))
  }

  test("centroids are sorted") {
    val rng = new Random(2)
    val xs = Array.fill(500)(rng.nextGaussian() * 50)
    val cl = KMeans1D.fit(xs, k = 6)
    assert(cl.centroids.toSeq == cl.centroids.sorted.toSeq)
  }

  test("assignment is exhaustive and within range") {
    val rng = new Random(3)
    val xs = Array.fill(300)(rng.nextDouble() * 100)
    val cl = KMeans1D.fit(xs, k = 4)
    xs.foreach { v =>
      val c = cl.assign(v)
      assert(c >= 0 && c < cl.k)
    }
  }

  test("assignment is to the nearest centroid") {
    val rng = new Random(4)
    val xs = Array.fill(200)(rng.nextDouble() * 60)
    val cl = KMeans1D.fit(xs, k = 5)
    xs.foreach { v =>
      val c = cl.assign(v)
      val best = cl.centroids.indices.minBy(i => math.abs(cl.centroids(i) - v))
      assert(math.abs(cl.centroids(c) - v) <= math.abs(cl.centroids(best) - v) + 1e-9)
    }
  }

  test("deterministic: same input, same clustering") {
    val xs = Array.tabulate(100)(i => (i % 7).toDouble + i * 0.001)
    val a = KMeans1D.fit(xs, 4); val b = KMeans1D.fit(xs, 4)
    assert(a.centroids.toSeq == b.centroids.toSeq)
  }

  test("k=1 puts everything in cluster 0") {
    val cl = KMeans1D.fit(Array(1.0, 5.0, 9.0), k = 1)
    assert(cl.k == 1)
    assert(Seq(1.0, 5.0, 9.0).forall(cl.assign(_) == 0))
  }

  test("rejects k=0") {
    intercept[IllegalArgumentException](KMeans1D.fit(Array(1.0), 0))
  }
}
