package repro.util

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}

/** Helper to run a ScalaCheck property under ScalaTest without the
  * scalatestplus bridge (not present in the offline cache).
  */
trait Checkers { self: AnyFunSuite =>
  def check(prop: Prop, minSuccessful: Int = 50): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(minSuccessful), prop)
    assert(res.passed, res.status.toString)
  }
}

class StatsSpec extends AnyFunSuite with Checkers {
  private val eps = 1e-9

  test("mean of empty is 0") { assert(Stats.mean(Array.empty) == 0.0) }
  test("mean of singleton") { assert(math.abs(Stats.mean(Array(3.5)) - 3.5) < eps) }
  test("mean of 1..4") { assert(math.abs(Stats.mean(Array(1, 2, 3, 4.0)) - 2.5) < eps) }

  test("variance of constant is 0") { assert(Stats.variance(Array(2, 2, 2.0)) == 0.0) }
  test("variance of {0,2}") { assert(math.abs(Stats.variance(Array(0.0, 2.0)) - 1.0) < eps) }
  test("variance of singleton is 0") { assert(Stats.variance(Array(1.0)) == 0.0) }

  test("pearson of identical sequences is 1") {
    assert(math.abs(Stats.pearson(Array(1, 2, 3.0), Array(1, 2, 3.0)) - 1.0) < eps)
  }
  test("pearson of negated sequence is -1") {
    assert(math.abs(Stats.pearson(Array(1, 2, 3.0), Array(-1, -2, -3.0)) + 1.0) < eps)
  }
  test("pearson with constant side is 0") {
    assert(Stats.pearson(Array(1, 2, 3.0), Array(5, 5, 5.0)) == 0.0)
  }
  test("pearson is symmetric") {
    val a = Array(1.0, 4.0, 2.0, 8.0); val b = Array(3.0, 1.0, 7.0, 2.0)
    assert(math.abs(Stats.pearson(a, b) - Stats.pearson(b, a)) < eps)
  }

  test("ranks without ties") {
    assert(Stats.ranks(Array(10.0, 30.0, 20.0)).toSeq == Seq(1.0, 3.0, 2.0))
  }
  test("ranks with ties average") {
    assert(Stats.ranks(Array(1.0, 2.0, 2.0, 3.0)).toSeq == Seq(1.0, 2.5, 2.5, 4.0))
  }
  test("ranks all equal") {
    assert(Stats.ranks(Array(5.0, 5.0, 5.0)).toSeq == Seq(2.0, 2.0, 2.0))
  }

  test("spearman of monotone map is 1") {
    val a = Array(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Stats.spearman(a, a.map(x => x * x * x)) - 1.0) < eps)
  }
  test("spearman of antitone map is -1") {
    val a = Array(1.0, 2.0, 3.0, 4.0)
    assert(math.abs(Stats.spearman(a, a.map(x => -math.exp(x))) + 1.0) < eps)
  }

  test("cosine of identical vectors is 1") {
    assert(math.abs(Stats.cosine(Array(1, 2, 3.0), Array(1, 2, 3.0)) - 1.0) < eps)
  }
  test("cosine of orthogonal vectors is 0") {
    assert(math.abs(Stats.cosine(Array(1, 0.0), Array(0.0, 1))) < eps)
  }
  test("cosine with zero vector is 0") {
    assert(Stats.cosine(Array(0.0, 0.0), Array(1.0, 2.0)) == 0.0)
  }

  test("euclid basic") {
    assert(math.abs(Stats.euclid(Array(0.0, 0.0), Array(3.0, 4.0)) - 5.0) < eps)
  }
  test("euclid of identical vectors is 0") {
    assert(Stats.euclid(Array(1.0, 2.0), Array(1.0, 2.0)) == 0.0)
  }

  test("clip bounds") {
    assert(Stats.clip(5.0, 0.0, 1.0) == 1.0)
    assert(Stats.clip(-5.0, 0.0, 1.0) == 0.0)
    assert(Stats.clip(0.5, 0.0, 1.0) == 0.5)
  }

  private val vecGen: Gen[Array[Double]] =
    Gen.nonEmptyListOf(Gen.choose(-100.0, 100.0)).map(_.toArray)

  test("property: pearson of affine transform stays in [-1,1]") {
    check(Prop.forAll(vecGen) { a =>
      val b = a.map(x => x * 0.5 + 1.0)
      val r = Stats.pearson(a, b)
      r >= -1.0 - eps && r <= 1.0 + eps
    })
  }

  test("property: ranks sum to n(n+1)/2") {
    check(Prop.forAll(vecGen) { a =>
      math.abs(Stats.ranks(a).sum - a.length * (a.length + 1) / 2.0) < 1e-6
    })
  }

  test("property: euclid triangle inequality") {
    check(Prop.forAll(vecGen) { a =>
      val b = a.map(_ + 1.0); val c = a.map(_ * 2.0)
      Stats.euclid(a, c) <= Stats.euclid(a, b) + Stats.euclid(b, c) + eps
    })
  }

  test("property: spearman is scale invariant") {
    check(Prop.forAll(vecGen) { a =>
      a.length < 2 || math.abs(Stats.spearman(a, a) -
        Stats.spearman(a, a.map(_ * 3.0))) < 1e-9
    })
  }
}
