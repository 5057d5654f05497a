package repro.ml

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {
  private val eps = 1e-9

  test("accuracy of perfect prediction is 1") {
    assert(Metrics.accuracy(Array(1, 0, 1.0), Array(1, 0, 1.0)) == 1.0)
  }
  test("accuracy of inverted prediction is 0") {
    assert(Metrics.accuracy(Array(1, 0.0), Array(0, 1.0)) == 0.0)
  }
  test("accuracy half right") {
    assert(math.abs(Metrics.accuracy(Array(1, 0, 1, 0.0), Array(1, 0, 0, 1.0)) - 0.5) < eps)
  }

  test("precision basic") {
    // preds: 1,1,0 — true: 1,0,0 → tp=1 fp=1
    assert(math.abs(Metrics.precision(Array(1, 0, 0.0), Array(1, 1, 0.0)) - 0.5) < eps)
  }
  test("precision with no positive predictions is 0") {
    assert(Metrics.precision(Array(1, 1.0), Array(0, 0.0)) == 0.0)
  }
  test("recall basic") {
    // true: 1,1,0 — preds 1,0,0 → tp=1 fn=1
    assert(math.abs(Metrics.recall(Array(1, 1, 0.0), Array(1, 0, 0.0)) - 0.5) < eps)
  }
  test("recall with no actual positives is 0") {
    assert(Metrics.recall(Array(0, 0.0), Array(1, 1.0)) == 0.0)
  }
  test("f1 harmonic mean") {
    val yT = Array(1, 1, 0, 0.0); val yP = Array(1, 0, 1, 0.0)
    // p = 0.5, r = 0.5 → f1 = 0.5
    assert(math.abs(Metrics.f1(yT, yP) - 0.5) < eps)
  }
  test("f1 zero when nothing predicted positive") {
    assert(Metrics.f1(Array(1, 1.0), Array(0, 0.0)) == 0.0)
  }

  test("auc of perfectly-ranked scores is 1") {
    assert(math.abs(Metrics.auc(Array(0, 0, 1, 1.0), Array(0.1, 0.2, 0.8, 0.9)) - 1.0) < eps)
  }
  test("auc of inverted ranking is 0") {
    assert(math.abs(Metrics.auc(Array(1, 1, 0, 0.0), Array(0.1, 0.2, 0.8, 0.9))) < eps)
  }
  test("auc of constant scores is 0.5") {
    assert(math.abs(Metrics.auc(Array(0, 1.0), Array(0.5, 0.5)) - 0.5) < eps)
  }
  test("auc degenerate single class is 0.5") {
    assert(Metrics.auc(Array(1, 1.0), Array(0.2, 0.8)) == 0.5)
  }

  test("mse basic") {
    assert(math.abs(Metrics.mse(Array(0.0, 0.0), Array(1.0, 3.0)) - 5.0) < eps)
  }
  test("mae basic") {
    assert(math.abs(Metrics.mae(Array(0.0, 0.0), Array(1.0, -3.0)) - 2.0) < eps)
  }
  test("rmse is sqrt of mse") {
    val yT = Array(0.0, 0.0); val yP = Array(2.0, 2.0)
    assert(math.abs(Metrics.rmse(yT, yP) - math.sqrt(Metrics.mse(yT, yP))) < eps)
  }
  test("r2 of perfect prediction is 1") {
    assert(math.abs(Metrics.r2(Array(1, 2, 3.0), Array(1, 2, 3.0)) - 1.0) < eps)
  }
  test("r2 of mean prediction is 0") {
    assert(math.abs(Metrics.r2(Array(1, 2, 3.0), Array(2, 2, 2.0))) < eps)
  }
  test("regression accuracy of exact predictions is 1") {
    assert(Metrics.regressionAccuracy(Array(1, 5, 9.0), Array(1, 5, 9.0)) == 1.0)
  }
  test("regression accuracy of far-off predictions is 0") {
    assert(Metrics.regressionAccuracy(Array(1, 5, 9.0), Array(100, 100, 100.0)) == 0.0)
  }

  test("precision@k of perfect recs") {
    val recs = Map(0 -> Seq(1, 2, 3))
    val truth = Map(0 -> Set(1, 2, 3))
    assert(math.abs(Metrics.precisionAtK(recs, truth, 3) - 1.0) < eps)
  }
  test("precision@k counts only the top k") {
    val recs = Map(0 -> Seq(9, 8, 1))
    val truth = Map(0 -> Set(1))
    assert(math.abs(Metrics.precisionAtK(recs, truth, 2)) < eps)
    assert(math.abs(Metrics.precisionAtK(recs, truth, 3) - 1.0 / 3) < eps)
  }
  test("recall@k relative to truth size") {
    val recs = Map(0 -> Seq(1, 9))
    val truth = Map(0 -> Set(1, 2, 3, 4))
    assert(math.abs(Metrics.recallAtK(recs, truth, 2) - 0.25) < eps)
  }
  test("ndcg@k of perfect order is 1") {
    val recs = Map(0 -> Seq(1, 2))
    val truth = Map(0 -> Set(1, 2))
    assert(math.abs(Metrics.ndcgAtK(recs, truth, 2) - 1.0) < eps)
  }
  test("ndcg@k rewards early hits") {
    val early = Map(0 -> Seq(1, 9, 8))
    val late = Map(0 -> Seq(9, 8, 1))
    val truth = Map(0 -> Set(1))
    assert(Metrics.ndcgAtK(early, truth, 3) > Metrics.ndcgAtK(late, truth, 3))
  }
  test("ranking metrics average over users") {
    val recs = Map(0 -> Seq(1), 1 -> Seq(9))
    val truth = Map(0 -> Set(1), 1 -> Set(1))
    assert(math.abs(Metrics.precisionAtK(recs, truth, 1) - 0.5) < eps)
  }
  test("ranking metrics ignore users with empty truth") {
    val recs = Map(0 -> Seq(1), 1 -> Seq(2))
    val truth = Map(0 -> Set(1), 1 -> Set.empty[Int])
    assert(math.abs(Metrics.precisionAtK(recs, truth, 1) - 1.0) < eps)
  }

  test("fisher score is higher for separated classes") {
    val xSep = Array.tabulate(100)(i => Array(if (i < 50) 0.0 else 10.0))
    val xMix = Array.tabulate(100)(i => Array((i % 7).toDouble))
    val y = Array.tabulate(100)(i => if (i < 50) 0.0 else 1.0)
    assert(Metrics.fisherScore(xSep, y) > Metrics.fisherScore(xMix, y))
  }
  test("fisher score of single-class labels is 0") {
    assert(Metrics.fisherScore(Array(Array(1.0), Array(2.0)), Array(1.0, 1.0)) == 0.0)
  }
  test("mutual information higher for informative feature") {
    val rng = new scala.util.Random(1)
    val y = Array.fill(400)(if (rng.nextBoolean()) 1.0 else 0.0)
    val xInf = y.map(v => Array(v * 5 + rng.nextGaussian() * 0.1))
    val xNoise = y.map(_ => Array(rng.nextGaussian()))
    assert(Metrics.mutualInformation(xInf, y) > Metrics.mutualInformation(xNoise, y))
  }
  test("mutual information is non-negative") {
    val rng = new scala.util.Random(2)
    val x = Array.fill(200)(Array(rng.nextGaussian()))
    val y = Array.fill(200)(if (rng.nextBoolean()) 1.0 else 0.0)
    assert(Metrics.mutualInformation(x, y) >= 0.0)
  }
  test("binarizeAtMedian splits roughly in half") {
    val y = Array.tabulate(101)(_.toDouble)
    val b = Metrics.binarizeAtMedian(y)
    assert(b.count(_ == 1.0) == 50)
  }
  test("empty feature matrix scores 0") {
    assert(Metrics.fisherScore(Array.empty, Array.empty) == 0.0)
    assert(Metrics.mutualInformation(Array.empty, Array.empty) == 0.0)
  }
}
