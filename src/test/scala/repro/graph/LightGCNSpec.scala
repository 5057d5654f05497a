package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.ml.Metrics
import scala.util.Random

class LightGCNSpec extends AnyFunSuite {

  /** Block world: users 0..9 like items 0..4, users 10..19 like items 5..9.
    * Holdouts rotate per user so every held-out item still has training
    * edges from other users of the block (otherwise there is no
    * collaborative signal to recover at all).
    */
  private def blockEdges(holdout: Int): (Seq[(Int, Int)], Map[Int, Set[Int]]) = {
    val train = collection.mutable.Buffer.empty[(Int, Int)]
    val test = collection.mutable.Map.empty[Int, Set[Int]]
    for (u <- 0 until 20) {
      val items = if (u < 10) 0 until 5 else 5 until 10
      val rotated = items.drop(u % items.size) ++ items.take(u % items.size)
      val (held, kept) = rotated.splitAt(holdout)
      test(u) = held.toSet
      kept.foreach(i => train += ((u, i)))
    }
    (train.toSeq, test.toMap)
  }

  test("recovers block structure in recommendations") {
    val (train, test) = blockEdges(1)
    val m = new LightGCN(20, 10, epochs = 40).fit(train)
    val recs = m.recommend(3)
    assert(Metrics.precisionAtK(recs, test, 1) > 0.6)
  }

  test("recommendations exclude training edges") {
    val (train, _) = blockEdges(1)
    val m = new LightGCN(20, 10, epochs = 5).fit(train)
    val trainSet = train.toSet
    m.recommend(5).foreach { case (u, items) =>
      assert(items.forall(i => !trainSet.contains((u, i))))
    }
  }

  test("recommend returns at most k items per user") {
    val (train, _) = blockEdges(1)
    val m = new LightGCN(20, 10, epochs = 2).fit(train)
    assert(m.recommend(4).values.forall(_.size <= 4))
  }

  test("deterministic given the seed") {
    val (train, _) = blockEdges(1)
    val a = new LightGCN(20, 10, epochs = 5, seed = 3).fit(train).recommend(5)
    val b = new LightGCN(20, 10, epochs = 5, seed = 3).fit(train).recommend(5)
    assert(a == b)
  }

  test("different seeds may differ but both remain valid rankings") {
    val (train, _) = blockEdges(1)
    val a = new LightGCN(20, 10, epochs = 5, seed = 3).fit(train).recommend(5)
    val b = new LightGCN(20, 10, epochs = 5, seed = 4).fit(train).recommend(5)
    assert(a.keySet == b.keySet)
  }

  test("training beats the untrained model on ranking quality") {
    val (train, test) = blockEdges(2)
    val untrained = new LightGCN(20, 10, epochs = 0).fit(train)
    val trained = new LightGCN(20, 10, epochs = 40).fit(train)
    val u = Metrics.ndcgAtK(untrained.recommend(5), test, 5)
    val t = Metrics.ndcgAtK(trained.recommend(5), test, 5)
    assert(t >= u - 0.05, s"trained=$t untrained=$u")
  }

  test("feature projection changes the model output") {
    val (train, _) = blockEdges(1)
    val rng = new Random(5)
    val uf = Array.fill(20)(Array.fill(3)(rng.nextGaussian()))
    val itf = Array.fill(10)(Array.fill(3)(rng.nextGaussian()))
    val plain = new LightGCN(20, 10, epochs = 3).fit(train).recommend(5)
    val feat = new LightGCN(20, 10, epochs = 3).fit(train, uf, itf).recommend(5)
    assert(plain != feat)
  }

  test("noise edges degrade ranking quality") {
    val (train, test) = blockEdges(2)
    val rng = new Random(7)
    val noise = Seq.fill(60)((rng.nextInt(20), rng.nextInt(10)))
      .filterNot(e => train.contains(e) || test(e._1).contains(e._2)).distinct
    val clean = new LightGCN(20, 10, epochs = 40).fit(train)
    val noisy = new LightGCN(20, 10, epochs = 40).fit(train ++ noise)
    val pc = Metrics.precisionAtK(clean.recommend(5), test, 5)
    val pn = Metrics.precisionAtK(noisy.recommend(5), test, 5)
    assert(pc >= pn - 0.02, s"clean=$pc noisy=$pn")
  }
}
