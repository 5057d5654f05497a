package repro.core

import repro.util.Stats
import scala.collection.mutable
import scala.util.Random

/** Shared level-wise search engine behind the four MODis algorithms
  * (Section 5): ApxMODis (forward reduct-only), NOBiMODis (bi-directional,
  * no pruning), BiMODis (bi-directional + correlation-based pruning), and
  * DivMODis (bi-directional + per-level diversification).
  */
final class ModisEngine(
    space: StateSpace,
    valuator: Valuator,
    cfg: ModisConfig,
    bidirectional: Boolean,
    pruning: Boolean,
    diversifying: Boolean,
) {
  private val grid = new SkylineGrid(space.measures, cfg.eps, cfg.decisive)
  private val rng = new Random(cfg.seed)
  private var prunedCount = 0
  private var explored = 0
  private var seqCounter = 0L

  /** Frontier entry: the "path length" framing of Section 5.1 — states with
    * the smallest aggregate estimated performance are expanded first
    * ("extend shortest paths by prioritizing the valuation of datasets
    * towards user-defined upper bounds"). Ties break FIFO for determinism.
    */
  private final case class Entry(s: State, lvl: Int, priority: Double, seq: Long)
  private implicit val entryOrd: Ordering[Entry] =
    Ordering.by[Entry, (Double, Long)](e => (e.priority, e.seq)).reverse

  private def push(q: mutable.PriorityQueue[Entry], s: State, lvl: Int, p: Array[Double]): Unit = {
    q.enqueue(Entry(s, lvl, p.sum, seqCounter))
    seqCounter += 1
  }

  def run(): ModisResult = {
    val visitedF = mutable.Set.empty[State]
    val visitedB = mutable.Set.empty[State]
    val qf = mutable.PriorityQueue.empty[Entry]
    val qb = mutable.PriorityQueue.empty[Entry]

    val sU = space.full
    visitedF += sU
    valuator.valuate(sU).foreach { p => grid.offer(sU, p); push(qf, sU, 0, p) }

    if (bidirectional) {
      val sb = space.backStart
      visitedB += sb
      valuator.valuate(sb).foreach { p => grid.offer(sb, p); push(qb, sb, 0, p) }
    }

    var level = 0
    var pathFormed = false
    while ((qf.nonEmpty || qb.nonEmpty) && valuator.count < cfg.n && !pathFormed) {
      if (qf.nonEmpty) {
        val lvl = step(qf, visitedF, forward = true)
        if (diversifying && lvl > level) { level = lvl; trimDiverse() }
      }
      if (bidirectional && qb.nonEmpty && valuator.count < cfg.n)
        step(qb, visitedB, forward = false)
      // "a path is formed": a state reached from both frontiers
      pathFormed = bidirectional && visitedF.exists(visitedB.contains)
    }
    if (diversifying) trimDiverse()
    ModisResult(grid.entries, valuator.count, explored, prunedCount)
  }

  /** Expand one frontier state; returns the level of the dequeued state. */
  private def step(q: mutable.PriorityQueue[Entry], visited: mutable.Set[State],
                   forward: Boolean): Int = {
    val Entry(s, lvl, _, _) = q.dequeue()
    if (lvl >= cfg.maxl) return lvl
    val children = if (forward) space.neighborsReduct(s) else space.neighborsAugment(s)
    val it = children.iterator
    while (it.hasNext && valuator.count < cfg.n) {
      val c = it.next()
      if (!visited.contains(c)) {
        visited += c
        explored += 1
        if (pruning && canPrune(c)) prunedCount += 1
        else valuator.valuate(c) match {
          case Some(p) =>
            grid.offer(c, p)
            push(q, c, lvl + 1, p)
          case None => () // unusable dataset; dead end
        }
      }
    }
    lvl
  }

  /** Correlation-based pruning (Section 5.3 / Lemma 4): parameterize every
    * measure of the candidate from its |D| proxy via the Spearman
    * correlation graph over the records T; prune when a valuated skyline
    * state parameterized-ε-dominates the candidate's optimistic bounds.
    */
  private def canPrune(s: State): Boolean = {
    val recs = valuator.records
    if (recs.length < 8 || grid.size == 0) return false
    val sizes = recs.map(r => space.rowCountEstimate(r._1).toDouble).toArray
    val mySize = space.rowCountEstimate(s).toDouble
    val d = space.measures.length
    val lows = new Array[Double](d)
    var i = 0
    while (i < d) {
      val ps = recs.map(_._2(i)).toArray
      if (math.abs(Stats.spearman(sizes, ps)) < cfg.theta) return false
      // optimistic bound from the 3 records nearest in size (Example 6)
      val near = recs.indices.sortBy(j => math.abs(sizes(j) - mySize)).take(3)
      lows(i) = near.map(ps).min
      i += 1
    }
    grid.entries.exists { case (_, e) =>
      (0 until d).forall(j => e(j) <= (1 + cfg.eps) * lows(j))
    }
  }

  /** DivMODis' per-level greedy swap (Algorithm 3): keep at most k skyline
    * entries maximizing the submodular diversification score div (Eq. 2).
    */
  private def trimDiverse(): Unit = {
    val pool = grid.entries
    if (pool.size <= cfg.k) return
    val kept = ModisEngine.diversify(pool, cfg.k, cfg.alpha, rng)
    grid.retain(kept.map(_._1).toSet)
  }
}

object ModisEngine {

  /** Pairwise distance of Eq. 2: α·(1−cos(L_i,L_j))/2 + (1−α)·euc/euc_m. */
  def dis(a: (State, Array[Double]), b: (State, Array[Double]),
          alpha: Double, eucMax: Double): Double =
    alpha * (1 - Stats.cosine(a._1.toVector, b._1.toVector)) / 2.0 +
      (1 - alpha) * Stats.euclid(a._2, b._2) / eucMax

  def div(set: Seq[(State, Array[Double])], alpha: Double, eucMax: Double): Double = {
    var s = 0.0
    for (i <- set.indices; j <- i + 1 until set.size) s += dis(set(i), set(j), alpha, eucMax)
    s
  }

  /** Greedy selection-and-replace k-subset maximizing div (¼-approximation
    * per Lemma 5).
    */
  def diversify(pool: Vector[(State, Array[Double])], k: Int, alpha: Double,
                rng: Random): Vector[(State, Array[Double])] = {
    if (pool.size <= k) return pool
    val eucMax = {
      var m = 1e-9
      for (i <- pool.indices; j <- i + 1 until pool.size)
        m = math.max(m, Stats.euclid(pool(i)._2, pool(j)._2))
      m
    }
    var cur = rng.shuffle(pool).take(k)
    var score = div(cur, alpha, eucMax)
    var improved = true
    var passes = 0
    while (improved && passes < 40) {
      improved = false
      passes += 1
      // evaluate all swaps against the *current* set, apply the best one —
      // mutating cur mid-scan would let stale `out` values grow the set
      var best: Option[((State, Array[Double]), (State, Array[Double]), Double)] = None
      for (out <- cur; in <- pool if !cur.contains(in)) {
        val s = div(cur.filterNot(_ == out) :+ in, alpha, eucMax)
        if (s > score + 1e-12 && best.forall(_._3 < s)) best = Some((out, in, s))
      }
      best.foreach { case (out, in, s) =>
        cur = cur.filterNot(_ == out) :+ in
        score = s
        improved = true
      }
    }
    cur
  }
}

/** Algorithm 1 — "reduce-from-universal" (N,ε)-approximation. */
object ApxMODis {
  def run(space: StateSpace, valuator: Valuator, cfg: ModisConfig): ModisResult =
    new ModisEngine(space, valuator, cfg, bidirectional = false, pruning = false,
      diversifying = false).run()
}

/** Algorithm 2 without correlation-based pruning (the paper's NOBiMODis). */
object NOBiMODis {
  def run(space: StateSpace, valuator: Valuator, cfg: ModisConfig): ModisResult =
    new ModisEngine(space, valuator, cfg, bidirectional = true, pruning = false,
      diversifying = false).run()
}

/** Algorithm 2 — bi-directional search with correlation-based pruning. */
object BiMODis {
  def run(space: StateSpace, valuator: Valuator, cfg: ModisConfig): ModisResult =
    new ModisEngine(space, valuator, cfg, bidirectional = true, pruning = true,
      diversifying = false).run()
}

/** Algorithm 3 — diversified skyline generation over the bi-directional
  * search.
  */
object DivMODis {
  def run(space: StateSpace, valuator: Valuator, cfg: ModisConfig): ModisResult =
    new ModisEngine(space, valuator, cfg, bidirectional = true, pruning = false,
      diversifying = true).run()
}
