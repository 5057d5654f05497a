package repro.core

/** Dominance machinery (Section 4) and the ε-skyline grid of Equation (1)
  * with the UPareto replacement rule (Algorithm 1).
  */
object Pareto {

  /** Strict Pareto dominance for minimized vectors: a ≼ everywhere and < in
    * at least one coordinate ⇒ a dominates b.
    */
  def dominates(a: Array[Double], b: Array[Double]): Boolean = {
    require(a.length == b.length, "dominates: arity mismatch")
    var strict = false
    var i = 0
    while (i < a.length) {
      if (a(i) > b(i)) return false
      if (a(i) < b(i)) strict = true
      i += 1
    }
    strict
  }

  /** ε-dominance (Section 5.1): a.p ≤ (1+ε)·b.p for all p, and a.p* ≤ b.p*
    * for some decisive p*.
    */
  def epsDominates(a: Array[Double], b: Array[Double], eps: Double): Boolean = {
    var decisive = false
    var i = 0
    while (i < a.length) {
      if (a(i) > (1 + eps) * b(i)) return false
      if (a(i) <= b(i)) decisive = true
      i += 1
    }
    decisive
  }

  /** O(n²) skyline (indices of non-dominated points) — reference oracle. */
  def skyline(points: IndexedSeq[Array[Double]]): Set[Int] =
    points.indices.filter { i =>
      !points.indices.exists(j => j != i && dominates(points(j), points(i)))
    }.toSet

  /** Kung's divide-and-conquer maxima algorithm (Theorem 1's exact
    * optimizer), adapted to minimization. Returns indices of the skyline.
    */
  def kungSkyline(points: IndexedSeq[Array[Double]]): Set[Int] = {
    if (points.isEmpty) return Set.empty
    implicit val seqOrd: Ordering[Seq[Double]] = Ordering.Implicits.seqOrdering
    val order = points.indices.sortBy(i => (points(i).toSeq: Seq[Double], i))
    def solve(idx: IndexedSeq[Int]): IndexedSeq[Int] = {
      if (idx.length <= 1) return idx
      val (front, back) = idx.splitAt(idx.length / 2)
      val s1 = solve(front)
      val s2 = solve(back)
      // points in s2 survive unless dominated by a survivor of s1
      s1 ++ s2.filterNot(j => s1.exists(i => dominates(points(i), points(j))))
    }
    // Lexicographic order guarantees every dominator sorts strictly earlier
    // than the point it dominates, so the front half shields the back half.
    solve(order).toSet
  }

  /** Equation (1): the discretized (|P|−1)-ary grid position of a vector,
    * skipping the decisive measure.
    */
  def pos(p: Array[Double], measures: Vector[Measure], eps: Double, decisiveIdx: Int): Vector[Int] = {
    require(p.length == measures.length, "pos: arity mismatch")
    measures.indices.collect {
      case i if i != decisiveIdx =>
        math.floor(math.log(math.max(p(i), measures(i).lower) / measures(i).lower) /
          math.log(1 + eps)).toInt
    }.toVector
  }
}

/** The ε-skyline container: one representative per grid cell, replaced when
  * a newcomer wins on the decisive measure (procedure UPareto).
  */
final class SkylineGrid(measures: Vector[Measure], eps: Double, decisiveIdx0: Int = -1) {
  val decisiveIdx: Int = if (decisiveIdx0 < 0) measures.length - 1 else decisiveIdx0
  private val cells = scala.collection.mutable.LinkedHashMap.empty[Vector[Int], (State, Array[Double])]

  /** UPareto: reject if any upper bound is violated; otherwise insert or
    * replace the cell occupant when the newcomer's decisive measure is
    * strictly better. Returns true iff the state entered the skyline.
    */
  def offer(s: State, perf: Array[Double]): Boolean = {
    var i = 0
    while (i < perf.length) {
      if (perf(i) > measures(i).upper) return false
      i += 1
    }
    val key = Pareto.pos(perf, measures, eps, decisiveIdx)
    cells.get(key) match {
      case None => cells(key) = (s, perf); true
      case Some((_, old)) if perf(decisiveIdx) < old(decisiveIdx) =>
        cells(key) = (s, perf); true
      case _ => false
    }
  }

  def entries: Vector[(State, Array[Double])] = cells.values.toVector
  def size: Int = cells.size

  /** Restrict the grid to the given states (DivMODis' per-level trim). */
  def retain(keep: Set[State]): Unit = {
    val drop = cells.collect { case (k, (s, _)) if !keep.contains(s) => k }
    drop.foreach(cells.remove)
  }
}
