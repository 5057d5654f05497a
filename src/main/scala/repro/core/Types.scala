package repro.core

import scala.collection.immutable.BitSet

/** A normalized performance measure (Section 2): minimized, range (0,1],
  * with optional user bounds [lower, upper]. `lower` also anchors the
  * log-grid of Equation (1).
  */
final case class Measure(name: String, lower: Double = 1e-3, upper: Double = 1.0) {
  require(lower > 0 && lower <= upper, s"measure $name: bad range [$lower,$upper]")
}

/** An FST state: the bitmap L of Algorithm 1 — one bit per optional
  * attribute (column kept) and one bit per value cluster of each segment
  * attribute (rows of that cluster kept). The all-ones state is s_U.
  */
final case class State(bits: BitSet, width: Int) {
  def apply(i: Int): Boolean = bits(i)
  def clear(i: Int): State = copy(bits = bits - i)
  def set(i: Int): State = copy(bits = bits + i)
  def popCount: Int = bits.size

  /** Bitmap as a 0/1 vector — surrogate features and DivMODis' cosine term. */
  def toVector: Array[Double] = Array.tabulate(width)(i => if (bits(i)) 1.0 else 0.0)

  override def toString: String =
    (0 until width).map(i => if (bits(i)) '1' else '0').mkString("L[", "", "]")
}

object State {
  def full(width: Int): State = State(BitSet(0 until width: _*), width)
  def empty(width: Int): State = State(BitSet.empty, width)
}

/** Index layout of the bitmap: attribute bits first, then cluster bits
  * (flattened per segment attribute).
  */
final case class BitLayout(attrs: Vector[String], clusters: Vector[(String, Int)]) {
  val width: Int = attrs.size + clusters.size
  private val attrIdxMap = attrs.zipWithIndex.toMap
  private val clusterIdxMap = clusters.zipWithIndex.map { case (c, i) => (c, attrs.size + i) }.toMap

  def attrIdx(a: String): Int = attrIdxMap(a)
  def clusterIdx(attr: String, c: Int): Int = clusterIdxMap((attr, c))
  def isAttrBit(i: Int): Boolean = i < attrs.size

  /** Attributes kept by a state. */
  def attrsOf(s: State): Vector[String] = attrs.zipWithIndex.collect { case (a, i) if s(i) => a }

  /** Unmasked cluster ids of one segment attribute. */
  def clustersOf(s: State, segAttr: String): Set[Int] =
    clusters.zipWithIndex.collect {
      case ((a, c), i) if a == segAttr && s(attrs.size + i) => c
    }.toSet

  def segAttrs: Vector[String] = clusters.map(_._1).distinct
}

/** Result of exactly evaluating a state's dataset: the raw metric map (what
  * the paper's tables report), the normalized minimized vector (what the
  * search optimizes), and the output size.
  */
final case class EvalResult(raw: Map[String, Double], norm: Array[Double], rows: Int, cols: Int)

/** Output of a MODis run: the ε-skyline entries, plus counters. */
final case class ModisResult(
    skyline: Vector[(State, Array[Double])],
    valuated: Int,
    explored: Int,
    pruned: Int = 0,
) {
  /** Entry with the best (smallest) value of measure index `i`. */
  def bestBy(i: Int): Option[(State, Array[Double])] =
    if (skyline.isEmpty) None else Some(skyline.minBy(_._2(i)))
}

/** Configuration shared by all MODis algorithms (Section 5). */
final case class ModisConfig(
    n: Int = 120,
    eps: Double = 0.1,
    maxl: Int = 6,
    /** index of the decisive measure p_d; -1 = last (paper default) */
    decisive: Int = -1,
    /** diversification size k and balance α (DivMODis) */
    k: Int = 8,
    alpha: Double = 0.5,
    /** Spearman threshold θ of the correlation graph G_C */
    theta: Double = 0.8,
    /** exact valuations used to bootstrap the MO-GBM estimator */
    bootstrap: Int = 25,
    seed: Long = 7,
)
