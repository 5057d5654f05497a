package repro.core

/** The FST exploration interface (Section 3): bitmap states, one-flip
  * transitions (OpGen), exact valuation, and the cheap driver-side size
  * proxy used by the correlation graph. Implementations: [[TabularSpace]]
  * (T1–T4), `repro.graph.GraphSpace` (T5), and the closed-form synthetic
  * space used in unit tests.
  */
trait StateSpace {
  def layout: BitLayout

  /** s_U: the universal (all-ones) start state. */
  def full: State = State.full(layout.width)

  /** s_b: the backward start state (procedure BackSt). */
  def backStart: State

  /** Reduct transitions: every applicable one-flip 1→0 child (OpGen). */
  def neighborsReduct(s: State): Seq[State] =
    (0 until layout.width).filter(s(_)).map(s.clear).filter(admissible)

  /** Augment transitions: every applicable one-flip 0→1 child. */
  def neighborsAugment(s: State): Seq[State] =
    (0 until layout.width).filterNot(s(_)).map(s.set).filter(admissible)

  /** Structural admissibility (cheap, no valuation): at least one feature
    * column and at least one unmasked cluster per segment attribute.
    */
  def admissible(s: State): Boolean =
    layout.attrsOf(s).nonEmpty &&
      layout.segAttrs.forall(a => layout.clustersOf(s, a).nonEmpty)

  /** Exact valuation: materialize and train the task model. None when the
    * dataset is unusable (too small / single-class).
    */
  def evaluate(s: State): Option[EvalResult]

  /** Cheap row-count proxy (no Spark job) — correlation pruning's |D|. */
  def rowCountEstimate(s: State): Long

  /** Surrogate input features for a state: bitmap ++ [row fraction, column
    * fraction] (the estimator learns performance from these).
    */
  def features(s: State): Array[Double] = {
    val fullRows = math.max(1L, rowCountEstimate(full))
    s.toVector ++ Array(
      rowCountEstimate(s).toDouble / fullRows,
      layout.attrsOf(s).size.toDouble / math.max(1, layout.attrs.size))
  }

  /** The measure set P (normalized, minimized). */
  def measures: Vector[Measure]
}

/** T1–T4 state space over a universal table. */
final class TabularSpace(val universal: UniversalTable, val task: TabularTask) extends StateSpace {
  override def layout: BitLayout = universal.layout
  override def measures: Vector[Measure] = task.measures

  /** BackSt: the base table's own attributes plus, per segment attribute,
    * greedily unmasked clusters until every target class is covered — the
    * paper's minimal class-covering sample.
    */
  override lazy val backStart: State = {
    val baseAttrs = task.lake.base.df.columns
      .filter(layout.attrs.contains).toSet
    var s = State.empty(layout.width)
    for (a <- layout.attrs.indices if baseAttrs.contains(layout.attrs(a))) s = s.set(a)
    // unmask the largest cluster of each segment attribute first
    for (seg <- layout.segAttrs) {
      val sizes = (0 until universal.clusterings(seg).k).map { c =>
        c -> universal.segCounts.collect {
          case (combo, n) if combo(layout.segAttrs.indexOf(seg)) == c => n
        }.sum
      }
      val biggest = sizes.maxBy(_._2)._1
      s = s.set(layout.clusterIdx(seg, biggest))
    }
    // grow until the materialized sample trains (class coverage + min rows)
    var frontier = s
    var ok = evaluate(frontier).isDefined
    val remaining = scala.collection.mutable.Queue.from(
      layout.clusters.indices.map(_ + layout.attrs.size).filterNot(frontier(_)))
    while (!ok && remaining.nonEmpty) {
      frontier = frontier.set(remaining.dequeue())
      ok = evaluate(frontier).isDefined
    }
    frontier
  }

  // Memoized across valuators: several MODis variants revisit the same
  // states in a comparison run; model fits are deterministic so caching is
  // sound.
  private val memo = scala.collection.mutable.HashMap.empty[State, Option[EvalResult]]

  override def evaluate(s: State): Option[EvalResult] =
    memo.getOrElseUpdate(s, task.evaluate(universal.materialize(s)))

  override def rowCountEstimate(s: State): Long = universal.rowCount(s)
}
