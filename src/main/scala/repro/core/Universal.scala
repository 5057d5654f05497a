package repro.core

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.lake.TabularLake
import repro.util.KMeans1D

/** The universal table D_U (Section 5.1 "Reduce-from-Universal"): the
  * multi-way join of all sources over the shared key, with per-segment-
  * attribute active-domain clustering (1-D k-means, Section 6) materialized
  * as hidden `__cl_<attr>` columns so reduct literals become cheap cluster
  * filters.
  */
final case class UniversalTable(
    df: DataFrame,
    key: String,
    target: String,
    layout: BitLayout,
    clusterings: Map[String, KMeans1D.Clustering],
    /** row counts per (cluster-id per segment attr, in layout.segAttrs order) —
      * a driver-side contingency table giving any state's row count for free
      * (used by BiMODis' correlation-based pruning).
      */
    segCounts: Map[Vector[Int], Long],
) {
  def hiddenCol(segAttr: String): String = s"__cl_$segAttr"

  /** Materialize a state's dataset: key + target + kept attributes, rows
    * restricted to unmasked segment clusters. Hidden columns are dropped.
    */
  def materialize(s: State): DataFrame = {
    val attrs = layout.attrsOf(s)
    val cols = (key +: target +: attrs).map(col)
    df.filter(rowPredicate(s)).select(cols: _*)
  }

  /** Row predicate of a state over D_U (cluster membership per segment). */
  def rowPredicate(s: State): Column =
    layout.segAttrs.foldLeft(lit(true)) { (acc, seg) =>
      val allowed = layout.clustersOf(s, seg)
      val total = clusterings(seg).k
      if (allowed.size == total) acc
      else if (allowed.isEmpty) acc && lit(false)
      else acc && col(hiddenCol(seg)).isin(allowed.toSeq: _*)
    }

  /** Exact row count of a state's dataset, from the contingency table. */
  def rowCount(s: State): Long = {
    val segs = layout.segAttrs
    segCounts.iterator.collect {
      case (combo, c) if segs.indices.forall(i => layout.clustersOf(s, segs(i)).contains(combo(i))) => c
    }.sum
  }
}

object Universal {

  /** Build D_U for a tabular lake: left-outer join every aux table onto the
    * base over the key (preserving every labelled row — the supervised
    * variant of the paper's outer-join universal table), then cluster each
    * segment attribute's active domain into at most `maxK` literals.
    */
  def build(lake: TabularLake, maxK: Int = 6): UniversalTable = {
    var df = lake.base.df
    for (t <- lake.aux) df = df.join(t.df, Seq(lake.key), "left_outer")

    val segAttrs = lake.segmentAttrs.toVector
    val clusterings = segAttrs.map { a =>
      val values = df.select(col(a)).na.drop().collect().map(_.getDouble(0))
      a -> KMeans1D.fit(values, maxK)
    }.toMap

    // hidden cluster-id columns via boundary CASE chains (pure Catalyst)
    for (a <- segAttrs) {
      val cl = clusterings(a)
      val expr = cl.boundaries.zipWithIndex.foldRight(lit(cl.k - 1): Column) {
        case ((b, i), acc) => when(col(a) <= b, i).otherwise(acc)
      }
      df = df.withColumn(s"__cl_$a", expr.cast("int"))
    }
    val cached = df.cache()
    cached.count() // force

    val attrs = (lake.base.df.columns ++ lake.aux.flatMap(_.df.columns))
      .distinct.filterNot(c => c == lake.key || c == lake.target).toVector
    val clusterBits = segAttrs.flatMap(a => (0 until clusterings(a).k).map(c => (a, c)))
    val layout = BitLayout(attrs, clusterBits)

    val countRows = cached
      .groupBy(segAttrs.map(a => col(s"__cl_$a")): _*)
      .count()
      .collect()
    val segCounts = countRows.map { r =>
      (segAttrs.indices.map(i => r.getInt(i)).toVector, r.getLong(segAttrs.size))
    }.toMap

    UniversalTable(cached, lake.key, lake.target, layout, clusterings, segCounts)
  }
}
