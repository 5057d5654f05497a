package repro.baselines

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.lake.{LakeTable, TabularLake}
import repro.util.Stats

/** Starmie [Fan et al., VLDB'23] stand-in — table-union/join search by
  * column-content similarity, *without* model feedback. The original uses
  * contrastive column embeddings; we sketch each numeric column as a
  * quantile histogram + moments and rank candidate tables by their best
  * column-to-column cosine similarity against the query (base) table,
  * joining every candidate above a similarity threshold. This preserves the
  * behaviour the paper's comparison relies on: Starmie augments aggressively
  * on content similarity and so inherits noise columns too.
  */
object Starmie {

  val Bins = 10

  /** Sketch of one column: normalized quantile histogram ++ scaled moments. */
  def columnSketch(df: DataFrame, column: String): Array[Double] = {
    val vals = df.select(col(column).cast("double")).na.drop().collect().map(_.getDouble(0))
    if (vals.isEmpty) return new Array[Double](Bins + 2)
    val sorted = vals.sorted
    def q(p: Double): Double = sorted(((sorted.length - 1) * p).toInt)
    val lo = q(0.01); val hi = q(0.99)
    val width = math.max(hi - lo, 1e-9)
    val hist = new Array[Double](Bins)
    vals.foreach { v =>
      val b = math.min(Bins - 1, math.max(0, ((v - lo) / width * Bins).toInt))
      hist(b) += 1.0
    }
    val n = vals.length.toDouble
    val m = Stats.mean(vals)
    val sd = math.sqrt(Stats.variance(vals))
    hist.map(_ / n) ++ Array(m / (math.abs(m) + sd + 1e-9), sd / (sd + math.abs(m) + 1e-9))
  }

  /** Best column-pair cosine similarity between two tables. */
  def tableSimilarity(a: DataFrame, b: DataFrame, skip: Set[String]): Double = {
    val aCols = a.columns.filterNot(skip.contains)
    val bCols = b.columns.filterNot(skip.contains)
    if (aCols.isEmpty || bCols.isEmpty) return 0.0
    val aS = aCols.map(columnSketch(a, _))
    val bS = bCols.map(columnSketch(b, _))
    aS.flatMap(sa => bS.map(sb => Stats.cosine(sa, sb))).max
  }

  /** Rank candidates by similarity to the base table; join every joinable
    * candidate with similarity ≥ `threshold`.
    */
  def run(lake: TabularLake, threshold: Double = 0.5): DataFrame = {
    val skip = Set(lake.key, lake.target)
    val ranked: Seq[(LakeTable, Double)] =
      (lake.aux ++ lake.distractors).map { t =>
        t -> tableSimilarity(lake.base.df, t.df, skip)
      }.sortBy(-_._2)
    ranked.foldLeft(lake.base.df) { case (acc, (t, sim)) =>
      if (sim >= threshold && t.df.columns.contains(lake.key))
        acc.join(t.df, Seq(lake.key), "left_outer")
      else acc
    }
  }
}
