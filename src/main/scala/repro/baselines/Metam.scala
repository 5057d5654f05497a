package repro.baselines

import org.apache.spark.sql.DataFrame
import repro.core.TabularTask
import repro.lake.{LakeTable, TabularLake}

/** METAM [Galhotra et al., ICDE'23] — goal-oriented data discovery: greedily
  * join the candidate table that most improves a single task utility, until
  * no candidate helps. METAM-MO is the paper's extension folding multiple
  * measures into one linear weighted utility.
  *
  * Utilities here are the task's *normalized minimized* measures, so
  * "improves" means the utility value decreases.
  */
object Metam {

  /** Single-measure METAM. `utility` is a normalized measure name ("acc",
    * "f1", "mse", ...). Returns the augmented table.
    */
  def run(lake: TabularLake, task: TabularTask, utility: String): DataFrame =
    greedy(lake, task, raw => task.normalize(utility, raw))

  /** METAM-MO: linear weighted sum of all the task's measures. */
  def runMO(lake: TabularLake, task: TabularTask,
            weights: Map[String, Double] = Map.empty): DataFrame =
    greedy(lake, task, raw =>
      task.measureNames.map { m =>
        weights.getOrElse(m, 1.0 / task.measureNames.size) * task.normalize(m, raw)
      }.sum)

  private def greedy(lake: TabularLake, task: TabularTask,
                     score: Map[String, Double] => Double): DataFrame = {
    var current = lake.base.df
    var currentScore = evalScore(task, current, score)
      .getOrElse(Double.MaxValue)
    var remaining: List[LakeTable] =
      (lake.aux ++ lake.distractors).filter(_.df.columns.contains(lake.key)).toList
    var improved = true
    while (improved && remaining.nonEmpty) {
      improved = false
      val scored = remaining.flatMap { t =>
        val joined = current.join(t.df, Seq(lake.key), "left_outer")
        evalScore(task, joined, score).map(s => (t, joined, s))
      }
      if (scored.nonEmpty) {
        val (best, joined, s) = scored.minBy(_._3)
        if (s < currentScore - 1e-9) {
          current = joined
          currentScore = s
          remaining = remaining.filterNot(_.name == best.name)
          improved = true
        }
      }
    }
    current
  }

  private def evalScore(task: TabularTask, df: DataFrame,
                        score: Map[String, Double] => Double): Option[Double] =
    task.evaluate(df).map(r => score(r.raw))
}
