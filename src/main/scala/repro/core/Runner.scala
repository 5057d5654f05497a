package repro.core

import org.apache.spark.sql.SparkSession
import repro.baselines.{FeatureSelect, Metam, Starmie}
import repro.graph.GraphSpace
import repro.lake.{DataLake, GraphLake, TabularLake}

/** One row of a comparison table: actual (model-inference) metrics of a
  * method's output dataset plus its size — the paper's reporting protocol
  * ("We apply model inference to all the output tables to report actual
  * performance values").
  */
final case class MethodReport(method: String, raw: Map[String, Double],
                              rows: Long, cols: Int, seconds: Double)

/** Orchestrates the full per-task comparison of Tables 4–6: Original +
  * 5 baselines + 4 MODis variants on tabular tasks; Original + 4 MODis
  * variants on the T5 graph task.
  */
object Runner {

  def lakeByName(spark: SparkSession, name: String, sf: Double): TabularLake = name match {
    case "movie"   => DataLake.movie(spark, sf)
    case "house"   => DataLake.house(spark, sf)
    case "avocado" => DataLake.avocado(spark, sf)
    case "mental"  => DataLake.mental(spark, sf)
    case other     => throw new IllegalArgumentException(s"unknown lake $other")
  }

  /** The measure each task's winner is selected by (Section 6, Exp-1). */
  def primaryMeasure(lakeName: String): String = lakeName match {
    case "movie" => "acc"
    case "house" => "f1"
    case "avocado" => "mse"
    case "mental" => "acc"
    case other => throw new IllegalArgumentException(s"unknown lake $other")
  }

  /** Run the full tabular comparison for one task. */
  def tabularComparison(spark: SparkSession, lakeName: String, sf: Double,
                        cfg: ModisConfig = ModisConfig()): Vector[MethodReport] = {
    val lake = lakeByName(spark, lakeName, sf)
    val universal = Universal.build(lake)
    val task0 = TabularTask.forLake(lake)
    val task = task0.calibrated(universal.materialize(State.full(universal.layout.width)))
    val space = new TabularSpace(universal, task)
    val primary = primaryMeasure(lakeName)
    val primaryIdx = task.measureNames.indexOf(primary)
    require(primaryIdx >= 0, s"primary measure $primary not in ${task.measureNames}")

    def timed[A](f: => A): (A, Double) = {
      val t0 = System.nanoTime()
      val a = f
      (a, (System.nanoTime() - t0) / 1e9)
    }

    def reportDf(name: String, df: org.apache.spark.sql.DataFrame, secs: Double): MethodReport = {
      val r = task.evaluate(df).getOrElse(
        throw new IllegalStateException(s"$name produced an unusable table for $lakeName"))
      MethodReport(name, r.raw, r.rows, r.cols, secs)
    }

    val original = reportDf("Original", universal.df.drop(
      universal.layout.segAttrs.map(universal.hiddenCol): _*), 0.0)

    val baselines = Vector(
      { val (df, t) = timed(Metam.run(lake, task, primary)); reportDf("METAM", df, t) },
      { val (df, t) = timed(Metam.runMO(lake, task)); reportDf("METAM-MO", df, t) },
      { val (df, t) = timed(Starmie.run(lake)); reportDf("Starmie", df, t) },
      { val (df, t) = timed(FeatureSelect.skSFM(universal.materialize(space.full), task))
        reportDf("SkSFM", df, t) },
      { val (df, t) = timed(FeatureSelect.h2o(universal.materialize(space.full), task))
        reportDf("H2O", df, t) },
    )

    val modis = modisReports(() => new TabularSpace(universal, task), cfg, primaryIdx)
    original +: (baselines ++ modis)
  }

  /** The four MODis variants, each on a fresh state space so per-method
    * discovery time is honest (no cross-method evaluation cache).
    */
  def modisReports(spaceFactory: () => StateSpace, cfg: ModisConfig,
                   primaryIdx: Int): Vector[MethodReport] = {
    val algos: Vector[(String, (StateSpace, Valuator, ModisConfig) => ModisResult)] = Vector(
      ("ApxMODis", ApxMODis.run), ("NOBiMODis", NOBiMODis.run),
      ("BiMODis", BiMODis.run), ("DivMODis", DivMODis.run))
    algos.map { case (name, run) =>
      val space = spaceFactory()
      val valuator = new SurrogateValuator(space, cfg.bootstrap)
      val t0 = System.nanoTime()
      val result = run(space, valuator, cfg)
      val secs = (System.nanoTime() - t0) / 1e9
      val best = result.bestBy(primaryIdx).getOrElse(
        throw new IllegalStateException(s"$name produced an empty skyline"))
      val exact = valuator.exact(best._1).getOrElse(
        // estimated winner unusable in reality: fall back to any valuated entry
        result.skyline.iterator.flatMap(e => valuator.exact(e._1)).next())
      MethodReport(name, exact.raw, exact.rows, exact.cols, secs)
    }
  }

  /** Table 5: MODis methods on the T5 graph task (plus the full graph as
    * "Original").
    */
  def graphComparison(sf: Double, cfg: ModisConfig = ModisConfig()): Vector[MethodReport] = {
    val lake = GraphLake.generate(sf)
    val probe = new GraphSpace(lake)
    val full = probe.evaluate(probe.full).getOrElse(
      throw new IllegalStateException("full graph unusable"))
    val original = MethodReport("Original", full.raw, full.rows, full.cols, 0.0)
    original +: modisReports(() => new GraphSpace(lake), cfg, primaryIdx = 0 /* pc5 */)
  }

  /** Render a comparison as an aligned text table (rows = metrics, columns
    * = methods) in the shape of the paper's Tables 4–6.
    */
  def formatTable(title: String, metricKeys: Seq[(String, String)],
                  reports: Seq[MethodReport]): String = {
    val sb = new StringBuilder
    sb.append(s"== $title ==\n")
    val header = ("Metric" +: reports.map(_.method)).map(c => f"$c%12s").mkString(" | ")
    sb.append(header).append('\n')
    sb.append("-" * header.length).append('\n')
    for ((key, label) <- metricKeys) {
      val cells = reports.map(r => r.raw.get(key).map(v => f"$v%12.4f").getOrElse(f"${"-"}%12s"))
      sb.append((f"$label%12s" +: cells).mkString(" | ")).append('\n')
    }
    val sizes = reports.map(r => f"${s"(${r.rows},${r.cols})"}%12s")
    sb.append((f"${"Output Size"}%12s" +: sizes).mkString(" | ")).append('\n')
    val secs = reports.map(r => f"${r.seconds}%12.2f")
    sb.append((f"${"Gen sec"}%12s" +: secs).mkString(" | ")).append('\n')
    sb.toString
  }
}
