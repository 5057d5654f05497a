package repro.lake

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import scala.util.Random

/** A named source table of a data lake. */
final case class LakeTable(name: String, df: DataFrame)

/** One task's corner of a synthetic data lake: a labelled base table,
  * joinable auxiliary tables (carrying informative and pure-noise columns),
  * and non-joinable distractor tables (for the union-search baseline to
  * reject). Substitutes the paper's Kaggle/OpenData/HF corpora — see
  * DESIGN.md §2.
  */
final case class TabularLake(
    name: String,
    key: String,
    target: String,
    base: LakeTable,
    aux: Seq[LakeTable],
    distractors: Seq[LakeTable],
    /** Attributes whose value clusters drive row masking (reduct literals). */
    segmentAttrs: Seq[String],
    classification: Boolean,
    /** Ground truth, for tests: which attributes carry signal vs noise. */
    informativeAttrs: Set[String],
    noiseAttrs: Set[String],
) {
  def allSources: Seq[LakeTable] = base +: aux
  def featureAttrs: Seq[String] =
    allSources.flatMap(_.df.columns).distinct.filterNot(c => c == key || c == target)
}

/** Deterministic generators for the five task lakes (T1–T4 tabular; T5 is
  * in [[GraphLake]]). Row counts follow the paper's universal-table sizes,
  * scaled by `sf` (sf=0.1 approximates the paper scale, capped at 8000 rows
  * so driver-side model fits stay in milliseconds; documented substitution).
  */
object DataLake {

  final case class Params(
      name: String,
      paperRows: Int,
      nInformative: Int,
      nNoise: Int,
      /** cluster counts of the two segment attributes */
      segK: (Int, Int),
      /** clusters of segment attr 0 that carry heavy label noise */
      noisySegs: Set[Int],
      classification: Boolean,
      flipProb: Double = 0.45,
      noiseSigma: Double = 3.0,
      seed: Long = 42,
  )

  /** T1 — Kaggle "movie gross" regression (GBM model). */
  def movie(spark: SparkSession, sf: Double = 0.01): TabularLake =
    generic(spark, Params("movie", 3732, nInformative = 5, nNoise = 4,
      segK = (4, 3), noisySegs = Set(0), classification = false, seed = 101), sf)

  /** T2 — OpenData "house price" classification (Random Forest model). */
  def house(spark: SparkSession, sf: Double = 0.01): TabularLake =
    generic(spark, Params("house", 1178, nInformative = 10, nNoise = 12,
      segK = (5, 4), noisySegs = Set(0, 1), classification = true, seed = 202), sf)

  /** T3 — HF "avocado price" regression (linear model). */
  def avocado(spark: SparkSession, sf: Double = 0.01): TabularLake =
    generic(spark, Params("avocado", 18249, nInformative = 6, nNoise = 4,
      segK = (5, 3), noisySegs = Set(0), classification = false, seed = 303), sf)

  /** T4 — Kaggle "mental health" classification (LightGBM stand-in: GBM). */
  def mental(spark: SparkSession, sf: Double = 0.01): TabularLake =
    generic(spark, Params("mental", 140700, nInformative = 8, nNoise = 9,
      segK = (5, 4), noisySegs = Set(0), classification = true, seed = 404), sf)

  def rowsAt(paperRows: Int, sf: Double): Int =
    math.min(8000, math.max(200, (paperRows * sf * 10).toInt))

  /** Build one lake: latent informative features produce the target; noisy
    * segment clusters corrupt labels; features are scattered over the base
    * and three auxiliary tables (one of them pure noise); plus distractors.
    */
  def generic(spark: SparkSession, p: Params, sf: Double): TabularLake = {
    val rng = new Random(p.seed)
    val n = rowsAt(p.paperRows, sf)
    val key = "id"; val target = "target"

    val infNames = (1 to p.nInformative).map(i => s"inf_$i")
    val nzNames  = (1 to p.nNoise).map(i => s"nz_$i")
    val segNames = Seq("seg_quality", "seg_region")

    // decaying magnitudes: a handful of strong features carry most of the
    // signal (tree models can then actually learn it), the tail contributes
    // marginally; alternate signs so the combination is not one-sided
    val w = infNames.indices.map(j => (0.8 + 0.4 * rng.nextDouble()) * math.pow(0.72, j)).toArray
    for (j <- w.indices if j % 2 == 1) w(j) = -w(j)

    val inf = Array.fill(n)(Array.fill(p.nInformative)(rng.nextGaussian()))
    val nz  = Array.fill(n)(Array.fill(p.nNoise)(rng.nextGaussian()))
    val segQCluster = Array.fill(n)(rng.nextInt(p.segK._1))
    val segRCluster = Array.fill(n)(rng.nextInt(p.segK._2))
    // well-separated cluster values so 1-D k-means recovers the partition
    val segQ = segQCluster.map(c => c * 2.0 + rng.nextDouble() * 0.9)
    val segR = segRCluster.map(c => c * 2.0 + rng.nextDouble() * 0.9)

    val score = Array.tabulate(n) { i =>
      var s = 0.0
      var j = 0
      while (j < p.nInformative) { s += w(j) * inf(i)(j); j += 1 }
      s
    }
    val y = Array.tabulate(n) { i =>
      val noisy = p.noisySegs.contains(segQCluster(i))
      if (p.classification) {
        val clean = if (score(i) + rng.nextGaussian() * 0.3 > 0) 1.0 else 0.0
        if (noisy && rng.nextDouble() < p.flipProb) 1.0 - clean else clean
      } else {
        score(i) + rng.nextGaussian() * 0.3 +
          (if (noisy) rng.nextGaussian() * p.noiseSigma else 0.0)
      }
    }

    // Column layout: base holds 2 informative + both segments; the rest of
    // the informative and noise columns round-robin into aux1/aux2; aux3 is
    // pure noise.
    val baseInf = infNames.take(2)
    val restInf = infNames.drop(2)
    val aux1Inf = restInf.zipWithIndex.collect { case (c, i) if i % 2 == 0 => c }
    val aux2Inf = restInf.zipWithIndex.collect { case (c, i) if i % 2 == 1 => c }
    val aux1Nz = nzNames.zipWithIndex.collect { case (c, i) if i % 3 == 0 => c }
    val aux2Nz = nzNames.zipWithIndex.collect { case (c, i) if i % 3 == 1 => c }
    val aux3Nz = nzNames.zipWithIndex.collect { case (c, i) if i % 3 == 2 => c }

    def col(name: String): Int => Double = name match {
      case s if s.startsWith("inf_") => i => inf(i)(s.stripPrefix("inf_").toInt - 1)
      case s if s.startsWith("nz_")  => i => nz(i)(s.stripPrefix("nz_").toInt - 1)
      case "seg_quality"             => i => segQ(i)
      case "seg_region"              => i => segR(i)
    }

    def mkTable(name: String, cols: Seq[String], coverage: Double,
                withTarget: Boolean, covSeed: Long): LakeTable = {
      val covRng = new Random(p.seed ^ covSeed)
      val ids = (0 until n).filter(_ => covRng.nextDouble() < coverage)
      val fields = StructField(key, LongType, nullable = false) +:
        (if (withTarget) Seq(StructField(target, DoubleType, nullable = false)) else Nil) ++:
        cols.map(c => StructField(c, DoubleType, nullable = false))
      val rows = ids.map { i =>
        Row.fromSeq(i.toLong +: (if (withTarget) Seq(y(i)) else Nil) ++: cols.map(c => col(c)(i)))
      }
      LakeTable(name, spark.createDataFrame(
        spark.sparkContext.parallelize(rows.toSeq, 4), StructType(fields.toArray)))
    }

    val base = mkTable(s"${p.name}_base", segNames ++ baseInf, coverage = 1.0,
      withTarget = true, covSeed = 1)
    val aux = Seq(
      mkTable(s"${p.name}_aux1", aux1Inf ++ aux1Nz, coverage = 0.92, withTarget = false, covSeed = 2),
      mkTable(s"${p.name}_aux2", aux2Inf ++ aux2Nz, coverage = 0.88, withTarget = false, covSeed = 3),
      mkTable(s"${p.name}_junk", aux3Nz, coverage = 1.0, withTarget = false, covSeed = 4),
    ).filter(_.df.columns.length > 1)

    val distractors = (1 to 3).map { d =>
      val dn = 50 + rng.nextInt(100)
      val cols = (1 to 2 + rng.nextInt(3)).map(c => s"${p.name}_d${d}_c$c")
      val fields = StructField("code", LongType, nullable = false) +:
        cols.map(c => StructField(c, DoubleType, nullable = false))
      val drng = new Random(p.seed + 1000 + d)
      val rows = (0 until dn).map { i =>
        Row.fromSeq(drng.nextInt(100000).toLong +: cols.map(_ => drng.nextDouble() * 1000))
      }
      LakeTable(s"${p.name}_distractor$d", spark.createDataFrame(
        spark.sparkContext.parallelize(rows, 2), StructType(fields.toArray)))
    }

    TabularLake(
      name = p.name, key = key, target = target,
      base = base, aux = aux, distractors = distractors,
      segmentAttrs = segNames,
      classification = p.classification,
      informativeAttrs = infNames.toSet,
      noiseAttrs = nzNames.toSet,
    )
  }

  /** Corpus-level stats for Table 2: (#tables, #columns, #rows) over a set
    * of lakes (sources + distractors).
    */
  def corpusStats(lakes: Seq[TabularLake]): (Int, Long, Long) = {
    val tables = lakes.flatMap(l => l.allSources ++ l.distractors)
    val nTables = tables.size
    val nCols = tables.map(_.df.columns.length.toLong).sum
    val nRows = tables.map(_.df.count()).sum
    (nTables, nCols, nRows)
  }
}
