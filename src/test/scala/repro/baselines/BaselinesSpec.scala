package repro.baselines

import repro.SparkSpec
import repro.core.{State, TabularTask, Universal}
import repro.lake.DataLake

class MetamSpec extends SparkSpec {

  private lazy val lake = DataLake.house(spark, sf = 0.01)
  private lazy val task = TabularTask.forLake(lake)

  test("METAM output contains the base columns") {
    val out = Metam.run(lake, task, "f1")
    assert(lake.base.df.columns.forall(out.columns.contains))
  }

  test("METAM output preserves the base row count (left joins)") {
    val out = Metam.run(lake, task, "f1")
    assert(out.count() == lake.base.df.count())
  }

  test("METAM output is evaluable") {
    val out = Metam.run(lake, task, "f1")
    assert(task.evaluate(out).isDefined)
  }

  test("METAM never joins non-joinable distractors") {
    val out = Metam.run(lake, task, "f1")
    val distractorCols = lake.distractors.flatMap(_.df.columns).filterNot(_ == "code").toSet
    assert(out.columns.toSet.intersect(distractorCols).isEmpty)
  }

  test("METAM utility improves or stays equal vs base-only") {
    val out = Metam.run(lake, task, "f1")
    val baseF1 = task.evaluate(lake.base.df).get.raw("f1")
    val outF1 = task.evaluate(out).get.raw("f1")
    assert(outF1 >= baseF1 - 0.05, s"out=$outF1 base=$baseF1")
  }

  test("METAM-MO runs and is evaluable") {
    val out = Metam.runMO(lake, task)
    assert(task.evaluate(out).isDefined)
  }

  test("METAM-MO honors explicit weights") {
    val out = Metam.runMO(lake, task, Map("train" -> 1.0))
    assert(task.evaluate(out).isDefined)
  }
}

class StarmieSpec extends SparkSpec {

  private lazy val lake = DataLake.house(spark, sf = 0.01)

  test("column sketch has histogram + moment entries") {
    val s = Starmie.columnSketch(lake.base.df, "seg_quality")
    assert(s.length == Starmie.Bins + 2)
    assert(math.abs(s.take(Starmie.Bins).sum - 1.0) < 1e-6)
  }

  test("sketch of an empty column is all zeros") {
    val empty = lake.base.df.filter("id < 0")
    val s = Starmie.columnSketch(empty, "seg_quality")
    assert(s.forall(_ == 0.0))
  }

  test("similar columns score higher than dissimilar ones") {
    val aux = lake.aux.head
    val simAux = Starmie.tableSimilarity(lake.base.df, aux.df, Set("id", "target"))
    val simDis = Starmie.tableSimilarity(lake.base.df, lake.distractors.head.df, Set("id", "target"))
    assert(simAux > simDis, s"aux=$simAux distractor=$simDis")
  }

  test("run augments the base with similar joinable tables") {
    val out = Starmie.run(lake)
    assert(out.columns.length > lake.base.df.columns.length)
    assert(out.count() == lake.base.df.count())
  }

  test("run with an impossible threshold returns the base unchanged") {
    val out = Starmie.run(lake, threshold = 2.0)
    assert(out.columns.toSeq == lake.base.df.columns.toSeq)
  }

  test("run never joins on a missing key") {
    val out = Starmie.run(lake, threshold = 0.0)
    val distractorCols = lake.distractors.flatMap(_.df.columns).filterNot(_ == "code").toSet
    assert(out.columns.toSet.intersect(distractorCols).isEmpty)
  }
}

class FeatureSelectSpec extends SparkSpec {

  private lazy val lake = DataLake.house(spark, sf = 0.01)
  private lazy val uni = Universal.build(lake)
  private lazy val task = TabularTask.forLake(lake)
  private lazy val fullDf = uni.materialize(State.full(uni.layout.width))

  test("SkSFM reduces the column count") {
    val out = FeatureSelect.skSFM(fullDf, task)
    assert(out.columns.length < fullDf.columns.length)
    assert(out.columns.contains("id") && out.columns.contains("target"))
  }

  test("SkSFM keeps all rows") {
    val out = FeatureSelect.skSFM(fullDf, task)
    assert(out.count() == fullDf.count())
  }

  test("SkSFM output is evaluable") {
    assert(task.evaluate(FeatureSelect.skSFM(fullDf, task)).isDefined)
  }

  test("SkSFM retains some informative features and not everything") {
    // at SF=0.01 (200 rows, ~18% flipped labels) importance estimates are
    // noisy — require signal retention, not a clean noise/informative split
    val out = FeatureSelect.skSFM(fullDf, task)
    val kept = out.columns.filterNot(c => c == "id" || c == "target")
    val informativeKept = kept.count(c => lake.informativeAttrs.contains(c))
    assert(informativeKept >= 1, s"kept=${kept.toSeq}")
    assert(kept.length < fullDf.columns.length - 2)
  }

  test("H2O reduces the column count and keeps rows") {
    val out = FeatureSelect.h2o(fullDf, task)
    assert(out.columns.length < fullDf.columns.length)
    assert(out.count() == fullDf.count())
  }

  test("H2O output is evaluable") {
    assert(task.evaluate(FeatureSelect.h2o(fullDf, task)).isDefined)
  }

  test("regression variants work (avocado lake)") {
    val rl = DataLake.avocado(spark, sf = 0.01)
    val ru = Universal.build(rl)
    val rt = TabularTask.forLake(rl)
    val rdf = ru.materialize(State.full(ru.layout.width))
    assert(rt.evaluate(FeatureSelect.skSFM(rdf, rt)).isDefined)
    assert(rt.evaluate(FeatureSelect.h2o(rdf, rt)).isDefined)
  }
}
