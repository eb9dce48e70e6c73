package repro.bench

import repro.SparkSpec
import repro.eval.RunOutcome
import repro.eval.tables.Tables

/** Caches the 11-dataset × 4-variant grid shared by Tables III and IV so
  * the bench run computes it once.
  */
object SharedGrid {
  @volatile private var cached: Seq[RunOutcome] = null
  def get(spark: org.apache.spark.sql.SparkSession): Seq[RunOutcome] = synchronized {
    if (cached == null) cached = Tables.mainGrid(spark)
    cached
  }
}

/** Table II: dataset characteristics. */
class TableIIBench extends SparkSpec {
  test("Table II: dataset characteristics") {
    val txt = Tables.tableII()
    println(txt)
    assert(txt.linesIterator.size == 13) // header x2 + 11 datasets
  }
}

/** Table III: discrimination ability of ER / S-MI / U-MI / FiCSUM. */
class TableIIIBench extends SparkSpec {
  test("Table III: discrimination ability") {
    val res = Tables.tableIII(spark, Some(SharedGrid.get(spark)))
    println(res.text)
    assert(res.outcomes.size == Tables.MainDatasets.size * Tables.MainSystems.size * Tables.Seeds.size)
    // Discrimination must be measurable for the fingerprint systems on most
    // datasets (NaN = the system never stored >= 2 concepts anywhere).
    val measurable = res.outcomes.filter(o => !o.discrimination.isNaN)
    assert(measurable.size > res.outcomes.size / 3, s"measurable=${measurable.size}")
  }
}

/** Table IV: kappa and C-F1 of ER / S-MI / U-MI / FiCSUM + average ranks. */
class TableIVBench extends SparkSpec {
  test("Table IV: kappa and C-F1") {
    val res = Tables.tableIV(spark, Some(SharedGrid.get(spark)))
    println(res.text)
    val byKey = res.outcomes.groupBy(o => (o.dataset, o.system))
      .view.mapValues(os => os.map(_.kappa).sum / os.size).toMap

    // Shape checks mirroring the paper's headline findings:
    // U-MI fails on the p(y|X)-drift datasets relative to supervised MI.
    assert(byKey(("AQSex", "U-MI")) < byKey(("AQSex", "ER")),
      "U-MI should underperform ER on AQSex (p(y|X) drift)")
    assert(byKey(("STAGGER", "U-MI")) < byKey(("STAGGER", "ER")),
      "U-MI should underperform ER on STAGGER (labelling-function drift)")
    // All kappas are valid values.
    res.outcomes.foreach(o => assert(o.kappa >= -1.0 && o.kappa <= 1.0))
    res.outcomes.foreach(o => assert(o.cF1 >= 0.0 && o.cF1 <= 1.0))
  }
}

/** Table V: single meta-information functions under induced D/A/F drift. */
class TableVBench extends SparkSpec {
  test("Table V: meta-information function comparison") {
    val res = Tables.tableV(spark)
    println(res.text)
    assert(res.outcomes.size == Tables.SynthDatasets.size * Tables.FnSystems.size * Tables.Seeds.size)
    res.outcomes.foreach(o => assert(o.cF1 >= 0.0 && o.cF1 <= 1.0, o.toString))
  }
}

/** Table VI: framework comparison (HTCD, RCD, ER, DWM, ARF, FiCSUM). */
class TableVIBench extends SparkSpec {
  test("Table VI: framework comparison") {
    val res = Tables.tableVI(spark)
    println(res.text)
    val cf1 = res.outcomes.groupBy(o => (o.dataset, o.system))
      .view.mapValues(os => os.map(_.cF1).sum / os.size).toMap

    // Ensembles keep one evolving representation: their C-F1 equals the
    // single-model ceiling exactly (paper's constant rows).
    for (d <- Tables.FrameworkDatasets; s <- Seq("DWM", "ARF")) {
      val k = repro.stream.Datasets.byName(d).numContexts
      val expected = 2.0 / (1.0 + k)
      assert(math.abs(cf1((d, s)) - expected) < 1e-9,
        s"$s on $d: ${cf1((d, s))} vs single-model ceiling $expected")
    }
    // HTCD never reuses models: its C-F1 is capped by the per-segment
    // ceiling 2·(1/occ)/(1+1/occ) = 0.5 at 3 occurrences (0.18 at the
    // paper's 9 — the gap to FiCSUM is structurally smaller at this scale).
    // (lag-shifted boundaries can push slightly past the exact ceiling)
    assert(cf1(("STAGGER", "HTCD")) <= 0.6)
    // FiCSUM tracks concepts better than the single-representation
    // ensemble on a meaningful share of datasets.
    val wins = Tables.FrameworkDatasets.count { d =>
      cf1((d, "FiCSUM")) > cf1((d, "ARF"))
    }
    assert(wins >= 4, s"FiCSUM C-F1 beats ARF on only $wins/9 datasets")
  }
}
