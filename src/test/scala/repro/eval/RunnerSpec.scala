package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.stream.Datasets

class RunnerSpec extends AnyFunSuite {

  test("Runner produces a complete outcome for HTCD on STAGGER") {
    val stream = Datasets.stagger.build(1)
    val out = Runner.run(Systems.create("HTCD", stream.numFeatures, stream.numClasses, 1),
      stream, 1)
    assert(out.dataset == "STAGGER" && out.system == "HTCD")
    assert(out.kappa > 0.3 && out.kappa <= 1.0)
    assert(out.cF1 > 0.0 && out.cF1 <= 1.0)
    assert(out.discrimination.isNaN) // HTCD is not probeable
    assert(out.runtimeMs >= 0 && out.numModels >= 2)
  }

  test("Runner records discrimination for probeable systems") {
    val stream = Datasets.stagger.build(1)
    val out = Runner.run(Systems.create("ER", stream.numFeatures, stream.numClasses, 1),
      stream, 1)
    assert(!out.discrimination.isNaN, "ER should produce discrimination probes")
  }

  test("Systems factory builds every named system") {
    for (name <- Seq("FiCSUM", "S-MI", "U-MI", "ER", "HTCD", "RCD", "DWM", "ARF"))
      assert(Systems.create(name, 4, 2, 1).isInstanceOf[StreamSystem], name)
    for ((label, _) <- repro.meta.MetaFunctions.tableVGroups)
      assert(Systems.create(s"fn:$label", 4, 2, 1).name == s"fn:$label")
    assert(Systems.create("fn:Shapley Value", 4, 2, 1).name == "fn:Shapley Value")
    intercept[NoSuchElementException](Systems.create("nope", 4, 2, 1))
  }
}

class EvalGridSpec extends SparkSpec {

  test("grid cells run as Spark tasks and aggregate") {
    val cells = Seq(
      Cell("STAGGER", "HTCD", 1), Cell("STAGGER", "HTCD", 2),
      Cell("STAGGER", "ER", 1), Cell("STAGGER", "ER", 2))
    val outcomes = EvalGrid.run(spark, cells)
    assert(outcomes.length == 4)
    assert(outcomes.map(_.system).toSet == Set("HTCD", "ER"))
    val agg = EvalGrid.aggregate(outcomes, _.kappa)
    assert(agg.contains(("STAGGER", "HTCD")) && agg.contains(("STAGGER", "ER")))
    val a = agg(("STAGGER", "HTCD"))
    assert(a.mean > 0.2 && a.std >= 0.0)
    assert(a.fmt(2).matches("""\d+\.\d\d \(\d+\.\d\d\)"""))
  }

  test("grid outcomes are reproducible per seed") {
    val cells = Seq(Cell("STAGGER", "HTCD", 7))
    val a = EvalGrid.run(spark, cells).head
    val b = EvalGrid.run(spark, cells).head
    assert(a.kappa == b.kappa && a.cF1 == b.cF1)
  }
}
