package repro.stream

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class RecurrentStreamSpec extends AnyFunSuite {

  test("occurrenceOrder contains each concept exactly `occurrences` times") {
    val order = RecurrentStream.occurrenceOrder(4, 5, new Random(1))
    assert(order.length == 20)
    (0 until 4).foreach(c => assert(order.count(_ == c) == 5))
  }

  test("occurrenceOrder avoids adjacent repeats when possible") {
    for (seed <- 1 to 20) {
      val order = RecurrentStream.occurrenceOrder(3, 4, new Random(seed))
      val adjacent = order.sliding(2).count(p => p(0) == p(1))
      assert(adjacent == 0, s"seed=$seed order=$order")
    }
  }

  test("generate produces segLen * occurrences * concepts observations") {
    val concepts = (0 until 3).map(StaggerConcept(_))
    val s = RecurrentStream.generate("t", concepts, 50, 2, 1)
    assert(s.length == 50 * 2 * 3)
    assert(s.numConcepts == 3)
  }

  test("concept ids change exactly at segment boundaries") {
    val concepts = (0 until 3).map(StaggerConcept(_))
    val s = RecurrentStream.generate("t", concepts, 40, 2, 2)
    val boundaries = s.conceptIds.sliding(2).zipWithIndex.collect {
      case (Seq(a, b), i) if a != b => i + 1
    }.toSeq
    assert(boundaries.forall(_ % 40 == 0), s"boundaries=$boundaries")
  }

  test("same seed reproduces the identical stream") {
    val c1 = (0 until 2).map(c => new RandomTreeConcept(c, 5, 2))
    val c2 = (0 until 2).map(c => new RandomTreeConcept(c, 5, 2))
    val a = RecurrentStream.generate("t", c1, 30, 2, 7)
    val b = RecurrentStream.generate("t", c2, 30, 2, 7)
    assert(a.conceptIds == b.conceptIds)
    assert(a.obs.map(_.y) == b.obs.map(_.y))
  }

  test("mismatched dimensionality is rejected") {
    val mixed = IndexedSeq(new RandomTreeConcept(1, 5, 2), new RandomTreeConcept(2, 6, 2))
    intercept[IllegalArgumentException](RecurrentStream.generate("t", mixed, 10, 1, 1))
  }

  test("GeneratedStream validates aligned lengths") {
    intercept[IllegalArgumentException] {
      GeneratedStream("t", IndexedSeq(Observation(Array(1.0), 0)), IndexedSeq(0, 1), 1, 2)
    }
  }
}

class DatasetsSpec extends AnyFunSuite {

  test("registry matches Table II dataset names") {
    val names = Datasets.all.map(_.name)
    assert(names == IndexedSeq("AQTemp", "AQSex", "Arabic", "CMC", "QG", "UCI-Wine",
      "RBF", "RTREE", "STAGGER", "HPLANE-U", "RTREE-U"))
  }

  test("feature and context counts match Table II") {
    val byName = Datasets.all.map(s => s.name -> s).toMap
    assert(byName("AQTemp").numFeatures == 25 && byName("AQTemp").numContexts == 6)
    assert(byName("AQSex").numFeatures == 25 && byName("AQSex").numContexts == 6)
    assert(byName("Arabic").numFeatures == 10 && byName("Arabic").numContexts == 10)
    assert(byName("CMC").numFeatures == 8 && byName("CMC").numContexts == 2)
    assert(byName("QG").numFeatures == 63 && byName("QG").numContexts == 10)
    assert(byName("UCI-Wine").numFeatures == 11 && byName("UCI-Wine").numContexts == 2)
    assert(byName("STAGGER").numFeatures == 3 && byName("STAGGER").numContexts == 3)
    assert(byName("RBF").numFeatures == 10 && byName("RBF").numContexts == 6)
    assert(byName("RTREE").numFeatures == 10 && byName("RTREE").numContexts == 6)
    assert(byName("HPLANE-U").numFeatures == 10 && byName("HPLANE-U").numContexts == 6)
    assert(byName("RTREE-U").numFeatures == 10 && byName("RTREE-U").numContexts == 6)
  }

  test("built streams honour the spec dimensions") {
    for (spec <- Datasets.all) {
      val s = spec.build(3)
      assert(s.numFeatures == spec.numFeatures, spec.name)
      assert(s.numConcepts == spec.numContexts, spec.name)
      assert(s.length == spec.length, spec.name)
    }
  }

  test("synth family covers the 7 Table V modulation combinations") {
    assert(Datasets.synthFamily.map(_.name) == IndexedSeq(
      "Synth_A", "Synth_AF", "Synth_D", "Synth_DA", "Synth_DAF", "Synth_DF", "Synth_F"))
  }

  test("byName resolves every dataset and rejects unknown names") {
    (Datasets.all ++ Datasets.synthFamily).foreach(s => assert(Datasets.byName(s.name).name == s.name))
    intercept[NoSuchElementException](Datasets.byName("nope"))
  }

  test("streams are deterministic per seed and differ across seeds") {
    val a = Datasets.stagger.build(1)
    val b = Datasets.stagger.build(1)
    val c = Datasets.stagger.build(2)
    assert(a.obs.map(_.y) == b.obs.map(_.y))
    assert(a.conceptIds != c.conceptIds || a.obs.map(_.y) != c.obs.map(_.y))
  }
}
