package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.stream.{Datasets, StaggerConcept, RecurrentStream}

class FiCSUMSpec extends AnyFunSuite {

  private lazy val stagger = Datasets.stagger.build(1)

  test("detects drifts and builds a repository on STAGGER") {
    val f = FiCSUM.full(stagger.numFeatures, stagger.numClasses, seed = 1)
    stagger.obs.foreach(o => f.step(o.x, o.y))
    assert(f.driftCount >= 3, s"drifts=${f.driftCount}")
    assert(f.repositorySize >= 2, s"repo=${f.repositorySize}")
    assert(f.repositorySize <= 10, s"repo exploded: ${f.repositorySize}")
  }

  test("step returns predictions in class range and near-stable model ids") {
    val f = FiCSUM.full(3, 2, seed = 2)
    val rng = new scala.util.Random(3)
    val gen = StaggerConcept(0)
    var maxModel = 0
    (0 until 400).foreach { t =>
      val o = gen.next(rng, t)
      val (p, m) = f.step(o.x, o.y)
      assert(p == 0 || p == 1)
      maxModel = math.max(maxModel, m)
    }
    // Detection is stochastic; at most one spurious transition is tolerated
    // on a stationary prefix.
    assert(maxModel <= 1, s"model ids ran to $maxModel on stationary data")
  }

  test("stationary stream yields no (or almost no) drift detections") {
    val f = FiCSUM.full(3, 2, seed = 4)
    val rng = new scala.util.Random(5)
    val gen = StaggerConcept(1)
    (0 until 2000).foreach(t => f.step(gen.next(rng, t).x, gen.next(rng, t).y))
    assert(f.driftCount <= 2, s"drifts on stationary stream: ${f.driftCount}")
  }

  test("probe returns similarities once two concepts are stored") {
    val f = FiCSUM.full(stagger.numFeatures, stagger.numClasses, seed = 1)
    var probed = false
    stagger.obs.foreach { o =>
      f.step(o.x, o.y)
      if (!probed && f.repositorySize >= 2) {
        f.probe().foreach { pr =>
          assert(pr.simByModel.size >= 2)
          pr.simByModel.values.foreach(v => assert(v >= 0 && v <= 1))
          probed = true
        }
      }
    }
    assert(probed, "probe never produced a result")
  }

  test("variants restrict the fingerprint sources") {
    assert(FiCSUM.errorRate(5, 2).name == "ER")
    assert(FiCSUM.supervised(5, 2).name == "S-MI")
    assert(FiCSUM.unsupervised(5, 2).name == "U-MI")
    assert(FiCSUM.full(5, 2).name == "FiCSUM")
  }

  test("engine is serializable mid-stream and resumes identically") {
    val f = FiCSUM.full(stagger.numFeatures, stagger.numClasses, seed = 1)
    stagger.obs.take(700).foreach(o => f.step(o.x, o.y))

    def roundTrip(e: FiCSUM): FiCSUM = {
      val bos = new java.io.ByteArrayOutputStream()
      new java.io.ObjectOutputStream(bos).writeObject(e)
      new java.io.ObjectInputStream(new java.io.ByteArrayInputStream(bos.toByteArray))
        .readObject().asInstanceOf[FiCSUM]
    }
    val copy = roundTrip(f)
    val restA = stagger.obs.slice(700, 1100).map(o => f.step(o.x, o.y))
    val restB = stagger.obs.slice(700, 1100).map(o => copy.step(o.x, o.y))
    assert(restA == restB, "serialized engine diverged from original")
    assert(f.driftCount == copy.driftCount)
  }

  test("recurrences reuse stored classifiers (repo smaller than segments)") {
    // 3 concepts x 4 occurrences = 12 segments; a working model-selection
    // keeps the repository well below one-concept-per-segment.
    val f = FiCSUM.full(stagger.numFeatures, stagger.numClasses, seed = 1)
    stagger.obs.foreach(o => f.step(o.x, o.y))
    assert(f.repositorySize < 10, s"repo=${f.repositorySize} for 12 segments")
  }

  test("fingerprintUpdates and detectorUpdates advance") {
    val f = FiCSUM.full(stagger.numFeatures, stagger.numClasses, seed = 1)
    stagger.obs.take(1000).foreach(o => f.step(o.x, o.y))
    assert(f.fingerprintUpdates > 100)
    assert(f.detectorUpdates > 10)
  }

  test("ER variant works end to end on STAGGER") {
    val f = FiCSUM.errorRate(stagger.numFeatures, stagger.numClasses, seed = 1)
    stagger.obs.foreach(o => f.step(o.x, o.y))
    assert(f.driftCount >= 3)
  }

  test("single-function variant (mean) runs end to end") {
    val f = FiCSUM.singleFunction("fn:Mean", 3, 2,
      IndexedSeq(repro.meta.MetaFunctions.Mean), seed = 1)
    stagger.obs.take(1500).foreach(o => f.step(o.x, o.y))
    assert(f.fingerprintUpdates > 0)
  }

  test("shapley-only variant runs end to end") {
    val f = FiCSUM.singleFunction("fn:Shapley Value", 3, 2, IndexedSeq.empty, seed = 1)
    stagger.obs.take(1500).foreach(o => f.step(o.x, o.y))
    assert(f.fingerprintUpdates > 0)
  }

  test("config validation: buffer length is positive") {
    assert(FiCSUMConfig(windowSize = 50, bufferRatio = 0.25).bufferLen == 13)
    assert(FiCSUMConfig(windowSize = 4, bufferRatio = 0.01).bufferLen == 1)
  }

  test("second model selection can replace a freshly created concept") {
    // Run a stream with a guaranteed recurrence pattern A-B-A-B-A-B and
    // check that the repository converges instead of growing per segment.
    val concepts = IndexedSeq(StaggerConcept(0), StaggerConcept(2))
    val s = RecurrentStream.generate("ab", concepts, 300, 3, 5)
    val f = FiCSUM.full(3, 2, seed = 5)
    s.obs.foreach(o => f.step(o.x, o.y))
    assert(f.repositorySize <= 4, s"repo=${f.repositorySize} for 2 true concepts")
  }
}
