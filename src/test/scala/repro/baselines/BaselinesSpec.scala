package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.stream.Datasets

class BaselinesSpec extends AnyFunSuite {

  private lazy val stagger = Datasets.stagger.build(1)

  test("HTCD resets its model on drift: model ids increase over STAGGER") {
    val h = new Htcd(stagger.numFeatures, stagger.numClasses, seed = 1)
    val ids = stagger.obs.map(o => h.step(o.x, o.y)._2)
    assert(ids.distinct.length >= 4, s"models=${ids.distinct.length}")
    assert(ids == ids.sorted, "HTCD model ids must be monotone (no reuse)")
    assert(h.driftCount == ids.distinct.length - 1)
  }

  test("HTCD achieves reasonable prequential accuracy on STAGGER") {
    val h = new Htcd(stagger.numFeatures, stagger.numClasses, seed = 1)
    val correct = stagger.obs.count(o => h.step(o.x, o.y)._1 == o.y)
    assert(correct.toDouble / stagger.length > 0.75)
  }

  test("RCD detects drifts and can reuse stored models") {
    val r = new Rcd(stagger.numFeatures, stagger.numClasses, seed = 1)
    val ids = stagger.obs.map(o => r.step(o.x, o.y)._2)
    assert(r.driftCount >= 1, "EDDM should fire on STAGGER concept changes")
    assert(ids.distinct.nonEmpty)
  }

  test("RCD on a p(X)-drift stream uses the KS test path") {
    val s = Datasets.rtreeU.build(1)
    val r = new Rcd(s.numFeatures, s.numClasses, seed = 1)
    val ids = s.obs.map(o => r.step(o.x, o.y)._2)
    assert(ids.distinct.length >= 1)
  }

  test("DWM keeps a single evolving representation (model id 0)") {
    val d = new Dwm(stagger.numFeatures, stagger.numClasses, seed = 1)
    val ids = stagger.obs.take(1500).map(o => d.step(o.x, o.y)._2)
    assert(ids.forall(_ == 0))
    assert(d.numExperts <= 10)
  }

  test("DWM accuracy beats majority guessing on STAGGER") {
    val d = new Dwm(stagger.numFeatures, stagger.numClasses, seed = 1)
    val correct = stagger.obs.count(o => d.step(o.x, o.y)._1 == o.y)
    val majority = stagger.obs.map(_.y).groupBy(identity).values.map(_.length).max
    assert(correct > majority, s"acc=${correct.toDouble / stagger.length}")
  }

  test("ARF keeps a single evolving representation and adapts") {
    val a = new Arf(stagger.numFeatures, stagger.numClasses, numTrees = 5, seed = 1)
    val results = stagger.obs.map(o => a.step(o.x, o.y))
    assert(results.forall(_._2 == 0))
    val correct = results.zip(stagger.obs).count { case ((p, _), o) => p == o.y }
    assert(correct.toDouble / stagger.length > 0.7, s"acc=${correct.toDouble / stagger.length}")
  }

  test("ARF per-tree ADWIN resets fire under drift") {
    val a = new Arf(stagger.numFeatures, stagger.numClasses, numTrees = 5, seed = 1)
    stagger.obs.foreach(o => a.step(o.x, o.y))
    assert(a.driftCount >= 1)
  }

  test("all baselines are serializable") {
    val systems: Seq[repro.eval.StreamSystem] = Seq(
      new Htcd(3, 2), new Rcd(3, 2), new Dwm(3, 2), new Arf(3, 2, numTrees = 3))
    systems.foreach { s =>
      stagger.obs.take(300).foreach(o => s.step(o.x, o.y))
      val bos = new java.io.ByteArrayOutputStream()
      new java.io.ObjectOutputStream(bos).writeObject(s)
      assert(bos.size() > 0, s.name)
    }
  }
}
