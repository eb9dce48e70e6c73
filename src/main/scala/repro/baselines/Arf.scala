package repro.baselines

import scala.util.Random
import repro.classifier.{HoeffdingTree, HoeffdingTreeConfig}
import repro.detector.Adwin
import repro.eval.StreamSystem

/** Adaptive Random Forest (Gomes et al. 2017; paper Table VI, 10 trees):
  * online bagging with Poisson(6) weights, per-tree feature subspaces of
  * ⌈√d⌉+1 features, a per-tree ADWIN on the tree's error that resets the
  * tree on drift, and accuracy-weighted majority voting. Like DWM it keeps
  * one evolving ensemble representation (constant model id).
  */
final class Arf(
    numFeatures: Int,
    numClasses: Int,
    numTrees: Int = 10,
    lambda: Double = 6.0,
    adwinDelta: Double = 0.001,
    treeCfg: HoeffdingTreeConfig = HoeffdingTreeConfig(),
    seed: Long = 42,
) extends StreamSystem {

  val name = "ARF"

  private val subspace = math.ceil(math.sqrt(numFeatures)).toInt + 1
  private val cfg = treeCfg.copy(featureSubsetSize = math.min(subspace, numFeatures))
  private val rng = new Random(seed)

  private final class Member(memberSeed: Long) extends Serializable {
    var tree = new HoeffdingTree(numFeatures, numClasses, cfg, memberSeed)
    var adwin = new Adwin(adwinDelta)
    var correct = 1.0
    var seen    = 2.0
    def accWeight: Double = correct / seen
    def reset(newSeed: Long): Unit = {
      tree = new HoeffdingTree(numFeatures, numClasses, cfg, newSeed)
      adwin = new Adwin(adwinDelta)
      correct = 1.0; seen = 2.0
    }
  }

  private val members = Array.tabulate(numTrees)(t => new Member(seed * 31 + t))
  private var resets  = 0

  var driftCount: Int = 0

  /** Poisson(λ) draw via inversion (λ=6 ⇒ cheap). */
  private def poisson(): Int = {
    val limit = math.exp(-lambda)
    var p = rng.nextDouble()
    var k = 0
    while (p > limit && k < 30) { p *= rng.nextDouble(); k += 1 }
    k
  }

  def step(x: Array[Double], y: Int): (Int, Int) = {
    val scores = new Array[Double](numClasses)
    val preds = new Array[Int](numTrees)
    var t = 0
    while (t < numTrees) {
      val m = members(t)
      val p = m.tree.predict(x)
      preds(t) = p
      scores(p) += m.accWeight
      t += 1
    }
    var best = 0; var c = 1
    while (c < numClasses) { if (scores(c) > scores(best)) best = c; c += 1 }

    t = 0
    while (t < numTrees) {
      val m = members(t)
      val err = if (preds(t) != y) 1.0 else 0.0
      m.seen += 1; if (err == 0) m.correct += 1
      if (m.adwin.add(err)) {
        driftCount += 1
        resets += 1
        m.reset(seed * 131 + resets)
      }
      val k = poisson()
      if (k > 0) m.tree.train(x, y, k.toDouble)
      t += 1
    }
    (best, 0) // single evolving ensemble representation
  }
}
