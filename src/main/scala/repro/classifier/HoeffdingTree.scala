package repro.classifier

import scala.util.Random

/** Configuration for [[HoeffdingTree]]. Defaults are tuned for the short
  * segments used in this reproduction (paper streams are 30k observations;
  * ours are ~5–9k), hence a smaller grace period than MOA's 200.
  */
final case class HoeffdingTreeConfig(
    gracePeriod: Int = 50,
    splitConfidence: Double = 0.01,
    tieThreshold: Double = 0.05,
    nbThreshold: Double = 10.0,
    maxDepth: Int = 8,
    numSplitPoints: Int = 10,
    /** <= 0 means use all features; otherwise each leaf draws a random
      * subset of this size (Adaptive Random Forest subspace).
      */
    featureSubsetSize: Int = -1,
) extends Serializable

/** Incremental Hoeffding Tree (VFDT) with Gaussian numeric attribute
  * observers and adaptive naive-Bayes leaves, in the spirit of the MOA /
  * scikit-multiflow HoeffdingTreeClassifier.
  *
  * Extras needed by this reproduction:
  *  - `splitEvents` counts structural changes (FiCSUM resets
  *    classifier-dependent meta-information when the tree grows, §IV);
  *  - `featureContributions` returns Saabas-style path attributions used as
  *    the fast tree "Shapley value" meta-information feature (Table I);
  *  - optional per-leaf feature subspaces + weighted training for ARF.
  */
final class HoeffdingTree(
    val numFeatures: Int,
    val numClasses: Int,
    cfg: HoeffdingTreeConfig = HoeffdingTreeConfig(),
    seed: Long = 17,
) extends IncrementalClassifier {

  private val rng = new Random(seed)

  /** Structural-change counter: number of splits performed so far. */
  var splitEvents: Long = 0L

  private sealed trait Node extends Serializable {
    /** Class counts of observations routed through this node. */
    val classCounts: Array[Double] = new Array[Double](numClasses)
    def totalWeight: Double = { var s = 0.0; var i = 0; while (i < numClasses) { s += classCounts(i); i += 1 }; s }
    def proba: Array[Double] = {
      val tot = totalWeight
      if (tot <= 0) Array.fill(numClasses)(1.0 / numClasses)
      else classCounts.map(_ / tot)
    }
  }

  private final class Leaf(val depth: Int) extends Node {
    val observers: Array[Array[GaussianEstimator]] =
      Array.fill(numFeatures, numClasses)(new GaussianEstimator)
    val mins = Array.fill(numFeatures)(Double.PositiveInfinity)
    val maxs = Array.fill(numFeatures)(Double.NegativeInfinity)
    var weightSinceEval = 0.0
    // MC-vs-NB adaptive bookkeeping.
    var mcCorrect = 0.0
    var nbCorrect = 0.0
    val candidateFeatures: Array[Int] =
      if (cfg.featureSubsetSize <= 0 || cfg.featureSubsetSize >= numFeatures) Array.tabulate(numFeatures)(identity)
      else rng.shuffle((0 until numFeatures).toVector).take(cfg.featureSubsetSize).toArray

    def nbProba(x: Array[Double]): Array[Double] = {
      val tot = totalWeight
      if (tot <= 0) return Array.fill(numClasses)(1.0 / numClasses)
      val logp = new Array[Double](numClasses)
      var c = 0
      while (c < numClasses) {
        if (classCounts(c) <= 0) logp(c) = Double.NegativeInfinity
        else {
          var lp = math.log(classCounts(c) / tot)
          var f = 0
          while (f < numFeatures) {
            val est = observers(f)(c)
            if (est.weight > 0) lp += math.log(math.max(est.pdf(x(f)), 1e-12))
            f += 1
          }
          logp(c) = lp
        }
        c += 1
      }
      val mx = logp.max
      if (mx == Double.NegativeInfinity) return Array.fill(numClasses)(1.0 / numClasses)
      val exps = logp.map(l => math.exp(l - mx))
      val s = exps.sum
      exps.map(_ / s)
    }

    def leafProba(x: Array[Double]): Array[Double] =
      if (totalWeight >= cfg.nbThreshold && nbCorrect >= mcCorrect) nbProba(x) else proba
  }

  private final class Split(
      val feature: Int,
      val threshold: Double,
      var left: Node,
      var right: Node,
  ) extends Node {
    def route(x: Array[Double]): Node = if (x(feature) <= threshold) left else right
  }

  private var root: Node = new Leaf(0)

  // ---------------------------------------------------------------- predict

  def predictProba(x: Array[Double]): Array[Double] = {
    var n = root
    while (n.isInstanceOf[Split]) n = n.asInstanceOf[Split].route(x)
    n.asInstanceOf[Leaf].leafProba(x)
  }

  /** Saabas-style attribution: walking root→leaf, the change in the
    * predicted class's probability at each split is credited to the split
    * feature. Fast tree analogue of per-feature Shapley values.
    */
  def featureContributions(x: Array[Double]): Array[Double] = {
    val contrib = new Array[Double](numFeatures)
    var n = root
    val yHat = predict(x)
    var pPrev = n.proba(yHat)
    while (n.isInstanceOf[Split]) {
      val s = n.asInstanceOf[Split]
      val child = s.route(x)
      val pChild = child match {
        case l: Leaf => l.leafProba(x)(yHat)
        case o       => o.proba(yHat)
      }
      contrib(s.feature) += math.abs(pChild - pPrev)
      pPrev = pChild
      n = child
    }
    contrib
  }

  // ------------------------------------------------------------------ train

  def train(x: Array[Double], y: Int, weight: Double = 1.0): Unit = {
    var n = root
    n.classCounts(y) += weight
    while (n.isInstanceOf[Split]) {
      n = n.asInstanceOf[Split].route(x)
      n.classCounts(y) += weight
    }
    val leaf = n.asInstanceOf[Leaf]
    // Adaptive NB bookkeeping uses the pre-update prediction.
    val tot = leaf.totalWeight - weight
    if (tot > 0) {
      var mc = 0; var i = 1
      while (i < numClasses) { if (leaf.classCounts(i) > leaf.classCounts(mc)) mc = i; i += 1 }
      if (mc == y) leaf.mcCorrect += weight
      var nb = 0
      val nbp = leaf.nbProba(x)
      i = 1
      while (i < numClasses) { if (nbp(i) > nbp(nb)) nb = i; i += 1 }
      if (nb == y) leaf.nbCorrect += weight
    }
    var f = 0
    while (f < numFeatures) {
      leaf.observers(f)(y).add(x(f), weight)
      if (x(f) < leaf.mins(f)) leaf.mins(f) = x(f)
      if (x(f) > leaf.maxs(f)) leaf.maxs(f) = x(f)
      f += 1
    }
    leaf.weightSinceEval += weight
    if (leaf.weightSinceEval >= cfg.gracePeriod && leaf.depth < cfg.maxDepth) {
      leaf.weightSinceEval = 0.0
      attemptSplit(leaf)
    }
  }

  private def entropy(counts: Array[Double]): Double = {
    var tot = 0.0; var i = 0
    while (i < counts.length) { tot += counts(i); i += 1 }
    if (tot <= 0) return 0.0
    var h = 0.0
    i = 0
    while (i < counts.length) {
      val p = counts(i) / tot
      if (p > 1e-12) h -= p * math.log(p) / math.log(2)
      i += 1
    }
    h
  }

  /** Best (gain, threshold) for one feature via the class Gaussians. */
  private def bestSplitForFeature(leaf: Leaf, f: Int): (Double, Double) = {
    val lo = leaf.mins(f); val hi = leaf.maxs(f)
    if (!(hi > lo)) return (0.0, 0.0)
    val hParent = entropy(leaf.classCounts)
    val totW = leaf.totalWeight
    var bestGain = 0.0
    var bestThr  = 0.0
    var k = 1
    while (k <= cfg.numSplitPoints) {
      val thr = lo + (hi - lo) * k / (cfg.numSplitPoints + 1)
      val lCounts = new Array[Double](numClasses)
      val rCounts = new Array[Double](numClasses)
      var c = 0
      while (c < numClasses) {
        val w = leaf.classCounts(c)
        if (w > 0) {
          val pl = leaf.observers(f)(c).cdf(thr)
          lCounts(c) = w * pl
          rCounts(c) = w * (1 - pl)
        }
        c += 1
      }
      val wl = lCounts.sum; val wr = rCounts.sum
      if (wl > 1e-9 && wr > 1e-9) {
        val gain = hParent - (wl / totW) * entropy(lCounts) - (wr / totW) * entropy(rCounts)
        if (gain > bestGain) { bestGain = gain; bestThr = thr }
      }
      k += 1
    }
    (bestGain, bestThr)
  }

  private def attemptSplit(leaf: Leaf): Unit = {
    val totW = leaf.totalWeight
    if (totW <= 0) return
    // Pure leaf — nothing to gain.
    if (leaf.classCounts.count(_ > 0) <= 1) return

    var best = (-1.0, 0.0); var bestF = -1
    var second = -1.0
    for (f <- leaf.candidateFeatures) {
      val (g, thr) = bestSplitForFeature(leaf, f)
      if (g > best._1) { second = best._1; best = (g, thr); bestF = f }
      else if (g > second) second = g
    }
    if (bestF < 0 || best._1 <= 0) return
    val range = math.log(numClasses.toDouble) / math.log(2.0)
    val eps = math.sqrt(range * range * math.log(1.0 / cfg.splitConfidence) / (2.0 * totW))
    if (best._1 - math.max(second, 0.0) > eps || eps < cfg.tieThreshold) {
      doSplit(leaf, bestF, best._2)
    }
  }

  private def doSplit(leaf: Leaf, feature: Int, threshold: Double): Unit = {
    val split = new Split(feature, threshold, new Leaf(leaf.depth + 1), new Leaf(leaf.depth + 1))
    Array.copy(leaf.classCounts, 0, split.classCounts, 0, numClasses)
    // Seed children with the parent's class-conditional mass on each side so
    // fresh leaves predict sensibly before retraining.
    var c = 0
    while (c < numClasses) {
      val w = leaf.classCounts(c)
      if (w > 0) {
        val pl = leaf.observers(feature)(c).cdf(threshold)
        split.left.classCounts(c) = w * pl
        split.right.classCounts(c) = w * (1 - pl)
      }
      c += 1
    }
    replaceLeaf(leaf, split)
    splitEvents += 1
  }

  private def replaceLeaf(target: Leaf, replacement: Node): Unit = {
    if (root eq target) { root = replacement; return }
    def rec(n: Node): Boolean = n match {
      case s: Split =>
        if (s.left eq target) { s.left = replacement; true }
        else if (s.right eq target) { s.right = replacement; true }
        else rec(s.left) || rec(s.right)
      case _ => false
    }
    rec(root)
  }

  /** Number of nodes (diagnostics). */
  def nodeCount: Int = {
    def rec(n: Node): Int = n match {
      case s: Split => 1 + rec(s.left) + rec(s.right)
      case _        => 1
    }
    rec(root)
  }
}
