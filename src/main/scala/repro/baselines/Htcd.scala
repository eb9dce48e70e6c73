package repro.baselines

import repro.classifier.{HoeffdingTree, HoeffdingTreeConfig}
import repro.detector.Adwin
import repro.eval.StreamSystem

/** HTCD baseline (paper Table VI): a Hoeffding Tree reset whenever ADWIN
  * detects drift in the 0/1 error sequence. No repository — every drift
  * starts a fresh model, so each model id covers exactly one segment.
  */
final class Htcd(
    numFeatures: Int,
    numClasses: Int,
    treeCfg: HoeffdingTreeConfig = HoeffdingTreeConfig(),
    adwinDelta: Double = 0.002,
    seed: Long = 42,
) extends StreamSystem {

  val name = "HTCD"

  private var modelId = 0
  private var tree    = new HoeffdingTree(numFeatures, numClasses, treeCfg, seed)
  private var adwin   = new Adwin(adwinDelta)

  var driftCount: Int = 0

  def step(x: Array[Double], y: Int): (Int, Int) = {
    val l = tree.predict(x)
    tree.train(x, y)
    if (adwin.add(if (l != y) 1.0 else 0.0)) {
      driftCount += 1
      modelId += 1
      tree = new HoeffdingTree(numFeatures, numClasses, treeCfg, seed + modelId)
      adwin = new Adwin(adwinDelta)
    }
    (l, modelId)
  }
}
