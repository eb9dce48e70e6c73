package repro.classifier

/** An online classifier trained one observation at a time (test-then-train
  * protocol). Implementations must be serializable so experiment cells can
  * run as Spark tasks.
  */
trait IncrementalClassifier extends Serializable {
  def numClasses: Int

  /** Class-probability estimates for `x` (sums to 1 when any class has been
    * seen; uniform before any training).
    */
  def predictProba(x: Array[Double]): Array[Double]

  /** Most probable class for `x`. */
  def predict(x: Array[Double]): Int = {
    val p = predictProba(x)
    var best = 0
    var i = 1
    while (i < p.length) { if (p(i) > p(best)) best = i; i += 1 }
    best
  }

  /** Incorporate one labelled observation with the given weight. */
  def train(x: Array[Double], y: Int, weight: Double = 1.0): Unit
}
