package repro.stream

import scala.util.Random

/** A fully materialized stream with ground-truth concept ids per timestep —
  * the unit of evaluation for every table. Lengths in this reproduction are
  * ≤ ~10k observations, so materializing is cheap and keeps runs
  * deterministic across systems.
  */
final case class GeneratedStream(
    name: String,
    obs: IndexedSeq[Observation],
    conceptIds: IndexedSeq[Int],
    numFeatures: Int,
    numClasses: Int,
) extends Serializable {
  require(obs.length == conceptIds.length, "one concept id per observation")
  def length: Int = obs.length
  def numConcepts: Int = conceptIds.distinct.length
}

/** Builds recurrent-concept streams: each concept appears `occurrences`
  * times in segments of `segLen` observations, with the occurrence order
  * shuffled per seed (paper §VI-1). Adjacent duplicate segments are swapped
  * away so every segment boundary is a real concept drift.
  */
object RecurrentStream {

  /** Shuffle concept occurrence order, avoiding adjacent repeats where a
    * valid arrangement exists.
    */
  def occurrenceOrder(numConcepts: Int, occurrences: Int, rng: Random): IndexedSeq[Int] = {
    val order = rng.shuffle((0 until numConcepts).flatMap(c => Seq.fill(occurrences)(c)).toVector)
    val arr   = order.toArray
    var changed = true
    var pass    = 0
    while (changed && pass < 10) {
      changed = false
      var i = 1
      while (i < arr.length) {
        if (arr(i) == arr(i - 1)) {
          var j = 0
          var swapped = false
          while (j < arr.length && !swapped) {
            val leftOk  = j == 0 || arr(j - 1) != arr(i)
            val rightOk = j == arr.length - 1 || arr(j + 1) != arr(i)
            if (arr(j) != arr(i) && leftOk && rightOk &&
                (i == 0 || arr(j) != arr(i - 1)) && (i == arr.length - 1 || arr(j) != arr(i + 1))) {
              val tmp = arr(i); arr(i) = arr(j); arr(j) = tmp
              swapped = true; changed = true
            }
            j += 1
          }
        }
        i += 1
      }
      pass += 1
    }
    arr.toVector
  }

  def generate(
      name: String,
      concepts: IndexedSeq[ConceptGenerator],
      segLen: Int,
      occurrences: Int,
      seed: Long,
  ): GeneratedStream = {
    require(concepts.nonEmpty, "need at least one concept")
    val d  = concepts.head.numFeatures
    val nc = concepts.map(_.numClasses).max
    require(concepts.forall(_.numFeatures == d), "all concepts must share dimensionality")

    val rng   = new Random(seed)
    val order = occurrenceOrder(concepts.length, occurrences, rng)

    val obs = Vector.newBuilder[Observation]
    val ids = Vector.newBuilder[Int]
    for (cid <- order) {
      val gen = concepts(cid)
      gen.reset()
      var t = 0
      while (t < segLen) {
        obs += gen.next(rng, t)
        ids += cid
        t += 1
      }
    }
    GeneratedStream(name, obs.result(), ids.result(), d, nc)
  }
}
