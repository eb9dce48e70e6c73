package repro.eval

/** A stream-classification system under evaluation: consumes one
  * observation per step (test-then-train) and reports its prediction plus
  * the id of the model/concept representation currently active — the m_t
  * used by the co-occurrence C-F1 measure (paper §II).
  */
trait StreamSystem extends Serializable {
  def name: String

  /** Test-then-train on one observation: returns (prediction, activeModelId). */
  def step(x: Array[Double], y: Int): (Int, Int)
}

/** Result of a discrimination probe (paper §II-A): the similarity of each
  * stored concept representation, evaluated on the current active window,
  * plus each representation's normal-similarity σ. Only fingerprint-based
  * systems can answer probes.
  */
final case class ProbeResult(
    simByModel: Map[Int, Double],
    sigmaByModel: Map[Int, Double],
) extends Serializable

trait Probeable { self: StreamSystem =>
  /** None until ≥2 concept representations are stored and warmup is done. */
  def probe(): Option[ProbeResult]
}
