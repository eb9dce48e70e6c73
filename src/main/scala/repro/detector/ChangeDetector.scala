package repro.detector

/** Common interface for online change detectors fed one value per step
  * (an error indicator, a similarity value, ...).
  */
trait ChangeDetector extends Serializable {

  /** Feed one value; returns true iff a change was detected at this step. */
  def add(value: Double): Boolean

  /** True while the detector is in its warning zone (if supported). */
  def warning: Boolean = false

  /** Clear all state. */
  def reset(): Unit
}
