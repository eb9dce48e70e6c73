package repro.detector

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class AdwinSpec extends AnyFunSuite {

  test("tracks the mean of a stationary sequence") {
    val ad = new Adwin(0.01)
    val rng = new Random(1)
    (0 until 500).foreach(_ => ad.add(0.3 + rng.nextGaussian() * 0.05))
    assert(math.abs(ad.mean - 0.3) < 0.02)
    assert(ad.width > 100)
  }

  test("detects an abrupt mean shift") {
    val ad = new Adwin(0.05)
    val rng = new Random(2)
    var detected = -1
    for (i <- 0 until 1000 if detected < 0) {
      val v = (if (i < 400) 0.8 else 0.3) + rng.nextGaussian() * 0.05
      if (ad.add(v)) detected = i
    }
    assert(detected > 400, s"false positive before the shift at $detected")
    assert(detected < 550, s"detection too slow: $detected")
  }

  test("window shrinks after detection") {
    val ad = new Adwin(0.05)
    val rng = new Random(3)
    (0 until 400).foreach(_ => ad.add(0.9 + rng.nextGaussian() * 0.02))
    val before = ad.width
    (0 until 200).foreach(_ => ad.add(0.1 + rng.nextGaussian() * 0.02))
    assert(ad.width < before + 200)
  }

  test("low false-positive rate on stationary data") {
    val rng = new Random(4)
    var fps = 0
    for (trial <- 0 until 10) {
      val ad = new Adwin(0.002)
      (0 until 500).foreach { _ =>
        if (ad.add(0.5 + rng.nextGaussian() * 0.1)) fps += 1
      }
    }
    assert(fps <= 2, s"false positives: $fps in 10 stationary trials")
  }

  test("detects gradual drift eventually") {
    val ad = new Adwin(0.05)
    val rng = new Random(5)
    var detected = -1
    for (i <- 0 until 2000 if detected < 0) {
      val level = if (i < 500) 0.5 else 0.5 + math.min(0.4, (i - 500) * 0.002)
      if (ad.add(level + rng.nextGaussian() * 0.05)) detected = i
    }
    assert(detected > 500 && detected < 1500, s"detected=$detected")
  }

  test("reset clears all state") {
    val ad = new Adwin()
    (0 until 100).foreach(i => ad.add(i.toDouble))
    ad.reset()
    assert(ad.width == 0 && ad.mean == 0.0)
  }

  test("constant input never triggers") {
    val ad = new Adwin(0.05)
    var any = false
    (0 until 1000).foreach(_ => any |= ad.add(0.7))
    assert(!any)
  }
}

class EddmSpec extends AnyFunSuite {

  /** Feed a Bernoulli error sequence with the given error rate. */
  private def feed(e: Eddm, rate: Double, n: Int, rng: Random): Int = {
    var detections = 0
    (0 until n).foreach { _ =>
      if (e.add(if (rng.nextDouble() < rate) 1.0 else 0.0)) detections += 1
    }
    detections
  }

  test("at most one spurious detection under a stable error rate") {
    val e = new Eddm()
    val rng = new Random(1)
    // EDDM is known to fire occasionally on stationary Bernoulli noise; the
    // bound checks it is rare, not absent.
    assert(feed(e, 0.1, 3000, rng) <= 1)
  }

  test("detects when the error rate jumps") {
    val rng = new Random(2)
    val e = new Eddm()
    feed(e, 0.05, 2000, rng)
    val det = feed(e, 0.5, 2000, rng)
    assert(det >= 1, "expected a drift detection after the error-rate jump")
  }

  test("improving error rate does not trigger") {
    val rng = new Random(3)
    val e = new Eddm()
    feed(e, 0.5, 1500, rng)
    assert(feed(e, 0.05, 1500, rng) == 0)
  }

  test("reset clears detection state") {
    val rng = new Random(4)
    val e = new Eddm()
    feed(e, 0.05, 1000, rng)
    e.reset()
    assert(feed(e, 0.05, 500, rng) == 0)
  }

  test("correct predictions alone never trigger") {
    val e = new Eddm()
    var any = false
    (0 until 5000).foreach(_ => any |= e.add(0.0))
    assert(!any)
  }
}
