package repro.meta

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class SeqStatsSpec extends AnyFunSuite {
  import SeqStats._

  private def gaussian(n: Int, seed: Long): Array[Double] = {
    val rng = new Random(seed)
    Array.fill(n)(rng.nextGaussian())
  }

  test("mean of known sequence") {
    assert(mean(Array(1.0, 2.0, 3.0)) == 2.0)
    assert(mean(Array.empty[Double]) == 0.0)
  }

  test("stdDev of known sequence (population)") {
    assert(math.abs(stdDev(Array(2.0, 4.0, 4.0, 4.0, 5.0, 5.0, 7.0, 9.0)) - 2.0) < 1e-9)
    assert(stdDev(Array(5.0)) == 0.0)
  }

  test("skewness: symmetric ~0, right-tailed > 0") {
    assert(math.abs(skewness(gaussian(20000, 1))) < 0.1)
    val rightTailed = gaussian(20000, 2).map(v => math.exp(v))
    assert(skewness(rightTailed) > 1.0)
    assert(skewness(Array(1.0, 1.0, 1.0)) == 0.0) // constant guard
  }

  test("kurtosis: gaussian ~3, uniform ~1.8") {
    assert(math.abs(kurtosis(gaussian(50000, 3)) - 3.0) < 0.25)
    val rng = new Random(4)
    val unif = Array.fill(50000)(rng.nextDouble())
    assert(math.abs(kurtosis(unif) - 1.8) < 0.1)
  }

  test("acf: iid ~0, AR(1) matches rho approximately") {
    assert(math.abs(acf(gaussian(5000, 5), 1)) < 0.05)
    val rng = new Random(6)
    val rho = 0.7
    val ar = new Array[Double](5000)
    var prev = 0.0
    for (i <- ar.indices) { prev = rho * prev + rng.nextGaussian(); ar(i) = prev }
    assert(math.abs(acf(ar, 1) - rho) < 0.05)
    assert(math.abs(acf(ar, 2) - rho * rho) < 0.07)
  }

  test("acf guards degenerate inputs") {
    assert(acf(Array(1.0, 1.0, 1.0, 1.0), 1) == 0.0)
    assert(acf(Array(1.0, 2.0), 2) == 0.0)
  }

  test("pacf lag 1 equals acf lag 1; lag-2 kills AR(1) dependence") {
    val rng = new Random(7)
    val ar = new Array[Double](8000)
    var prev = 0.0
    for (i <- ar.indices) { prev = 0.6 * prev + rng.nextGaussian(); ar(i) = prev }
    assert(pacf(ar, 1) == acf(ar, 1))
    assert(math.abs(pacf(ar, 2)) < 0.08, s"pacf2=${pacf(ar, 2)}")
    intercept[IllegalArgumentException](pacf(ar, 3))
  }

  test("lag mutual information: dependent > independent") {
    val rng = new Random(8)
    val indep = Array.fill(3000)(rng.nextDouble())
    val dep = new Array[Double](3000)
    var prev = 0.5
    for (i <- dep.indices) { prev = 0.9 * prev + 0.1 * rng.nextDouble(); dep(i) = prev }
    assert(lagMutualInformation(dep) > lagMutualInformation(indep) + 0.1)
    assert(lagMutualInformation(Array(1.0, 2.0)) == 0.0)
    assert(lagMutualInformation(Array.fill(100)(3.0)) == 0.0)
  }

  test("turning point rate: monotone 0, alternating 1, iid ~2/3") {
    assert(turningPointRate((1 to 50).map(_.toDouble).toArray) == 0.0)
    val alt = Array.tabulate(50)(i => if (i % 2 == 0) 0.0 else 1.0)
    assert(turningPointRate(alt) == 1.0)
    assert(math.abs(turningPointRate(gaussian(20000, 9)) - 2.0 / 3.0) < 0.02)
    assert(turningPointRate(Array(1.0, 2.0)) == 0.0)
  }

  test("histogram entropy: uniform > concentrated, constant = 0") {
    val rng = new Random(10)
    val unif = Array.fill(5000)(rng.nextDouble())
    val concentrated = Array.fill(5000)(rng.nextGaussian() * 0.01) :+ 5.0
    assert(histogramEntropy(unif) > histogramEntropy(concentrated))
    assert(histogramEntropy(Array.fill(10)(2.0)) == 0.0)
    assert(histogramEntropy(unif) <= math.log(8) + 1e-9)
  }
}

class EmdSpec extends AnyFunSuite {

  test("IMF extraction of a fast sine over a slow trend keeps the oscillation") {
    val n = 256
    val signal = Array.tabulate(n)(i => math.sin(2 * math.Pi * i / 8.0) + 0.01 * i)
    val (imf, residual) = Emd.siftImf(signal)
    // The IMF retains the oscillatory energy; the residual is smoother.
    val imfTurn = SeqStats.turningPointRate(imf)
    val resTurn = SeqStats.turningPointRate(residual)
    assert(imfTurn > resTurn, s"imf=$imfTurn res=$resTurn")
  }

  test("imf + residual reconstruct the signal") {
    val rng = new Random(1)
    val signal = Array.fill(128)(rng.nextDouble())
    val (imf, residual) = Emd.siftImf(signal)
    signal.indices.foreach(i => assert(math.abs(imf(i) + residual(i) - signal(i)) < 1e-9))
  }

  test("monotone signal has a ~zero IMF") {
    val signal = Array.tabulate(64)(_.toDouble)
    val (imf, _) = Emd.siftImf(signal)
    assert(imf.forall(v => math.abs(v) < 1e-9))
  }

  test("imfEntropy is finite and zero for short inputs") {
    val rng = new Random(2)
    val signal = Array.fill(100)(rng.nextDouble())
    val e1 = Emd.imfEntropy(signal, 1)
    val e2 = Emd.imfEntropy(signal, 2)
    assert(!e1.isNaN && !e1.isInfinite && e1 >= 0)
    assert(!e2.isNaN && !e2.isInfinite && e2 >= 0)
    assert(Emd.imfEntropy(Array(1.0, 2.0, 3.0), 1) == 0.0)
    intercept[IllegalArgumentException](Emd.imfEntropy(signal, 0))
  }

  test("oscillation-rich vs smooth signals have different IMF entropy") {
    val fast = Array.tabulate(200)(i => math.sin(i * 2.1) + 0.1 * math.sin(i * 0.3))
    val slow = Array.tabulate(200)(i => math.sin(i * 0.05))
    assert(math.abs(Emd.imfEntropy(fast, 1) - Emd.imfEntropy(slow, 1)) > 1e-3)
  }
}

class MetaFunctionsSpec extends AnyFunSuite {

  test("registry exposes the 12 sequence functions of Table I") {
    assert(MetaFunctions.all.length == 12)
    assert(MetaFunctions.all.map(_.name).distinct.length == 12)
  }

  test("byName resolves and rejects") {
    assert(MetaFunctions.byName("mean").name == "mean")
    intercept[NoSuchElementException](MetaFunctions.byName("nope"))
  }

  test("Table V groups pair lag functions together") {
    val groups = MetaFunctions.tableVGroups.toMap
    assert(groups("Autocorrelation").map(_.name) == IndexedSeq("acf1", "acf2"))
    assert(groups("Partial Autocorrelation").map(_.name) == IndexedSeq("pacf1", "pacf2"))
    assert(groups("Entropy of IMFs").map(_.name) == IndexedSeq("imf1", "imf2"))
    assert(groups.size == 9)
  }

  test("every function maps an arbitrary sequence to a finite value") {
    val rng = new Random(3)
    val xs = Array.fill(60)(rng.nextDouble() * 10 - 5)
    MetaFunctions.all.foreach { f =>
      val v = f(xs)
      assert(!v.isNaN && !v.isInfinite, f.name)
    }
  }

  test("every function guards tiny inputs") {
    MetaFunctions.all.foreach { f =>
      val v = f(Array(1.0))
      assert(!v.isNaN && !v.isInfinite, f.name)
    }
  }
}
