package repro.jobs

import repro.eval.{Runner, Systems}
import repro.stream.Datasets

/** Quick sequential smoke run (no Spark): one system on one dataset.
  * Usage: runMain repro.jobs.Smoke [dataset] [system] [seed]
  */
object Smoke {
  def main(args: Array[String]): Unit = {
    val dataset = if (args.length > 0) args(0) else "STAGGER"
    val system  = if (args.length > 1) args(1) else "FiCSUM"
    val seed    = if (args.length > 2) args(2).toLong else 1L
    val stream = Datasets.byName(dataset).build(seed)
    val sys = Systems.create(system, stream.numFeatures, stream.numClasses, seed)
    val out = Runner.run(sys, stream, seed)
    val extra = sys match {
      case f: repro.core.FiCSUM =>
        s" fps=${f.fingerprintUpdates} det=${f.detectorUpdates} drifts=${f.driftCount} repo=${f.repositorySize}"
      case _ => ""
    }
    println(f"${out.dataset}%-10s ${out.system}%-8s seed=$seed kappa=${out.kappa}%.3f " +
      f"cF1=${out.cF1}%.3f disc=${out.discrimination}%.1f models=${out.numModels} " +
      f"runtime=${out.runtimeMs}ms$extra")
  }
}
