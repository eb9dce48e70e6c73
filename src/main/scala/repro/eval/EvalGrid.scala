package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core.{FiCSUM, FiCSUMConfig}
import repro.baselines.{Arf, Dwm, Htcd, Rcd}
import repro.meta.MetaFunctions
import repro.stream.Datasets

/** Builds systems by name inside Spark tasks (names, not closures, cross
  * the serialization boundary).
  */
object Systems {

  /** Table V variant names are "fn:<group label>"; "fn:Shapley Value" maps
    * to the importance-only fingerprint.
    */
  def create(name: String, d: Int, k: Int, seed: Long): StreamSystem = name match {
    case "FiCSUM" => FiCSUM.full(d, k, seed = seed)
    case "S-MI"   => FiCSUM.supervised(d, k, seed = seed)
    case "U-MI"   => FiCSUM.unsupervised(d, k, seed = seed)
    case "ER"     => FiCSUM.errorRate(d, k, seed = seed)
    case "HTCD"   => new Htcd(d, k, seed = seed)
    case "RCD"    => new Rcd(d, k, seed = seed)
    case "DWM"    => new Dwm(d, k, seed = seed)
    case "ARF"    => new Arf(d, k, seed = seed)
    case s if s.startsWith("fn:") =>
      val label = s.stripPrefix("fn:")
      if (label == "Shapley Value")
        FiCSUM.singleFunction(s, d, k, IndexedSeq.empty, seed = seed)
      else {
        val fns = MetaFunctions.tableVGroups.collectFirst { case (l, f) if l == label => f }
          .getOrElse(throw new NoSuchElementException(s"unknown function group $label"))
        FiCSUM.singleFunction(s, d, k, fns, seed = seed)
      }
    case other => throw new NoSuchElementException(s"unknown system $other")
  }
}

/** One experiment cell of a table's grid. */
final case class Cell(dataset: String, system: String, seed: Long) extends Serializable

/** Aggregated (mean, std) of one measure over seeds. */
final case class Agg(mean: Double, std: Double) {
  def fmt(p: Int = 2): String = f"%%.${p}f (%%.${p}f)".format(mean, std)
}

/** Runs experiment grids with each cell as one Spark task — the evaluation
  * is embarrassingly parallel over (dataset × system × seed), which is how
  * this reproduction uses the cluster (DESIGN.md §3).
  */
object EvalGrid {

  def run(spark: SparkSession, cells: Seq[Cell], probeEvery: Int = 100): Seq[RunOutcome] = {
    val sc = spark.sparkContext
    sc.parallelize(cells, cells.length)
      .map { cell =>
        val ds = Datasets.byName(cell.dataset)
        val stream = ds.build(cell.seed)
        val system = Systems.create(cell.system, stream.numFeatures, stream.numClasses, cell.seed)
        Runner.run(system, stream, cell.seed, probeEvery)
      }
      .collect()
      .toSeq
  }

  def aggregate(outcomes: Seq[RunOutcome], measure: RunOutcome => Double): Map[(String, String), Agg] =
    outcomes
      .groupBy(o => (o.dataset, o.system))
      .view
      .mapValues { os =>
        val vals = os.map(measure).filterNot(_.isNaN)
        if (vals.isEmpty) Agg(Double.NaN, Double.NaN)
        else Agg(Metrics.mean(vals), Metrics.stdDev(vals))
      }
      .toMap
}
