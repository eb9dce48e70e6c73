package repro.sparkstream

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import repro.SparkSpec
import repro.core.{FiCSUM, FiCSUMConfig, FingerprintSpec}
import repro.stream.Datasets

class StreamingDriftSpec extends SparkSpec {

  test("stateful streaming drift operator matches the sequential engine") {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext

    val stream = Datasets.stagger.build(2)
    val n = 1200
    val rows = WindowFingerprints.toRows(
      stream.copy(obs = stream.obs.take(n), conceptIds = stream.conceptIds.take(n)))

    val cfg = FiCSUMConfig()
    val input = MemoryStream[ObsRow]
    val events = StreamingDrift.detect(spark, input.toDS(), stream.numFeatures,
      stream.numClasses, cfg, seed = 9)
    val query = events.writeStream
      .format("memory").queryName("drift_out").outputMode("append").start()

    try {
      // Feed in several micro-batches so engine state round-trips through
      // the state store between batches.
      rows.grouped(300).foreach { chunk =>
        input.addData(chunk)
        query.processAllAvailable()
      }
    } finally query.stop()

    val got = spark.sql("select * from drift_out").as[DriftEvent].collect().sortBy(_.ts)
    assert(got.length == n)

    // Sequential reference with the identical config and seed.
    val engine = new FiCSUM("FiCSUM", stream.numFeatures, stream.numClasses,
      FingerprintSpec.full(stream.numFeatures), cfg, seed = 9)
    val expected = stream.obs.take(n).zipWithIndex.map { case (o, i) =>
      val before = engine.driftCount
      val (p, m) = engine.step(o.x, o.y)
      DriftEvent(0, i.toLong, p, m, engine.driftCount > before)
    }

    got.zip(expected).foreach { case (g, e) =>
      assert(g == e, s"divergence at ts=${g.ts}: $g vs $e")
    }
    assert(got.count(_.drift) == engine.driftCount)
  }

  test("streaming operator emits drift events on a drifting stream") {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext

    val stream = Datasets.stagger.build(1)
    val rows = WindowFingerprints.toRows(stream)
    val input = MemoryStream[ObsRow]
    val events = StreamingDrift.detect(spark, input.toDS(), stream.numFeatures,
      stream.numClasses, seed = 1)
    val query = events.writeStream
      .format("memory").queryName("drift_out2").outputMode("append").start()
    try {
      input.addData(rows)
      query.processAllAvailable()
    } finally query.stop()

    val got = spark.sql("select * from drift_out2").as[DriftEvent].collect()
    assert(got.length == stream.length)
    assert(got.count(_.drift) >= 2, s"drift events: ${got.count(_.drift)}")
    assert(got.map(_.modelId).distinct.length >= 2)
  }
}
