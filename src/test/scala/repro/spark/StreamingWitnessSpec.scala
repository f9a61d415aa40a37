package repro.spark

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec, SynthGraphs}
import repro.core.WitnessRecord

/** Tests for the Structured Streaming stateful operator (S8): per-key
  * counts, witness collection rule, micro-batch invariance, final
  * selection, Bernoulli-gate space mode.
  */
class StreamingWitnessSpec extends SparkSpec {

  private def stream(nItems: Long, total: Long, alpha: Double, seed: Long) =
    SynthGraphs.zipfWitnessStream(nItems, total, alpha, seed)

  test("per-key counts equal the true frequencies (oracle-checked)") {
    val (recs, freq) = stream(50, 600, 1.1, seed = 1)
    val d = freq.values.max.toInt
    val cfg = StreamingWitness.Config(nItems = 50, d = d, c = 2, seed = 2)
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val source = org.apache.spark.sql.execution.streaming.runtime.MemoryStream[WitnessEvent]
    val q = StreamingWitness.candidates(source.toDS(), cfg)
      .writeStream.format("memory").queryName("sw_counts").outputMode("update").start()
    try {
      source.addData(recs.zipWithIndex.map { case (r, i) => WitnessEvent(r.item, r.witness, i.toLong) })
      q.processAllAvailable()
      val latest = spark.table("sw_counts").as[WitnessCandidate].collect()
        .groupBy(_.item).map { case (_, rs) => rs.maxBy(_.count) }.toSeq
      val got = latest.map(c => (c.item, c.count)).toDF("item", "cnt")
      val truth = recs.map(r => (r.item, r.witness)).toDF("item", "witness")
      Oracle.assertEquivalent(
        got.select(col("item"), col("cnt")),
        "SELECT item, count(*) AS cnt FROM truth GROUP BY item",
        "truth" -> truth)
    } finally { q.stop(); spark.catalog.dropTempView("sw_counts") }
  }

  test("collection rule: buffers hold witnesses from occurrence d1 onward, capped at d2") {
    // One item, 10 occurrences with witnesses 100..1000; d=8, c=2 =>
    // run 0 (d1=1) buffers the first 4 witnesses, run 1 (d1=4) buffers
    // witnesses of occurrences 4..7.
    val recs = (1 to 10).map(i => WitnessRecord(3, i * 100L))
    val cfg = StreamingWitness.Config(nItems = 5, d = 8, c = 2, seed = 4)
    val (report, succ, _) = StreamingWitness.runMicroBatched(spark, recs, nBatches = 3, cfg)
    assert(succ == Vector(true, true))
    assert(report.nonEmpty)
    val w = report.get.witnesses
    assert(w == Vector(100L, 200L, 300L, 400L) || w == Vector(400L, 500L, 600L, 700L),
      s"buffer $w violates the collection rule")
  }

  test("micro-batch boundaries do not change the outcome (1 vs 7 batches)") {
    val (recs, freq) = stream(40, 500, 1.2, seed = 11)
    val d = freq.values.max.toInt
    val cfg = StreamingWitness.Config(nItems = 40, d = d, c = 2, seed = 12)
    val r1 = StreamingWitness.runMicroBatched(spark, recs, nBatches = 1, cfg)
    val r7 = StreamingWitness.runMicroBatched(spark, recs, nBatches = 7, cfg)
    assert(r1._1 == r7._1, "report must be batch-count invariant")
    assert(r1._2 == r7._2, "per-run success must be batch-count invariant")
  }

  test("reported witnesses are true witnesses of a sufficiently frequent item") {
    val (recs, freq) = stream(60, 900, 1.1, seed = 21)
    val d = freq.values.max.toInt
    val cfg = StreamingWitness.Config(nItems = 60, d = d, c = 3, seed = 22)
    val (report, _, _) = StreamingWitness.runMicroBatched(spark, recs, nBatches = 4, cfg)
    assert(report.nonEmpty)
    val r = report.get
    assert(r.witnessCount == cfg.d2)
    val trueW = recs.filter(_.item == r.item).map(_.witness).toSet
    assert(r.witnesses.forall(trueW.contains))
    assert(freq(r.item) >= cfg.d2, "reported item must actually be d/c-frequent")
  }

  test("ungated operator matches the sequential candidate semantics") {
    // Ungated: every key crossing d1(run) with >= d2 collectable witnesses
    // is a candidate for that run — compare against a direct computation.
    val (recs, freq) = stream(30, 400, 1.0, seed = 31)
    val d = freq.values.max.toInt
    val cfg = StreamingWitness.Config(nItems = 30, d = d, c = 2, seed = 32)
    val (_, succ, _) = StreamingWitness.runMicroBatched(spark, recs, nBatches = 5, cfg)
    val expectSucc = Vector.tabulate(cfg.c) { i =>
      val d1 = cfg.thresholds(i)
      freq.values.exists(f => f >= d1 + cfg.d2 - 1)
    }
    assert(succ == expectSucc, s"got $succ, expected $expectSucc from frequencies")
  }

  test("Bernoulli gate shrinks state while keeping heavy hitters findable") {
    val (recs, freq) = stream(200, 3000, 1.3, seed = 41)
    val d = freq.values.max.toInt
    val full  = StreamingWitness.Config(nItems = 200, d = d, c = 2, seed = 42, gate = 1.0)
    val gated = StreamingWitness.Config(nItems = 200, d = d, c = 2, seed = 42, gate = 0.3)
    val (rFull, _, stateFull)   = StreamingWitness.runMicroBatched(spark, recs, 3, full)
    val (rGated, _, stateGated) = StreamingWitness.runMicroBatched(spark, recs, 3, gated)
    assert(rFull.nonEmpty)
    assert(stateGated < stateFull, s"gate must shrink buffered keys ($stateGated >= $stateFull)")
    // With gate=0.3 over many candidate keys, some run still succeeds whp.
    rGated.foreach { r =>
      val trueW = recs.filter(_.item == r.item).map(_.witness).toSet
      assert(r.witnesses.forall(trueW.contains))
    }
  }

  test("gate validation") {
    intercept[IllegalArgumentException](
      StreamingWitness.Config(nItems = 10, d = 4, c = 2, seed = 1, gate = 0.0))
    intercept[IllegalArgumentException](
      StreamingWitness.Config(nItems = 10, d = 4, c = 1, seed = 1))
  }
}
