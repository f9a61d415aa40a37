package repro.spark

import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.execution.streaming.runtime.MemoryStream
import org.apache.spark.sql.streaming.{GroupState, GroupStateTimeout, OutputMode}
import scala.util.Random

import repro.core.{FrequentItemReport, InsertionOnlyND, WitnessRecord}

/** One micro-batch input row: an item occurrence with its witness and the
  * global stream position (events are replayed in `pos` order per key so
  * micro-batch boundaries do not change the collected witness set).
  */
final case class WitnessEvent(item: Long, witness: Long, pos: Long)

/** Per-key operator state: total occurrences seen, plus one witness buffer
  * per threshold run (run i buffers witnesses from occurrence d1(i)
  * onwards, capped at d2 — Algorithm 1's collection rule).
  */
final case class WitnessState(count: Long, buffers: Seq[Seq[Long]])

/** Candidate row emitted each micro-batch (Update mode); the latest row per
  * item is the key's final state.
  */
final case class WitnessCandidate(item: Long, count: Long, buffers: Seq[Seq[Long]])

/** Structured Streaming stateful operator for frequent elements with
  * witnesses (DESIGN.md §4, S8; the band hint's "sketch counters per key
  * with attached witness timestamps, updated per micro-batch").
  *
  * `flatMapGroupsWithState` keeps (count, witness buffers) per item. A key
  * starts buffering witnesses for run i once its count reaches
  * d1(i) = max(1, floor(i*d/c)) and caps the buffer at d2 = floor(d/c).
  * The uniform sample over candidate keys is drawn at query end by hash
  * priority (smallest xxhash-style priority among candidates = uniform).
  *
  * Space modes:
  *  - ungated (gate = 1.0): state for every key crossing d1 — more space
  *    than the sequential reservoir but exact candidate recall;
  *  - Bernoulli gate p: run i buffers key k only if hash(k, i) < p —
  *    bounded expected state, success probability degrades gracefully.
  *    (Table 5 measures the tradeoff.)
  */
object StreamingWitness {

  final case class Config(nItems: Long, d: Int, c: Int, seed: Long, gate: Double = 1.0) {
    require(c >= 2 && gate > 0 && gate <= 1.0)
    val d2: Int = InsertionOnlyND.targetSize(d, c)
    val thresholds: Vector[Int] = Vector.tabulate(c)(i => InsertionOnlyND.threshold(i, d, c))
  }

  private def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Uniform (0,1] hash used for both the Bernoulli gate and the final
    * priority sample.
    */
  private def unitHash(seed: Long, run: Int, key: Long): Double = {
    val h = mix(seed ^ (run.toLong << 32) ^ key)
    ((h >>> 11).toDouble + 1.0) / (1L << 53).toDouble
  }

  /** The stateful update function: replay this batch's events in stream
    * order, bump the count, append to each run's buffer per the collection
    * rule, emit the refreshed candidate row.
    */
  def updateKey(cfg: Config)(
      item: Long, events: Iterator[WitnessEvent],
      state: GroupState[WitnessState]): Iterator[WitnessCandidate] = {
    val prev = state.getOption.getOrElse(
      WitnessState(0L, Vector.fill(cfg.c)(Vector.empty[Long])))
    var count   = prev.count
    val buffers = prev.buffers.map(_.toVector).toArray
    val gated   = Array.tabulate(cfg.c)(i => unitHash(cfg.seed, i, item) <= cfg.gate)
    events.toVector.sortBy(_.pos).foreach { ev =>
      count += 1
      var i = 0
      while (i < cfg.c) {
        if (gated(i) && count >= cfg.thresholds(i) && buffers(i).size < cfg.d2)
          buffers(i) = buffers(i) :+ ev.witness
        i += 1
      }
    }
    val next = WitnessState(count, buffers.toVector)
    state.update(next)
    Iterator.single(WitnessCandidate(item, count, next.buffers))
  }

  /** Wire the operator over a streaming Dataset of events. */
  def candidates(events: Dataset[WitnessEvent], cfg: Config): Dataset[WitnessCandidate] = {
    val spark = events.sparkSession
    import spark.implicits._
    events
      .groupByKey(_.item)
      .flatMapGroupsWithState[WitnessState, WitnessCandidate](
        OutputMode.Update, GroupStateTimeout.NoTimeout)(updateKey(cfg))
  }

  /** Final selection over the latest candidate row per item: per run, the
    * candidates with a full buffer; choose a uniform random successful run,
    * then the min-priority (= uniform) candidate of that run.
    */
  def select(latest: Seq[WitnessCandidate], cfg: Config): (Option[FrequentItemReport], Vector[Boolean]) = {
    val perRun: Vector[Vector[WitnessCandidate]] = Vector.tabulate(cfg.c) { i =>
      latest.filter(c => c.buffers(i).size >= cfg.d2).toVector
    }
    val succeeded = perRun.map(_.nonEmpty)
    val okRuns = succeeded.zipWithIndex.filter(_._1).map(_._2)
    if (okRuns.isEmpty) (None, succeeded)
    else {
      val run  = okRuns(new Random(cfg.seed).nextInt(okRuns.size))
      val best = perRun(run).minBy(c => unitHash(cfg.seed ^ 0xabcdefL, run, c.item))
      (Some(FrequentItemReport(best.item, best.buffers(run).toVector)), succeeded)
    }
  }

  /** End-to-end micro-batched execution over an in-memory stream: feed
    * `records` in `nBatches` chunks through a MemoryStream, run the
    * stateful query to completion, and select the final report.
    *
    * @return (report, per-run success flags, number of keys holding state)
    */
  def runMicroBatched(spark: SparkSession, records: Seq[WitnessRecord], nBatches: Int,
                      cfg: Config): (Option[FrequentItemReport], Vector[Boolean], Int) = {
    import spark.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = spark.sqlContext
    val source = MemoryStream[WitnessEvent]
    val queryName = s"witness_${math.abs(cfg.seed)}_${System.nanoTime()}"
    val query = candidates(source.toDS(), cfg)
      .writeStream
      .format("memory")
      .queryName(queryName)
      .outputMode("update")
      .start()
    try {
      val events = records.zipWithIndex.map { case (r, i) =>
        WitnessEvent(r.item, r.witness, i.toLong)
      }
      val batchSize = math.max(1, math.ceil(events.size.toDouble / nBatches).toInt)
      events.grouped(batchSize).foreach { batch =>
        source.addData(batch)
        query.processAllAvailable()
      }
      val rows = spark.table(queryName).as[WitnessCandidate].collect()
      // Update mode emits one row per key per batch; keep the latest
      // (largest count) per item.
      val latest = rows.groupBy(_.item).values.map(_.maxBy(_.count)).toVector
      val (report, succ) = select(latest, cfg)
      (report, succ, latest.count(_.buffers.exists(_.nonEmpty)))
    } finally {
      query.stop()
      spark.catalog.dropTempView(queryName)
    }
  }
}
