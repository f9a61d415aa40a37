package repro.spark

import repro.{SparkSpec, SynthGraphs}
import repro.core.StreamOp
import repro.sketch.{TurnstileConfig, TurnstileND}

/** The distributed sketch build must be bit-identical to the sequential
  * Algorithm 3 given the same config: ℓ₀ sketches are linear and the seeds
  * coincide, so partitioning cannot change any sampler's final state.
  */
class SparkL0Spec extends SparkSpec {

  private def instance(n: Long, m: Long, d: Int, chaff: Double, seed: Long): Vector[StreamOp] = {
    val (edges, _) = SynthGraphs.plantedStar(n, m, d, maxBg = 3, seed)
    SynthGraphs.turnstileFrom(edges, m, chaff, seed + 1)
  }

  for {
    (c, chaff) <- Seq((2, 0.0), (2, 0.5), (4, 0.3))
  } test(s"Spark build == sequential build (c=$c, chaff=$chaff)") {
    val n = 48L; val m = 192L; val d = 12
    val ops = instance(n, m, d, chaff, seed = 100L * c + (chaff * 10).toInt)
    val cfg = TurnstileConfig(n, m, d, c, seed = 9L * c, cv = 1.0, ce = 0.3, buckets = 6)
    val seqRes   = new TurnstileND(cfg).processAll(ops).result()
    val sparkRes = SparkL0.run(spark, ops, cfg)
    assert(sparkRes.output == seqRes.output, "outputs differ")
    assert(sparkRes.strategy == seqRes.strategy, "strategies differ")
    assert(sparkRes.vertexSamplerWords == seqRes.vertexSamplerWords, "vertex words differ")
    assert(sparkRes.edgeSamplerWords == seqRes.edgeSamplerWords, "edge words differ")
  }

  test("Spark build succeeds and validates on a turnstile planted star") {
    val n = 64L; val m = 256L; val d = 16
    val (edges, planted) = SynthGraphs.plantedStar(n, m, d, maxBg = 3, seed = 7)
    val ops = SynthGraphs.turnstileFrom(edges, m, chaffFraction = 0.4, seed = 8)
    val adj = SynthGraphs.adjacencyOf(ops)
    val cfg = TurnstileConfig(n, m, d, 2, seed = 11, cv = 1.0, ce = 0.5, buckets = 6)
    val res = SparkL0.run(spark, ops, cfg)
    assert(res.succeeded)
    val nb = res.output.get
    assert(nb.size >= cfg.dc)
    assert(repro.core.Neighborhood.isValid(nb, adj))
    assert(adj(planted).size == d)
  }

  test("partitioning is irrelevant: different shuffle of ops, same result") {
    val n = 32L; val m = 128L; val d = 8
    val ops = instance(n, m, d, 0.2, seed = 55)
    val cfg = TurnstileConfig(n, m, d, 2, seed = 56, cv = 1.0, ce = 0.3, buckets = 6)
    val shuffled = new scala.util.Random(57).shuffle(ops)
    val r1 = SparkL0.run(spark, ops, cfg)
    val r2 = SparkL0.run(spark, shuffled, cfg)
    assert(r1.output == r2.output && r1.strategy == r2.strategy)
  }
}
