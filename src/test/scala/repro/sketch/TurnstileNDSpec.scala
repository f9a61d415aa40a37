package repro.sketch

import repro.SparkSpec
import repro.SynthGraphs
import repro.core.{Neighborhood, StreamOp}

/** Tests for Algorithm 3 / Theorem 5.4 (turnstile Neighborhood Detection):
  * success under deletions, validity, strategy regimes, space shape.
  */
class TurnstileNDSpec extends SparkSpec {

  test("config: x = max(n/c, sqrt(n)) and dc = floor(d/c)") {
    val c1 = TurnstileConfig(100, 100, 20, 2, 1, 1.0, 1.0, 6)
    assert(c1.x == 50.0 && c1.dc == 10)
    val c2 = TurnstileConfig(100, 100, 20, 50, 1, 1.0, 1.0, 6)
    assert(c2.x == 10.0 && c2.dc == 1) // c > sqrt(n): x = sqrt(n)
  }

  test("edge coordinate round-trips") {
    val cfg = TurnstileConfig(10, 7, 4, 2, 1, 1.0, 1.0, 6)
    for (a <- 1L to 10L; b <- 1L to 7L)
      assert(cfg.coordEdge(cfg.edgeCoord(a, b)) == (a, b))
  }

  for {
    c <- Seq(2, 4)
    chaff <- Seq(0.0, 0.5)
  } test(s"planted star survives deletions (c=$c, chaff=$chaff)") {
    val n = 64L; val m = 256L; val d = 16
    var ok = 0
    val trials = 5
    for (t <- 1 to trials) {
      val (edges, planted) = SynthGraphs.plantedStar(n, m, d, maxBg = 3, seed = 100L * t + c)
      val ops = SynthGraphs.turnstileFrom(edges, m, chaff, seed = 200L * t + c)
      val adj = SynthGraphs.adjacencyOf(ops)
      assert(adj(planted).size == d, "chaff must not change the final graph")
      val alg = new TurnstileND(n, m, d, c, seed = 300L * t + c)
      val res = alg.processAll(ops).result()
      res.output.foreach { nb =>
        assert(nb.size >= math.max(1, d / c), s"size ${nb.size} < d/c")
        assert(Neighborhood.isValid(nb, adj), "must report only surviving edges")
        ok += 1
      }
    }
    assert(ok == trials, s"only $ok/$trials turnstile runs succeeded")
  }

  test("deleting every edge leaves nothing to report") {
    val (edges, _) = SynthGraphs.plantedStar(32, 64, 8, 2, seed = 9)
    val ops = edges.map(e => StreamOp(e, 1)) ++ edges.map(e => StreamOp(e, -1))
    val res = new TurnstileND(32, 64, 8, 2, seed = 10).processAll(ops).result()
    assert(res.output.isEmpty)
  }

  test("many-heavy regime: vertex sampling alone suffices (Lemma 5.2)") {
    // >= n/x vertices of degree >= d/c; disable edge sampling (ce tiny) and
    // the vertex strategy must still find a neighborhood.
    val n = 64L; val m = 70000L; val d = 16; val c = 4
    val rng = new scala.util.Random(5)
    val edges = rng.shuffle((1L to n).flatMap { a =>
      (1 to (if (a <= 32) d else 2)).map(i => repro.core.Edge(a, a * 1000 + i))
    }.toVector)
    val ops = edges.map(e => StreamOp(e, 1))
    val cfg = TurnstileConfig(n, m, d, c, seed = 6, cv = 2.0, ce = 0.001, buckets = 6)
    val res = new TurnstileND(cfg).processAll(ops).result()
    assert(res.succeeded)
    assert(res.strategy.contains(TurnstileStrategy.VertexSampling))
  }

  test("single-heavy regime: edge sampling rescues a missed vertex (Lemma 5.3)") {
    // Only one heavy vertex and a crippled vertex-sample (cv tiny): the
    // global edge samplers concentrate on the heavy vertex's edges.
    val n = 256L; val m = 1024L; val d = 32; val c = 2
    var edgeWins = 0
    val trials = 5
    for (t <- 1 to trials) {
      val (edges, planted) = SynthGraphs.uniformPlusPlanted(n, m * 8, d, bg = 1, seed = 40L + t)
      val ops = edges.map(e => StreamOp(e, 1))
      val cfg = TurnstileConfig(n, m * 8, d, c, seed = 50L + t, cv = 0.001, ce = 1.0, buckets = 6)
      val res = new TurnstileND(cfg).processAll(ops).result()
      if (res.succeeded && res.strategy.contains(TurnstileStrategy.EdgeSampling)) {
        assert(res.output.get.a == planted)
        edgeWins += 1
      }
    }
    assert(edgeWins >= trials - 1, s"edge sampling won only $edgeWins/$trials")
  }

  test("space shape: words shrink as c grows (dn/c^2 law, same instance)") {
    val n = 128L; val m = 512L; val d = 32
    val (edges, _) = SynthGraphs.plantedStar(n, m, d, 4, seed = 77)
    val ops = edges.map(e => StreamOp(e, 1))
    val words = Seq(2, 4, 8).map { c =>
      new TurnstileND(n, m, d, c, seed = 78, cv = 1.0, ce = 0.5).processAll(ops).result().totalWords
    }
    assert(words(0) > words(1) && words(1) > words(2),
      s"expected decreasing words in c, got $words")
  }

  test("result is deterministic given the seed") {
    val (edges, _) = SynthGraphs.plantedStar(48, 128, 12, 3, seed = 1)
    val ops = edges.map(e => StreamOp(e, 1))
    val r1 = new TurnstileND(48, 128, 12, 2, seed = 2).processAll(ops).result()
    val r2 = new TurnstileND(48, 128, 12, 2, seed = 2).processAll(ops).result()
    assert(r1.output == r2.output && r1.strategy == r2.strategy)
  }

  test("StreamOp rejects invalid deltas") {
    intercept[IllegalArgumentException](StreamOp(repro.core.Edge(1, 1), 0))
    intercept[IllegalArgumentException](StreamOp(repro.core.Edge(1, 1), 2))
  }
}
