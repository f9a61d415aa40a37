package repro.core

import scala.util.Random

import repro.SparkSpec
import repro.SynthGraphs

/** Unit tests for Algorithm 1 (Deg-Res-Sampling) — collection rule,
  * reservoir uniformity, Lemma 3.1 success bound, space accounting.
  */
class DegResSamplingSpec extends SparkSpec {

  /** Feed edges through a tracker + single sampler. */
  private def feed(edges: Seq[Edge], d1: Int, d2: Int, s: Int, seed: Long): DegResSampling = {
    val tracker = new DegreeTracker
    val alg = new DegResSampling(d1, d2, s, new Random(seed))
    edges.foreach(e => alg.process(e, tracker.bump(e.a)))
    alg
  }

  test("degree tracker counts exactly") {
    val t = new DegreeTracker
    val edges = Seq(Edge(1, 1), Edge(1, 2), Edge(2, 1), Edge(1, 3))
    edges.foreach(e => t.bump(e.a))
    assert(t.degree(1) == 3 && t.degree(2) == 1 && t.degree(3) == 0)
    assert(t.trackedVertices == 2)
    assert(t.words == 2)
  }

  test("collects exactly the edges with ranks d1..d1+d2-1 in stream order") {
    // Vertex 7's edges arrive at witnesses 10,20,30,40,50; d1=2, d2=2 must
    // collect the 2nd and 3rd edges (20, 30).
    val edges = (1 to 5).map(i => Edge(7, i * 10L))
    val alg = feed(edges, d1 = 2, d2 = 2, s = 4, seed = 1)
    val nb = alg.storedNeighborhoods.find(_.a == 7L).get
    assert(nb.neighbors == Vector(20L, 30L))
  }

  test("stored neighborhood size is min(d2, deg - d1 + 1)") {
    for (deg <- 1 to 8; d1 <- 1 to 4; d2 <- 1 to 4) {
      val edges = (1 to deg).map(i => Edge(1, i.toLong))
      val alg = feed(edges, d1, d2, s = 2, seed = deg * 100 + d1 * 10 + d2)
      val expected = math.min(d2, deg - d1 + 1)
      val stored = alg.storedNeighborhoods.find(_.a == 1L)
      if (deg >= d1) assert(stored.get.size == expected,
        s"deg=$deg d1=$d1 d2=$d2: got ${stored.get.size}, want $expected")
      else assert(stored.isEmpty, s"deg=$deg < d1=$d1 must not enter reservoir")
    }
  }

  test("small-reservoir regime (few crossing vertices) stores all of them") {
    // 3 vertices cross d1=2; s=5 > 3, so all are stored.
    val edges = Seq(
      Edge(1, 1), Edge(1, 2), Edge(2, 1), Edge(2, 2),
      Edge(3, 1), Edge(3, 2), Edge(4, 1))
    val alg = feed(edges, d1 = 2, d2 = 1, s = 5, seed = 3)
    assert(alg.storedNeighborhoods.map(_.a).toSet == Set(1L, 2L, 3L))
  }

  test("success iff some stored neighborhood reaches d2") {
    val edges = Seq(Edge(1, 1), Edge(1, 2), Edge(1, 3), Edge(2, 1))
    assert(feed(edges, 1, 3, 4, 5).succeeded)
    assert(!feed(edges, 1, 4, 4, 5).succeeded) // nobody has 4 edges
  }

  test("result returns a full neighborhood and fail returns None") {
    val edges = (1 to 6).map(i => Edge(1, i.toLong))
    val ok = feed(edges, 1, 4, 2, 6)
    assert(ok.result().get.size == 4)
    val fail = feed(edges, 1, 7, 2, 6)
    assert(fail.result().isEmpty)
  }

  test("reservoir holds a uniform sample: each crossing vertex ~ s/x rate") {
    // 20 vertices each of degree 2 cross d1=2; s=5. Over many seeded runs
    // every vertex should be sampled close to 5/20 = 25% of the time.
    val hits = Array.fill(21)(0)
    val trials = 2000
    val baseEdges = (1 to 20).flatMap(a => Seq(Edge(a.toLong, 1), Edge(a.toLong, 2)))
    for (t <- 1 to trials) {
      val rng = new Random(t.toLong)
      val shuffled = rng.shuffle(baseEdges)
      val alg = feed(shuffled, d1 = 2, d2 = 1, s = 5, seed = 7777L + t)
      alg.storedNeighborhoods.foreach(nb => hits(nb.a.toInt) += 1)
    }
    val rates = (1 to 20).map(a => hits(a).toDouble / trials)
    rates.foreach(r => assert(math.abs(r - 0.25) < 0.05,
      s"sampling rate $r deviates from uniform 0.25"))
  }

  // Lemma 3.1: success prob >= 1 - (1 - s/n1)^n2 when n1 vertices have
  // degree >= d1 and n2 of them have degree >= d1 + d2 - 1.
  for {
    (n1, n2, s) <- Seq((40, 5, 10), (60, 10, 10), (30, 30, 5), (50, 2, 25))
  } test(s"Lemma 3.1 bound holds empirically (n1=$n1, n2=$n2, s=$s)") {
    val d1 = 2; val d2 = 3
    val bound = 1.0 - math.pow(1.0 - s.toDouble / n1, n2.toDouble)
    val trials = 300
    var successes = 0
    for (t <- 1 to trials) {
      val rng = new Random(900000L + t)
      // n1 vertices of degree exactly d1 + (n2 of them get d1+d2-1).
      val edges = rng.shuffle((1 to n1).flatMap { a =>
        val deg = if (a <= n2) d1 + d2 - 1 else d1
        (1 to deg).map(i => Edge(a.toLong, i.toLong))
      })
      if (feed(edges, d1, d2, s, 31L * t).succeeded) successes += 1
    }
    val rate = successes.toDouble / trials
    // Allow statistical slack below the bound (3 sigma of a binomial).
    val slack = 3 * math.sqrt(bound * (1 - bound) / trials) + 0.02
    assert(rate >= bound - slack, s"rate $rate below Lemma 3.1 bound $bound")
  }

  test("space: words = reservoir ids + collected edges, peak tracked") {
    val edges = (1 to 6).map(i => Edge(1, i.toLong)) ++ (1 to 6).map(i => Edge(2, i.toLong))
    val alg = feed(edges, 1, 4, 2, 11)
    // two vertices stored, each with 4 collected edges
    assert(alg.currentWords == 2 + 8)
    assert(alg.peakWords >= alg.currentWords)
  }

  test("eviction frees collected edges (space does not leak)") {
    // s=1 with many crossing vertices: at most 1 + d2 words at any time.
    val rng = new Random(5)
    val edges = rng.shuffle((1 to 50).flatMap(a => (1 to 3).map(i => Edge(a.toLong, i.toLong))))
    val alg = feed(edges, 1, 3, 1, 99)
    assert(alg.peakWords <= 1 + 3)
  }

  test("rejects invalid parameters") {
    intercept[IllegalArgumentException](new DegResSampling(0, 1, 1, new Random(1)))
    intercept[IllegalArgumentException](new DegResSampling(1, 0, 1, new Random(1)))
    intercept[IllegalArgumentException](new DegResSampling(1, 1, 0, new Random(1)))
  }

  test("planted star is always found when it is the only crossing vertex") {
    for (seed <- 1 to 20) {
      val (edges, planted) = SynthGraphs.uniformPlusPlanted(
        n = 50, m = 200, d = 10, bg = 2, seed = seed.toLong)
      val alg = feed(edges, d1 = 5, d2 = 5, s = 3, seed = seed * 7L)
      assert(alg.succeeded, s"seed=$seed")
      assert(alg.result().get.a == planted)
    }
  }
}
