package repro.sketch

import repro.SparkSpec

/** Unit + property tests for the ℓ₀-sampler substrate: recovery, linearity,
  * merge, deletions, uniformity. Property-style tests use seeded random
  * update sequences (no scalatest/scalacheck bridge in the offline cache).
  */
class L0SamplerSpec extends SparkSpec {

  test("zero vector samples None") {
    val s = new L0Sampler(1000, seed = 1)
    assert(s.sample().isEmpty)
  }

  test("singleton vector is recovered exactly") {
    for (x <- Seq(0L, 1L, 17L, 999L)) {
      val s = new L0Sampler(1000, seed = 2 + x)
      s.update(x, 1)
      assert(s.sample().contains(x), s"failed to recover singleton $x")
    }
  }

  test("insert followed by delete returns to the zero state") {
    val s = new L0Sampler(1000, seed = 3)
    s.update(5, 1); s.update(123, 1)
    s.update(5, -1); s.update(123, -1)
    assert(s.sample().isEmpty)
  }

  test("deletions leave exactly the surviving coordinate") {
    // A single sketch may fail (that is its delta); it must never return a
    // deleted coordinate, and most seeds must succeed.
    var ok = 0
    for (seed <- 1 to 30) {
      val s = new L0Sampler(10000, seed = 100L + seed)
      val survivors = Set(7L, 4242L)
      val chaff = (1 to 50).map(i => (seed * 100 + i).toLong % 10000).filterNot(survivors.contains).distinct
      survivors.foreach(x => s.update(x, 1))
      chaff.foreach(x => s.update(x, 1))
      chaff.foreach(x => s.update(x, -1))
      s.sample().foreach { got =>
        assert(survivors.contains(got), s"seed=$seed returned deleted coordinate $got")
        ok += 1
      }
    }
    assert(ok >= 27, s"only $ok/30 sketches recovered a survivor")
  }

  test("sample comes from the support (many supports, many seeds)") {
    for (seed <- 1 to 50) {
      val rng = new scala.util.Random(seed)
      val support = Set.fill(1 + rng.nextInt(40))(rng.nextLong(100000L))
      val s = new L0Sampler(100000L, seed = 5000L + seed)
      support.foreach(x => s.update(x, 1))
      s.sample() match {
        case Some(x) => assert(support.contains(x), s"seed=$seed sampled non-member $x")
        case None    => // a sketch is allowed to fail; frequency checked below
      }
    }
  }

  test("success rate is high across random supports") {
    var ok = 0; val trials = 200
    for (seed <- 1 to trials) {
      val rng = new scala.util.Random(seed * 7L)
      val support = Set.fill(1 + rng.nextInt(100))(rng.nextLong(1L << 30))
      val s = new L0Sampler(1L << 30, seed = 900L + seed)
      support.foreach(x => s.update(x, 1))
      if (s.sample().exists(support.contains)) ok += 1
    }
    assert(ok >= trials * 85 / 100, s"only $ok/$trials sketches recovered a sample")
  }

  test("sampling is near-uniform over a fixed support") {
    // Distinct sampler seeds draw independent samples; each support element
    // should be hit ~ 1/|support| of the time.
    val support = (0L until 16L).map(_ * 37 + 5).toVector
    val hits = scala.collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    val trials = 2000
    var succeeded = 0
    for (t <- 1 to trials) {
      val s = new L0Sampler(1000, seed = 31L * t)
      support.foreach(x => s.update(x, 1))
      s.sample().foreach { x => hits(x) += 1; succeeded += 1 }
    }
    assert(succeeded > trials * 9 / 10)
    val expected = succeeded.toDouble / support.size
    support.foreach { x =>
      assert(math.abs(hits(x) - expected) < expected * 0.5 + 3 * math.sqrt(expected),
        s"coordinate $x hit ${hits(x)} times, expected ~$expected")
    }
  }

  test("merge of partial sketches equals the sequentially built sketch") {
    for (trial <- 1 to 50) {
      val rng = new scala.util.Random(trial * 13L)
      val seed = rng.nextLong()
      val updates = Vector.fill(rng.nextInt(120))((rng.nextLong(10000L), if (rng.nextBoolean()) 1L else -1L))
      val whole = new L0Sampler(10000, seed)
      val left  = new L0Sampler(10000, seed)
      val right = new L0Sampler(10000, seed)
      updates.zipWithIndex.foreach { case ((x, d), i) =>
        whole.update(x, d)
        (if (i % 2 == 0) left else right).update(x, d)
      }
      left.merge(right)
      assert(left.sample() == whole.sample(), "merge must reproduce sequential state")
    }
  }

  test("merge rejects mismatched seeds or domains") {
    val a = new L0Sampler(100, seed = 1)
    intercept[IllegalArgumentException](a.merge(new L0Sampler(100, seed = 2)))
    intercept[IllegalArgumentException](a.merge(new L0Sampler(200, seed = 1)))
  }

  test("update rejects out-of-domain coordinates") {
    val s = new L0Sampler(10, seed = 1)
    intercept[IllegalArgumentException](s.update(10, 1))
    intercept[IllegalArgumentException](s.update(-1, 1))
  }

  test("linearity: update order does not matter") {
    for (trial <- 1 to 50) {
      val rng = new scala.util.Random(trial * 29L)
      val updates = Vector.fill(40)((rng.nextLong(1000L), if (rng.nextBoolean()) 1L else -1L))
      val a = new L0Sampler(1000, seed = 77)
      val b = new L0Sampler(1000, seed = 77)
      updates.foreach { case (x, d) => a.update(x, d) }
      updates.reverse.foreach { case (x, d) => b.update(x, d) }
      assert(a.sample() == b.sample())
    }
  }

  test("words grow only with touched levels (lazy allocation)") {
    val empty = new L0Sampler(1L << 40, seed = 5)
    assert(empty.words == 0)
    val one = new L0Sampler(1L << 40, seed = 5)
    one.update(7, 1)
    assert(one.words > 0 && one.words < empty.levels.toLong * 3 * one.t)
  }

  test("multiplicities > 1 are recovered (general turnstile vectors)") {
    val s = new L0Sampler(100, seed = 9)
    s.update(42, 3)
    assert(s.sample().contains(42L))
  }
}
