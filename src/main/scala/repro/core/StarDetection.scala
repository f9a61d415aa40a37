package repro.core

import scala.util.Random

/** Result of Star Detection: best star found plus per-guess diagnostics. */
final case class StarResult(
    output: Option[Neighborhood],
    guesses: Vector[Int],
    perGuessSize: Vector[Int],
    totalPeakWords: Long,
)

/** Corollary 3.3: semi-streaming O(log n)-approximation for Star Detection
  * in insertion-only streams.
  *
  * The general graph G = (V, E) is doubled into the bipartite H = (V, V, E')
  * with uv contributing both uv and vu. We run the insertion-only
  * Neighborhood Detection algorithm in parallel for geometric guesses
  * Delta' in {1, (1+eps), (1+eps)^2, ...} of the maximum degree and return
  * the largest neighborhood found. The guess just below Delta yields a star
  * of size >= Delta / ((1+eps) c); with c = ceil(log n) this is the
  * corollary's semi-streaming O(log n)-approximation.
  */
object StarDetection {

  /** Geometric guesses 1, (1+eps), ..., covering degrees up to n. */
  def guessLadder(n: Long, eps: Double): Vector[Int] = {
    require(eps > 0, "eps must be positive")
    val b = Vector.newBuilder[Int]
    var g = 1.0
    var last = 0
    while (g <= n.toDouble * (1 + eps)) {
      val gi = math.max(1, math.ceil(g).toInt)
      if (gi != last) { b += gi; last = gi }
      g *= (1 + eps)
    }
    b.result()
  }

  /** Run on an undirected edge stream (each pair (u, v) doubled internally).
    *
    * @param undirected stream of undirected edges as (u, v) pairs
    * @param n    |V|
    * @param c    per-guess approximation factor (Corollary 3.3: ceil(log n))
    * @param eps  geometric ladder step
    */
  def run(undirected: IterableOnce[(Long, Long)], n: Long, c: Int,
          eps: Double = 0.5, seed: Long = 17L): StarResult = {
    val master  = new Random(seed)
    val guesses = guessLadder(n, eps)
    val s       = InsertionOnlyND.reservoirSize(n, c)
    // One degree tracker + c runs *per guess*, all fed the doubled stream.
    val trackers = guesses.map(_ => new DegreeTracker)
    val runsPerGuess = guesses.map { dGuess =>
      Vector.tabulate(c) { i =>
        new DegResSampling(
          InsertionOnlyND.threshold(i, dGuess, c),
          InsertionOnlyND.targetSize(dGuess, c),
          s, new Random(master.nextLong()))
      }
    }
    val it = undirected.iterator
    while (it.hasNext) {
      val (u, v) = it.next()
      for (e <- List(Edge(u, v), Edge(v, u))) {
        var g = 0
        while (g < guesses.size) {
          val nd = trackers(g).bump(e.a)
          val runs = runsPerGuess(g)
          var i = 0
          while (i < runs.size) { runs(i).process(e, nd); i += 1 }
          g += 1
        }
      }
    }
    val perGuessBest = runsPerGuess.map { runs =>
      runs.flatMap(_.result()).sortBy(-_.size).headOption
    }
    val best = perGuessBest.flatten.sortBy(-_.size).headOption
    StarResult(
      output       = best,
      guesses      = guesses,
      perGuessSize = perGuessBest.map(_.map(_.size).getOrElse(0)),
      totalPeakWords = trackers.map(_.words).sum +
        runsPerGuess.flatten.map(_.peakWords).sum,
    )
  }
}
