package repro.core

import scala.util.Random

/** Outcome of one Algorithm 2 execution, with per-run diagnostics.
  *
  * @param output        uniform random successful neighborhood, if any run
  *                      succeeded
  * @param runSucceeded  per-run success flags (index i = threshold run i)
  * @param reservoirSize the reservoir size s used by every run
  * @param runPeakWords  peak words per run (edges + reservoir ids)
  * @param degreeWords   words of the shared degree table
  */
final case class InsertionOnlyResult(
    output: Option[Neighborhood],
    runSucceeded: Vector[Boolean],
    reservoirSize: Int,
    runPeakWords: Vector[Long],
    degreeWords: Long,
) {
  def succeeded: Boolean = output.nonEmpty
  def totalPeakWords: Long = degreeWords + runPeakWords.sum
}

/** Algorithm 2: one-pass c-approximation for Neighborhood Detection(n, d)
  * in insertion-only streams (Theorem 3.2).
  *
  * Runs Deg-Res-Sampling(max(1, floor(i*d/c)), floor(d/c), s) in parallel
  * for i = 0 .. c-1 with reservoir size s = ceil(ln(n) * n^(1/c)), and
  * returns a uniform random neighborhood among the successful runs. If the
  * input contains an A-vertex of degree >= d the output has size
  * floor(d/c) with probability >= 1 - 1/n, using
  * O(n log n + n^(1/c) d log^2 n) bits.
  *
  * The paper assumes c | d; we use floor(d/c) >= 1 otherwise (documented in
  * DESIGN.md §6).
  */
object InsertionOnlyND {

  /** Reservoir size from Theorem 3.2: s = ceil(n^(1/c) ln n). */
  def reservoirSize(n: Long, c: Int): Int =
    math.max(1, math.ceil(math.pow(n.toDouble, 1.0 / c) * math.log(n.toDouble)).toInt)

  /** Target output size floor(d/c), at least 1. */
  def targetSize(d: Int, c: Int): Int = math.max(1, d / c)

  /** Threshold for run i: max(1, floor(i*d/c)). */
  def threshold(i: Int, d: Int, c: Int): Int = math.max(1, (i.toLong * d / c).toInt)

  /** Process the whole insertion-only edge stream.
    *
    * @param edges stream of edge insertions (must describe a simple graph)
    * @param n     |A| (number of possible items)
    * @param d     degree threshold (promise: some A-vertex has deg >= d)
    * @param c     integral approximation factor >= 2
    * @param seed  RNG seed (one derived stream per run)
    * @param sOverride reservoir size override for experiments (None = paper's)
    */
  def run(edges: IterableOnce[Edge], n: Long, d: Int, c: Int, seed: Long,
          sOverride: Option[Int] = None): InsertionOnlyResult = {
    require(c >= 2, s"approximation factor must be >= 2, got $c")
    val s   = sOverride.getOrElse(reservoirSize(n, c))
    val d2  = targetSize(d, c)
    val master = new Random(seed)
    val degrees = new DegreeTracker
    val runs = Vector.tabulate(c) { i =>
      new DegResSampling(threshold(i, d, c), d2, s, new Random(master.nextLong()))
    }
    val it = edges.iterator
    while (it.hasNext) {
      val e = it.next()
      val nd = degrees.bump(e.a)
      var i = 0
      while (i < c) { runs(i).process(e, nd); i += 1 }
    }
    val successful = runs.filter(_.succeeded)
    val out =
      if (successful.isEmpty) None
      else successful(master.nextInt(successful.size)).result()
    InsertionOnlyResult(
      output        = out,
      runSucceeded  = runs.map(_.succeeded),
      reservoirSize = s,
      runPeakWords  = runs.map(_.peakWords),
      degreeWords   = degrees.words,
    )
  }
}
