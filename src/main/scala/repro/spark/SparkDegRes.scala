package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import scala.util.Random

import repro.core.{InsertionOnlyND, Neighborhood}

/** Outcome of the DataFrame build of Algorithm 2 (mirrors
  * [[repro.core.InsertionOnlyResult]] minus word-level accounting, which is
  * meaningful only for the sequential build).
  */
final case class SparkDegResResult(
    output: Option[Neighborhood],
    runSucceeded: Vector[Boolean],
    reservoirSize: Int,
)

/** Algorithm 2 as a pure DataFrame (Catalyst) pipeline — DESIGN.md §4.
  *
  * Input: an edge stream as rows (pos, a, b) where `pos` is the stream
  * position. The sequential algorithm's reservoir maintains a uniform
  * s-sample of the vertices whose degree reached d1; here that sample is
  * drawn equivalently by ranking each vertex's edges by `pos` (window),
  * filtering vertices with deg ≥ d1, and keeping the s smallest values of
  * the per-run hash priority xxhash64(a, runSeed) — a uniform s-sample of
  * the same set. The "next d/c edges after crossing d1" are exactly the
  * edges with per-vertex rank in [d1, d1 + d/c), so run i succeeds iff its
  * sample contains a vertex of degree ≥ d1 + d/c - 1 — the same success
  * predicate as the sequential reservoir, hence the same distribution of
  * outcomes (over the respective sampling randomness).
  */
object SparkDegRes {

  /** Edges with their per-vertex arrival rank (1-based, by stream pos). */
  def ranked(edges: DataFrame): DataFrame =
    edges.withColumn("rank",
      row_number().over(Window.partitionBy("a").orderBy("pos")).cast("long"))

  /** Exact per-vertex degrees — oracle-checked against DuckDB in tests. */
  def degrees(edges: DataFrame): DataFrame =
    edges.groupBy("a").agg(count(lit(1)) as "deg")

  /** Run the full c-approximation algorithm.
    *
    * @param edges DataFrame (pos, a, b) — a simple bipartite edge stream
    * @param n     |A|
    * @param d     degree threshold (promise: some vertex has deg >= d)
    * @param c     integral approximation factor >= 2
    */
  def run(edges: DataFrame, n: Long, d: Int, c: Int, seed: Long,
          sOverride: Option[Int] = None): SparkDegResResult = {
    require(c >= 2, s"approximation factor must be >= 2, got $c")
    val s  = sOverride.getOrElse(InsertionOnlyND.reservoirSize(n, c))
    val d2 = InsertionOnlyND.targetSize(d, c)

    val rk  = ranked(edges).cache()
    val deg = degrees(edges).cache()
    try {
      val winners: Vector[Option[Neighborhood]] = (0 until c).toVector.map { i =>
        val d1 = InsertionOnlyND.threshold(i, d, c)
        // Uniform s-sample of {a : deg(a) >= d1} via hash priority.
        val sampled = deg
          .filter(col("deg") >= d1)
          .withColumn("prio", xxhash64(col("a"), lit(seed), lit(i)))
          .orderBy("prio")
          .limit(s)
        // A sampled vertex yields a full neighborhood iff it still has d2
        // edges from rank d1 onwards, i.e. deg >= d1 + d2 - 1.
        val winner = sampled
          .filter(col("deg") >= d1.toLong + d2 - 1)
          .orderBy("prio")
          .limit(1)
          .collect()
          .headOption
        winner.map { row =>
          val a = row.getAs[Long]("a")
          val nbrs = rk
            .filter(col("a") === a && col("rank").between(d1, d1.toLong + d2 - 1))
            .orderBy("rank")
            .select("b")
            .collect()
            .map(_.getLong(0))
            .toVector
          Neighborhood(a, nbrs)
        }
      }
      val successes = winners.flatten
      val out =
        if (successes.isEmpty) None
        else Some(successes(new Random(seed).nextInt(successes.size)))
      SparkDegResResult(out, winners.map(_.nonEmpty), s)
    } finally {
      rk.unpersist(); deg.unpersist()
    }
  }
}
