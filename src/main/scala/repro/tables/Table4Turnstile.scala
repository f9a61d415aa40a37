package repro.tables

import org.apache.spark.sql.SparkSession
import scala.util.Random

import repro.SynthGraphs
import repro.core.{Edge, Neighborhood}
import repro.sketch.TurnstileConfig
import repro.spark.SparkL0

/** Table 4 — turnstile Neighborhood Detection (Theorem 5.4, Lemmas
  * 5.2/5.3): success rate, sketch words vs the dn/c² law, and the vertex-
  * vs edge-sampling strategy split across the two degree regimes, under
  * streams with deletions. Sketch builds run distributed via SparkL0.
  */
object Table4Turnstile {

  final case class Cell(regime: String, n: Long, d: Int, c: Int, trials: Int,
                        successes: Int, valid: Int, vertexOk: Int, edgeOk: Int,
                        avgWords: Long)

  /** Many-heavy: >= n/x vertices of degree >= d/c (Lemma 5.2 regime).
    * Single-heavy: one planted degree-d vertex, background degree 1-2
    * (Lemma 5.3 regime).
    */
  private def instance(regime: String, n: Long, m: Long, d: Int, c: Int, seed: Long)
      : Vector[Edge] = regime match {
    case "many-heavy" =>
      val rng = new Random(seed)
      val x = math.max(n.toDouble / c, math.sqrt(n.toDouble))
      val nHeavy = math.min(n, math.max(2L, math.ceil(2 * n / x).toLong))
      rng.shuffle((1L to n).flatMap { a =>
        val deg = if (a <= nHeavy) d else 2
        (1 to deg).map(i => Edge(a, ((a * 7919 + i * 104729) % m) + 1))
      }.toVector).distinct
    case "single-heavy" =>
      SynthGraphs.uniformPlusPlanted(n, m, d, bg = 2, seed)._1
    case other => throw new IllegalArgumentException(s"unknown regime $other")
  }

  def run(spark: SparkSession, n: Long = 512L, m: Long = 4096L, d: Int = 32,
          cs: Seq[Int] = Seq(2, 4, 8), chaff: Double = 0.3, trials: Int = 3,
          cv: Double = 0.5, ce: Double = 0.2): TableOutput = {
    val cells = for {
      regime <- Seq("many-heavy", "single-heavy")
      c <- cs
    } yield {
      var succ = 0; var valid = 0; var vOk = 0; var eOk = 0; var words = 0L
      for (t <- 1 to trials) {
        val edges = instance(regime, n, m, d, c, seed = 100L * t + c)
        val ops = SynthGraphs.turnstileFrom(edges, m, chaff, seed = 200L * t + c)
        val adj = SynthGraphs.adjacencyOf(ops)
        val cfg = TurnstileConfig(n, m, d, c, seed = 300L * t + c, cv, ce, buckets = 6)
        val res = SparkL0.run(spark, ops, cfg)
        words += res.totalWords
        if (res.vertexBestSize.nonEmpty) vOk += 1
        if (res.edgeBestSize.nonEmpty) eOk += 1
        res.output.foreach { nb =>
          succ += 1
          if (Neighborhood.isValid(nb, adj)) valid += 1
        }
      }
      Cell(regime, n, d, c, trials, succ, valid, vOk, eOk, words / trials)
    }
    val theory = cs.map(c => c -> (n.toDouble * d / (c.toDouble * c))).toMap
    val rows = cells.map { cl =>
      Vector(cl.regime, cl.n.toString, cl.d.toString, cl.c.toString,
        s"${cl.successes}/${cl.trials}", s"${cl.valid}/${cl.successes}",
        s"${cl.vertexOk}/${cl.edgeOk}",
        TableFormat.words(cl.avgWords),
        TableFormat.words(theory(cl.c).toLong))
    }.toVector
    val manyHeavy   = cells.filter(_.regime == "many-heavy")
    val singleHeavy = cells.filter(_.regime == "single-heavy")
    TableOutput(
      title = "Table 4: turnstile ND with deletions (paper: space ~ dn/c^2; vertex sampling wins iff #heavy >= n/x)",
      header = Vector("regime", "n", "d", "c", "succ", "valid", "vOk/eOk", "words", "dn/c^2"),
      rows = rows,
      checks = Vector(
        ("T4: every cell succeeds in every trial",
          cells.forall(cl => cl.successes == cl.trials)),
        ("T4: every output validates against the post-deletion graph",
          cells.forall(cl => cl.valid == cl.successes)),
        ("T4: many-heavy regime: vertex sampling succeeds on its own in every trial (Lemma 5.2)",
          manyHeavy.forall(cl => cl.vertexOk == cl.trials)),
        ("T4: single-heavy regime: edge sampling succeeds on its own in every trial (Lemma 5.3)",
          singleHeavy.forall(cl => cl.edgeOk == cl.trials)),
        ("T4: single-heavy regime: vertex sampling alone is not reliable at large c",
          singleHeavy.exists(cl => cl.vertexOk < cl.trials)),
        ("T4: measured words decrease in c (dn/c^2 shape)",
          Seq(manyHeavy, singleHeavy).forall(g =>
            g.sortBy(_.c).sliding(2).forall {
              case Seq(a, b) => b.avgWords < a.avgWords; case _ => true })),
      ),
      notes = Vector(
        s"constants scaled: cv=$cv ce=$ce (paper uses 10/10 for whp proofs); chaff=$chaff of edges inserted+deleted."),
    )
  }
}
