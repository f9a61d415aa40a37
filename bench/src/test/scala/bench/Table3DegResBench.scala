package bench

import repro.tables.Table3DegRes

/** Regenerates Table 3 (EXPERIMENTS.md): Lemma 3.1 success bound. */
class Table3DegResBench extends BenchSpec {
  test("Table 3: Deg-Res-Sampling success probability vs Lemma 3.1") {
    verify(Table3DegRes.run())
  }
}
