package bench

import repro.tables.Table2Space

/** Regenerates Table 2 (EXPERIMENTS.md): the o(nd) space separation. */
class Table2SpaceBench extends BenchSpec {
  test("Table 2: Algorithm 2 space vs exact nd baseline") {
    verify(Table2Space.run())
  }
}
