package bench

import repro.tables.Table7LowerBound

/** Regenerates Table 7 (EXPERIMENTS.md): lower-bound reductions run
  * end-to-end.
  */
class Table7LowerBoundBench extends BenchSpec {
  test("Table 7: lower-bound reductions solve their games") {
    verify(Table7LowerBound.run())
  }
}
