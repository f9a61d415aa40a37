package bench

import repro.tables.Table1InsertionOnly

/** Regenerates Table 1 (EXPERIMENTS.md): insertion-only ND success vs the
  * Theorem 3.2 guarantee across families × (n, c).
  */
class Table1InsertionOnlyBench extends BenchSpec {
  test("Table 1: insertion-only success, size and validity") {
    verify(Table1InsertionOnly.run())
  }
}
