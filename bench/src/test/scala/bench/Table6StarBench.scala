package bench

import repro.tables.Table6Star

/** Regenerates Table 6 (EXPERIMENTS.md): Star Detection approximation. */
class Table6StarBench extends BenchSpec {
  test("Table 6: Star Detection approximation ratio vs (1+eps)c") {
    verify(Table6Star.run())
  }
}
