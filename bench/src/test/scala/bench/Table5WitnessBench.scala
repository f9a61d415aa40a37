package bench

import repro.tables.Table5Witness

/** Regenerates Table 5 (EXPERIMENTS.md): frequent elements with witnesses
  * vs witness-free baselines; streaming-operator parity.
  */
class Table5WitnessBench extends BenchSpec {
  test("Table 5: witnesses vs baselines on zipf + TPC-H-lite") {
    verify(Table5Witness.run(spark))
  }
}
