package bench

import repro.tables.Table4Turnstile

/** Regenerates Table 4 (EXPERIMENTS.md): turnstile ND under deletions,
  * strategy regimes and the dn/c² space law (distributed sketch build).
  */
class Table4TurnstileBench extends BenchSpec {
  test("Table 4: turnstile ND success, strategies and space") {
    verify(Table4Turnstile.run(spark))
  }
}
