package repro.bench

/** T9 — Fig. 13: RSWP vs classic RS across stream densities. */
class T9RswpDensityBench extends BenchSpecBase {
  test("T9: RSWP vs RS across densities") {
    report("T9", "RSWP vs RS vs density (Fig. 13)",
      Experiments.t9RswpDensity(n = 40000, len = 256, tau = 16, k = 500))
  }
}
