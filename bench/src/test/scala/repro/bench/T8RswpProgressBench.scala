package repro.bench

/** T8 — Fig. 12: RSWP vs classic RS, cumulative time over a 1/10-dense stream. */
class T8RswpProgressBench extends BenchSpecBase {
  test("T8: RSWP vs RS progress over the stream") {
    report("T8", "RSWP vs RS vs input fraction (Fig. 12)",
      Experiments.t8RswpProgress(n = 60000, len = 256, tau = 16, density = 0.1, k = 1000))
  }
}
