package repro.bench

/** T2 — Fig. 6: per-tuple index update-time distribution, sampling off. */
class T2UpdateTimeBench extends BenchSpecBase {
  test("T2: update-time distribution on line-4") {
    report("T2", "Update time distribution (Fig. 6)", Experiments.t2UpdateTime(scale))
  }
}
