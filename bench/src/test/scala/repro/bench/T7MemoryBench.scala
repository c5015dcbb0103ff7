package repro.bench

/** T7 — Fig. 11: index memory vs input fraction. */
class T7MemoryBench extends BenchSpecBase {
  test("T7: memory usage on line-3 and Q10") {
    report("T7", "Memory usage (Fig. 11)", Experiments.t7Memory(scale))
  }
}
