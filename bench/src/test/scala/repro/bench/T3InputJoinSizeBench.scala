package repro.bench

/** T3 — Fig. 7: cumulative runtime and join size vs input fraction. */
class T3InputJoinSizeBench extends BenchSpecBase {
  test("T3: runtime and join size vs input fraction on line-3") {
    report("T3", "Runtime vs input and join size (Fig. 7)",
      Experiments.t3InputJoinSize(scale, k = 1000))
  }
}
