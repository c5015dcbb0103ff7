package repro.bench

/** T5 — Fig. 9 (the typeset table): FK and grouping optimizations on QZ. */
class T5OptimizationsBench extends BenchSpecBase {
  test("T5: optimizations table on QZ") {
    report("T5", "Optimizations on QZ (Fig. 9 table)", Experiments.t5Optimizations(scale))
  }
}
