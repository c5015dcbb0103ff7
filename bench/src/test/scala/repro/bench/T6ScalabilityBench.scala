package repro.bench

/** T6 — Fig. 10: runtime vs TPC-DS-lite scale factor on QZ. */
class T6ScalabilityBench extends BenchSpecBase {
  test("T6: scalability of QZ across scale factors") {
    report("T6", "Runtime vs scale factor (Fig. 10)",
      Experiments.t6Scalability(scale, Seq(1, 3, 10, 30)))
  }
}
