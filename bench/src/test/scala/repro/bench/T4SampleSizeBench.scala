package repro.bench

/** T4 — Fig. 8: total runtime as the sample size k sweeps past N. */
class T4SampleSizeBench extends BenchSpecBase {
  test("T4: runtime vs sample size on line-3") {
    val n = scale.graphEdges * 3 // input tuples across the three aliases
    report("T4", s"Runtime vs sample size (Fig. 8); N=$n",
      Experiments.t4SampleSize(scale, Seq(100, 1000, 10000, n, 4 * n, 20 * n)))
  }
}
