package repro.bench

/** T1 — Fig. 5: total running time of RSJoin/SJoin (and `_opt`) per query. */
class T1RunningTimeBench extends BenchSpecBase {
  test("T1: running time over all evaluation queries") {
    report("T1", "Running time per query (Fig. 5)", Experiments.t1RunningTime(scale))
  }
}
