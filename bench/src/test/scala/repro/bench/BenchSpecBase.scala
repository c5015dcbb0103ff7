package repro.bench

import repro.SparkSpec

/** Base for the per-table benchmark suites: a shared reproduction scale and
  * a banner printer so `bench_output.txt` is self-describing.
  */
trait BenchSpecBase extends SparkSpec {

  /** Reproduction scale for `sbt bench/test` (the jobs/ mains default to the
    * same scale; pass args to grow them). Paper scale in Experiments.Scale.
    */
  val scale: Experiments.Scale = Experiments.Scale(
    graphEdges = 20000,
    graphNodes = 4000,
    kGraph = 2000,
    kRel = 5000,
    tpcdsSf = 10,
    q10Sf = 8,
    budgetSec = 45,
  )

  def report(tag: String, title: String, body: String): Unit = {
    println(s"\n===== [$tag] $title =====")
    println(body)
    println(s"===== [/$tag] =====\n")
  }
}
