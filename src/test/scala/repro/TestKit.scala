package repro

import repro.core.Rng

/** Tiny deterministic property-check helper (the scalatest↔scalacheck bridge
  * artifact is not in the offline cache, so suites drive ScalaCheck-style
  * properties with seeded loops instead).
  */
object TestKit {

  /** Run `body` for `cases` deterministic seeds. */
  def forCases(cases: Int, seed0: Long = 0xc0ffee)(body: Rng => Unit): Unit = {
    for (i <- 0 until cases) {
      val rng = new Rng(seed0 + i * 7919L)
      try body(rng)
      catch {
        case e: Throwable =>
          throw new AssertionError(s"property failed at case $i (seed ${seed0 + i * 7919L})", e)
      }
    }
  }

  /** 5σ-style uniformity check: observed inclusion counts vs uniform
    * expectation. `counts` maps each population element to how many of the
    * `runs` independent samples contained it; each run drew `k` of `m`.
    */
  def assertUniform(counts: Map[_, Int], m: Int, k: Int, runs: Int, label: String): Unit = {
    require(counts.size <= m, s"$label: ${counts.size} distinct sampled > population $m")
    val p = math.min(1.0, k.toDouble / m)
    val exp = runs * p
    val sd = math.sqrt(runs * p * (1 - p)).max(1e-9)
    // Elements never sampled at all count as 0.
    val all = counts.values.toSeq ++ Seq.fill(m - counts.size)(0)
    var chi2 = 0.0
    for (c <- all) {
      val z = (c - exp) / sd
      assert(math.abs(z) < 6.0, s"$label: count $c vs expected $exp (z=$z)")
      chi2 += z * z
    }
    // E[chi2] ≈ m(1-p)/(1-p)=m; allow a generous 5σ band.
    assert(chi2 < m + 8 * math.sqrt(2.0 * m) + 10,
      s"$label: chi2 $chi2 too large for m=$m")
  }
}
