package repro.core

/** Geometric skip-length draws for Li's reservoir algorithm [24].
  *
  * `q ~ Geo(w)` is the number of consecutive per-item Bernoulli(w) failures
  * before the next success, i.e. the number of items safely skipped before the
  * next stop: `q = floor(ln(U) / ln(1 - w))` for `U ~ Uni(0,1)`.
  */
object Geo {

  /** Skip lengths are clamped here so position arithmetic cannot overflow
    * even after adding batch sizes that are themselves capped at 2^61.
    */
  val MaxSkip: Long = Long.MaxValue / 4

  def draw(w: Double, rng: Rng): Long = {
    if (w >= 1.0) return 0L // stop at every item
    val denom = math.log1p(-w) // ln(1 - w) < 0
    if (denom == 0.0 || java.lang.Double.isNaN(denom)) return MaxSkip // w underflowed to 0
    val g = math.log(rng.nextDoubleOpen()) / denom // ≥ 0
    if (java.lang.Double.isNaN(g) || g >= MaxSkip.toDouble) MaxSkip else g.toLong
  }

  /** `w`-update factor: `rand()^{1/k}`. */
  def wFactor(k: Int, rng: Rng): Double = math.pow(rng.nextDoubleOpen(), 1.0 / k)
}
