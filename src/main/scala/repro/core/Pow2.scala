package repro.core

/** Power-of-two arithmetic for the approximate-degree machinery of Section 4.
  *
  * Degrees (`cnt~` values) are always 0 or an exact power of two; products of
  * degrees can overflow Long for wide queries on large data, so multiplication
  * saturates at 2^61 (itself a power of two, keeping bucket exponents exact).
  * Saturation is counted so tests can assert it never fires at test scale.
  */
object Pow2 {

  /** Saturation ceiling: a power of two small enough that sums of a few
    * saturated values still cannot overflow Long.
    */
  val Cap: Long = 1L << 61

  /** Number of multiplications that hit the saturation cap (diagnostics). */
  @volatile var saturations: Long = 0L

  /** Smallest power of two ≥ x (x ≥ 1). ceilPow2(0) = 0 by convention:
    * an empty subtree contributes no join results and lives in no bucket.
    */
  def ceilPow2(x: Long): Long = {
    require(x >= 0, s"ceilPow2 of negative $x")
    if (x == 0) 0L
    else if (x >= Cap) Cap
    else if (isPow2(x)) x
    else java.lang.Long.highestOneBit(x) << 1
  }

  def isPow2(x: Long): Boolean = x > 0 && (x & (x - 1)) == 0

  /** log2 of an exact power of two. */
  def log2(x: Long): Int = {
    require(isPow2(x), s"log2 of non-power-of-two $x")
    java.lang.Long.numberOfTrailingZeros(x)
  }

  /** Saturating product; both operands non-negative. Preserves the
    * power-of-two invariant when the operands are powers of two.
    */
  def mulCap(a: Long, b: Long): Long = {
    if (a == 0 || b == 0) 0L
    else if (a > Cap / b) { saturations += 1; Cap }
    else a * b
  }
}
