package repro.core.strings

import repro.core.Rng

/** Levenshtein distance with the Ukkonen band cutoff — the predicate of the
  * Section 6.3 experiment ("edit distance from the query string ≤ τ").
  */
object EditDistance {

  /** Full O(|a|·|b|) distance (test oracle). */
  def distance(a: String, b: String): Int = {
    val (n, m) = (a.length, b.length)
    var prev = Array.tabulate(m + 1)(identity)
    var cur = new Array[Int](m + 1)
    for (i <- 1 to n) {
      cur(0) = i
      for (j <- 1 to m) {
        val sub = prev(j - 1) + (if (a(i - 1) == b(j - 1)) 0 else 1)
        cur(j) = math.min(sub, math.min(prev(j) + 1, cur(j - 1) + 1))
      }
      val t = prev; prev = cur; cur = t
    }
    prev(m)
  }

  /** Banded check `distance(a, b) ≤ tau` in O(max(|a|,|b|)·tau). */
  def within(a: String, b: String, tau: Int): Boolean = {
    val (n, m) = (a.length, b.length)
    if (math.abs(n - m) > tau) return false
    val Inf = Int.MaxValue / 2
    var prev = new Array[Int](m + 1)
    var cur = new Array[Int](m + 1)
    java.util.Arrays.fill(prev, Inf)
    for (j <- 0 to math.min(m, tau)) prev(j) = j
    for (i <- 1 to n) {
      java.util.Arrays.fill(cur, Inf)
      val lo = math.max(1, i - tau)
      val hi = math.min(m, i + tau)
      if (lo == 1 && i <= tau) cur(0) = i
      var best = Inf
      var j = lo
      while (j <= hi) {
        val sub = prev(j - 1) + (if (a(i - 1) == b(j - 1)) 0 else 1)
        val del = if (prev(j) < Inf) prev(j) + 1 else Inf
        val ins = if (j > lo || cur(0) < Inf) cur(j - 1) + 1 else Inf
        cur(j) = math.min(sub, math.min(del, ins))
        if (cur(j) < best) best = cur(j)
        j += 1
      }
      if (i <= tau && cur(0) < best) best = cur(0)
      if (best > tau) return false
      val t = prev; prev = cur; cur = t
    }
    prev(m) <= tau
  }
}

/** Generator for the Section 6.3 string streams: a fixed query string, and
  * items that are `d` random substitutions away — `d ≤ tau` for real items,
  * `d = 3·tau` for dummies (far enough that misclassification is negligible;
  * ground truth is always the computed distance).
  */
object StringStream {
  private val Alphabet = "abcdefghijklmnopqrstuvwxyz"

  def randomString(len: Int, rng: Rng): String = {
    val sb = new StringBuilder(len)
    for (_ <- 0 until len) sb += Alphabet(rng.nextInt(Alphabet.length))
    sb.toString
  }

  /** Apply `d` substitutions at distinct positions with guaranteed-new
    * characters, so the edit distance moves by ≈ d.
    */
  def perturb(base: String, d: Int, rng: Rng): String = {
    val chars = base.toCharArray
    val positions = new scala.collection.mutable.HashSet[Int]
    while (positions.size < d) positions += rng.nextInt(base.length)
    for (p <- positions) {
      var c = Alphabet(rng.nextInt(Alphabet.length))
      while (c == chars(p)) c = Alphabet(rng.nextInt(Alphabet.length))
      chars(p) = c
    }
    new String(chars)
  }

  /** A stream of `n` strings with approximately `density` of them within
    * distance `tau` of the returned query string.
    */
  def generate(n: Int, baseLen: Int, tau: Int, density: Double,
               seed: Long): (String, IndexedSeq[String]) = {
    val rng = new Rng(seed)
    val base = randomString(baseLen, rng)
    val items = (0 until n).map { _ =>
      val d = if (rng.nextDouble() < density) rng.nextInt(tau + 1) else 3 * tau
      perturb(base, d, rng)
    }
    (base, items)
  }
}
