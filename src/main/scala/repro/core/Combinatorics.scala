package repro.core

/** Binomial coefficients and combination enumeration for the combinatorial
  * early-termination paths (Section 5). Counting-mode kernels replace full
  * enumeration with closed-form binomials, which is where the big near-omega
  * speedups of EBBkC+ET come from.
  */
object Combinatorics {

  /** C(n, k) with Long saturation (Long.MaxValue on overflow); 0 outside range. */
  def binomial(n: Int, k: Int): Long = {
    if (k < 0 || k > n) return 0L
    val kk = math.min(k, n - k)
    var acc = 1L
    var i = 1
    while (i <= kk) {
      val num = n - kk + i
      // acc = acc * num / i, detecting overflow before it happens.
      if (acc > Long.MaxValue / num) return Long.MaxValue
      acc = acc * num / i
      i += 1
    }
    acc
  }

  /** Invokes `f(buf, k)` once per k-combination of `items(0 until len)`;
    * `buf(0 until k)` holds the chosen items and must not be retained.
    */
  def forEachCombination(items: Array[Int], len: Int, k: Int)(f: (Array[Int], Int) => Unit): Unit = {
    if (k < 0 || k > len) return
    if (k == 0) { f(Array.emptyIntArray, 0); return }
    val buf = new Array[Int](k)
    def rec(start: Int, depth: Int): Unit = {
      if (depth == k) { f(buf, k); return }
      var i = start
      // Leave enough items for the remaining slots.
      while (i <= len - (k - depth)) {
        buf(depth) = items(i)
        rec(i + 1, depth + 1)
        i += 1
      }
    }
    rec(0, 0)
  }
}
