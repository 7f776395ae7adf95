package repro.text

/** Unit-cost Levenshtein distance — substrate for the paper's softened-FD
  * similarity (Section 4) and the typo-likelihood of the PClean-like baseline.
  */
object EditDistance {

  /** Classic two-row dynamic program; O(|a|·|b|) time, O(min) space. */
  def apply(a: String, b: String): Int = {
    if (a == b) return 0
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    val (s, t) = if (a.length <= b.length) (a, b) else (b, a)
    var prev = Array.tabulate(s.length + 1)(identity)
    var cur = new Array[Int](s.length + 1)
    var i = 1
    while (i <= t.length) {
      cur(0) = i
      var j = 1
      while (j <= s.length) {
        val cost = if (t.charAt(i - 1) == s.charAt(j - 1)) 0 else 1
        cur(j) = math.min(math.min(cur(j - 1) + 1, prev(j) + 1), prev(j - 1) + cost)
        j += 1
      }
      val tmp = prev; prev = cur; cur = tmp
      i += 1
    }
    prev(s.length)
  }

  /** Early-exit variant: returns > bound quickly when distance exceeds it. */
  def atMost(a: String, b: String, bound: Int): Int = {
    if (math.abs(a.length - b.length) > bound) return bound + 1
    apply(a, b)
  }
}
