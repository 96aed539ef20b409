package repro.util

/** Levenshtein edit distance [Levenshtein 1966], the metric the paper uses
  * between XPaths during the global-evidence clustering step (§3.2.2).
  */
object Lev {

  /** Classic two-row dynamic program; O(|a|·|b|) time, O(min) space. */
  def distance(a: String, b: String): Int = {
    if (a == b) return 0
    if (a.isEmpty) return b.length
    if (b.isEmpty) return a.length
    val (s, t) = if (a.length <= b.length) (a, b) else (b, a)
    var prev = Array.tabulate(s.length + 1)(identity)
    var curr = new Array[Int](s.length + 1)
    var j = 1
    while (j <= t.length) {
      curr(0) = j
      var i = 1
      while (i <= s.length) {
        val cost = if (s.charAt(i - 1) == t.charAt(j - 1)) 0 else 1
        curr(i) = math.min(math.min(curr(i - 1) + 1, prev(i) + 1), prev(i - 1) + cost)
        i += 1
      }
      val tmp = prev; prev = curr; curr = tmp
      j += 1
    }
    prev(s.length)
  }
}
