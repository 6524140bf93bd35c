package repro.core.sim

/** String similarity operator used by DLearn (paper Sec. 5):
  * the average of the Smith-Waterman-Gotoh similarity and the Length
  * similarity.
  *
  * - Smith-Waterman-Gotoh [Gotoh 1982]: best local alignment score with
  *   affine-ish gaps; here with match = +1, mismatch = -1 (half credit for a
  *   case-insensitive match handled by lowercasing inputs), gap = -0.5, as in
  *   the SimMetrics implementation the ILP literature uses; normalized by the
  *   length of the shorter string so the result lies in [0, 1].
  * - Length similarity: |shorter| / |longer|.
  */
object Similarity extends Serializable {

  /** Smith-Waterman-Gotoh local alignment similarity, normalized to [0,1]. */
  def smithWatermanGotoh(a: String, b: String): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val s = a.toLowerCase
    val t = b.toLowerCase
    val n = s.length
    val m = t.length
    val gap = -0.5
    // Two-row DP over the local-alignment recurrence.
    var prev = new Array[Double](m + 1)
    var cur  = new Array[Double](m + 1)
    var best = 0.0
    var i = 1
    while (i <= n) {
      var j = 1
      while (j <= m) {
        val sub = if (s.charAt(i - 1) == t.charAt(j - 1)) 1.0 else -1.0
        val v = math.max(
          0.0,
          math.max(prev(j - 1) + sub, math.max(prev(j) + gap, cur(j - 1) + gap))
        )
        cur(j) = v
        if (v > best) best = v
        j += 1
      }
      val tmp = prev; prev = cur; cur = tmp
      java.util.Arrays.fill(cur, 0.0)
      i += 1
    }
    best / math.min(n, m).toDouble
  }

  /** Length similarity: |shorter| / |longer|, in [0,1]. */
  def lengthSim(a: String, b: String): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val la = a.length.toDouble
    val lb = b.length.toDouble
    math.min(la, lb) / math.max(la, lb)
  }

  /** DLearn's similarity operator: average of SWG and Length. */
  def sim(a: String, b: String): Double =
    if (a == null || b == null) 0.0
    else (smithWatermanGotoh(a, b) + lengthSim(a, b)) / 2.0
}
