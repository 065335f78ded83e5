package repro.tsp

/** Asymmetric-TSP path solver used by ATSP-decoding (Sec. 3.1).
  *
  * The paper uses the Lin–Kernighan heuristic (LKH); offline we solve the
  * (tiny) instances exactly with Held–Karp for up to [[ExactLimit]] interior
  * nodes and fall back to nearest-neighbour + Or-opt improvement above that.
  * Attention phrases are short, so nearly all real instances are exact.
  */
object ATSP {

  val ExactLimit = 13

  /** Cost standing in for "unreachable" — finite so a tour always exists. */
  val Unreachable = 1e6

  /** Find a minimum-cost path start → (all interior nodes) → end.
    *
    * @param dist full (k+2)×(k+2) asymmetric distance matrix over the node
    *             list [start, interior…, end]; index 0 = start, k+1 = end
    * @return interior node indices (1-based into `dist`) in visiting order
    */
  def solvePath(dist: Array[Array[Double]]): Seq[Int] = {
    val k = dist.length - 2
    if (k <= 0) return Seq.empty
    if (k == 1) return Seq(1)
    if (k <= ExactLimit) heldKarp(dist, k) else heuristic(dist, k)
  }

  /** Exact DP over subsets: dp(S, j) = best cost start→…→j visiting S. */
  private def heldKarp(dist: Array[Array[Double]], k: Int): Seq[Int] = {
    val full = 1 << k
    val dp = Array.fill(full, k)(Double.PositiveInfinity)
    val par = Array.fill(full, k)(-1)
    for (j <- 0 until k) dp(1 << j)(j) = dist(0)(j + 1)
    var s = 1
    while (s < full) {
      var j = 0
      while (j < k) {
        if ((s & (1 << j)) != 0 && !dp(s)(j).isInfinity) {
          val base = dp(s)(j)
          var m = 0
          while (m < k) {
            if ((s & (1 << m)) == 0) {
              val ns = s | (1 << m)
              val c = base + dist(j + 1)(m + 1)
              if (c < dp(ns)(m)) { dp(ns)(m) = c; par(ns)(m) = j }
            }
            m += 1
          }
        }
        j += 1
      }
      s += 1
    }
    val last = (0 until k).minBy(j => dp(full - 1)(j) + dist(j + 1)(k + 1))
    // reconstruct
    val order = collection.mutable.ArrayBuffer[Int]()
    var cur = last; var set = full - 1
    while (cur != -1) {
      order += cur + 1
      val p = par(set)(cur)
      set &= ~(1 << cur)
      cur = p
    }
    order.reverse.toSeq
  }

  /** Nearest-neighbour construction + Or-opt (segment relocation) improvement. */
  private def heuristic(dist: Array[Array[Double]], k: Int): Seq[Int] = {
    val visited = Array.fill(k + 2)(false)
    var cur = 0
    visited(0) = true; visited(k + 1) = true
    val order = collection.mutable.ArrayBuffer[Int]()
    for (_ <- 0 until k) {
      val next = (1 to k).filter(!visited(_)).minBy(dist(cur))
      order += next; visited(next) = true; cur = next
    }
    // Or-opt: relocate segments of length 1..3
    def cost(o: Seq[Int]): Double =
      (0 +: o :+ (k + 1)).sliding(2).map { case Seq(a, b) => dist(a)(b) }.sum
    var best = order.toSeq
    var bestCost = cost(best)
    var improved = true
    while (improved) {
      improved = false
      for (len <- 1 to math.min(3, k - 1); i <- 0 to k - len; j <- 0 to k - len if math.abs(i - j) > 0) {
        val seg = best.slice(i, i + len)
        val rest = best.take(i) ++ best.drop(i + len)
        if (j <= rest.size) {
          val cand = rest.take(j) ++ seg ++ rest.drop(j)
          val c = cost(cand)
          if (c < bestCost - 1e-12) { best = cand; bestCost = c; improved = true }
        }
      }
    }
    best
  }
}
