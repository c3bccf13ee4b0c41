package repro.cluster

/** Agglomerative clustering (UPGMA) with cannot-link groups, used by
  * holistic column alignment: no two columns of the same table may land in
  * one cluster (§3.3). Naive O(n³) merge loop — alignment instances are
  * small (tens of columns), and the constraint breaks NN-chain reducibility.
  */
object ConstrainedHac {

  /** Labels after every achievable merge level.
    *
    * @param levels (k, labels) for every reachable cluster count k, from n
    *               down to the smallest achievable count, labels 0..k-1.
    */
  final case class Result(levels: Vector[(Int, Array[Int])]) {
    def labelsAt(k: Int): Option[Array[Int]] = levels.find(_._1 == k).map(_._2)
    def minK: Int = levels.last._1
  }

  /** @param d      symmetric point distance matrix
    * @param group  cannot-link group of each point (same group ⇒ never merged)
    */
  def cluster(d: Array[Array[Double]], group: Array[Int]): Result = {
    val n = d.length
    require(group.length == n, "group arity mismatch")
    if (n == 0) return Result(Vector.empty)

    val cd = d.map(_.clone())               // cluster distance matrix (slots)
    val active = Array.fill(n)(true)
    val size = Array.fill(n)(1)
    val groups = Array.tabulate(n)(i => Set(group(i)))
    val assign = Array.tabulate(n)(identity) // point -> slot

    def snapshot(): (Int, Array[Int]) = {
      val slots = (0 until n).filter(active)
      val renum = slots.zipWithIndex.toMap
      (slots.size, assign.map(renum))
    }

    val levels = Vector.newBuilder[(Int, Array[Int])]
    levels += snapshot()

    var merged = true
    while (merged) {
      merged = false
      var bi = -1; var bj = -1; var bd = Double.MaxValue
      var i = 0
      while (i < n) {
        if (active(i)) {
          var j = i + 1
          while (j < n) {
            if (active(j) && (groups(i) & groups(j)).isEmpty && cd(i)(j) < bd) {
              bd = cd(i)(j); bi = i; bj = j
            }
            j += 1
          }
        }
        i += 1
      }
      if (bi >= 0) {
        // UPGMA update into slot bi.
        var s = 0
        while (s < n) {
          if (active(s) && s != bi && s != bj) {
            val v = (size(bi) * cd(bi)(s) + size(bj) * cd(bj)(s)) / (size(bi) + size(bj))
            cd(bi)(s) = v; cd(s)(bi) = v
          }
          s += 1
        }
        size(bi) += size(bj)
        groups(bi) = groups(bi) | groups(bj)
        active(bj) = false
        var p = 0
        while (p < n) { if (assign(p) == bj) assign(p) = bi; p += 1 }
        levels += snapshot()
        merged = true
      }
    }
    Result(levels.result())
  }
}
