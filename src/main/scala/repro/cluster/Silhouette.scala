package repro.cluster

/** Silhouette coefficient (Rousseeuw 1987), the cluster-count selector used
  * by holistic column alignment (§3.3) — following Khatiwada et al. [26].
  */
object Silhouette {

  /** Mean silhouette over all points; singleton clusters score 0.
    * Undefined (returns -1) when there are fewer than 2 clusters.
    */
  def score(d: Array[Array[Double]], labels: Array[Int]): Double = {
    val n = labels.length
    require(d.length == n, "matrix/labels arity mismatch")
    val ks = labels.distinct
    if (ks.length < 2 || n < 2) return -1.0
    val byCluster: Map[Int, Array[Int]] =
      labels.indices.groupBy(labels).view.mapValues(_.toArray).toMap
    var total = 0.0
    var i = 0
    while (i < n) {
      val own = byCluster(labels(i))
      if (own.length == 1) { /* singleton contributes 0 */ }
      else {
        var a = 0.0
        own.foreach(j => if (j != i) a += d(i)(j))
        a /= (own.length - 1)
        var b = Double.MaxValue
        byCluster.foreach { case (k, members) =>
          if (k != labels(i)) {
            var s = 0.0
            members.foreach(j => s += d(i)(j))
            val m = s / members.length
            if (m < b) b = m
          }
        }
        val s = (b - a) / math.max(a, b)
        total += (if (s.isNaN) 0.0 else s)
      }
      i += 1
    }
    total / n
  }

  /** Pick the cluster count maximizing silhouette among candidate cuts.
    * Returns (bestK, labels, bestScore).
    */
  def bestCut(
      d: Array[Array[Double]],
      cuts: Seq[(Int, Array[Int])],
  ): (Int, Array[Int], Double) = {
    require(cuts.nonEmpty, "no candidate cuts")
    val scored = cuts.map { case (k, ls) => (k, ls, score(d, ls)) }
    scored.maxBy { case (k, _, s) => (s, -k) }
  }
}
