package repro.util

/** Dense vector primitives used throughout (embeddings are Array[Double]).
  *
  * All functions are allocation-conscious; distance kernels are the hot
  * path of clustering and diversification.
  */
object VecOps {

  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def norm(a: Array[Double]): Double = math.sqrt(dot(a, a))

  /** Cosine similarity; 0 if either vector is all-zero. */
  def cosineSim(a: Array[Double], b: Array[Double]): Double = {
    val na = norm(a); val nb = norm(b)
    if (na == 0.0 || nb == 0.0) 0.0 else dot(a, b) / (na * nb)
  }

  /** Cosine distance = 1 - cosine similarity; in [0, 2]. δ(x, x) = 0. */
  def cosineDist(a: Array[Double], b: Array[Double]): Double = 1.0 - cosineSim(a, b)

  def euclidean(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { val d = a(i) - b(i); s += d * d; i += 1 }
    math.sqrt(s)
  }

  def manhattan(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, s"dim mismatch ${a.length} vs ${b.length}")
    var s = 0.0; var i = 0
    while (i < a.length) { s += math.abs(a(i) - b(i)); i += 1 }
    s
  }

  /** a + b into a fresh array. */
  def add(a: Array[Double], b: Array[Double]): Array[Double] = {
    val r = new Array[Double](a.length)
    var i = 0
    while (i < a.length) { r(i) = a(i) + b(i); i += 1 }
    r
  }

  /** a += w * b in place. */
  def addInPlace(a: Array[Double], b: Array[Double], w: Double = 1.0): Unit = {
    var i = 0
    while (i < a.length) { a(i) += w * b(i); i += 1 }
  }

  def scale(a: Array[Double], w: Double): Array[Double] = a.map(_ * w)

  /** Unit-normalize (copy); zero vector stays zero. */
  def normalize(a: Array[Double]): Array[Double] = {
    val n = norm(a)
    if (n == 0.0) a.clone() else a.map(_ / n)
  }

  /** Element-wise mean of non-empty vector set. */
  def mean(vs: Iterable[Array[Double]]): Array[Double] = {
    require(vs.nonEmpty, "mean of empty set")
    val d = vs.head.length
    val acc = new Array[Double](d)
    var n = 0
    vs.foreach { v => addInPlace(acc, v); n += 1 }
    var i = 0
    while (i < d) { acc(i) /= n; i += 1 }
    acc
  }

  /** Weighted mean; weights need not sum to 1 (they are normalized). */
  def weightedMean(vs: Seq[Array[Double]], ws: Seq[Double]): Array[Double] = {
    require(vs.nonEmpty && vs.length == ws.length, "weightedMean arity")
    val total = ws.sum
    require(total > 0, "weights must have positive sum")
    val acc = new Array[Double](vs.head.length)
    vs.zip(ws).foreach { case (v, w) => addInPlace(acc, v, w / total) }
    acc
  }

  /** Index of the medoid: element minimizing summed distance to the others. */
  def medoidIndex(vs: IndexedSeq[Array[Double]], dist: (Array[Double], Array[Double]) => Double): Int = {
    require(vs.nonEmpty, "medoid of empty set")
    var best = 0; var bestSum = Double.MaxValue
    var i = 0
    while (i < vs.length) {
      var s = 0.0; var j = 0
      while (j < vs.length) { if (i != j) s += dist(vs(i), vs(j)); j += 1 }
      if (s < bestSum) { bestSum = s; best = i }
      i += 1
    }
    best
  }
}
