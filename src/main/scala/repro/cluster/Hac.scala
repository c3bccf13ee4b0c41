package repro.cluster

/** Agglomerative hierarchical clustering with average linkage (UPGMA),
  * built with the nearest-neighbour-chain algorithm: O(n²) time, O(n²)
  * memory on a full distance matrix. UPGMA is reducible, so NN-chain yields
  * the exact dendrogram; heights are monotone, so cutting at k clusters is
  * "apply the n−k lowest merges".
  *
  * This is the clustering engine behind both DUST's tuple diversification
  * (Algorithm 2, Line 4) and the CLT baseline.
  */
object Hac {

  /** One merge of cluster ids `a` and `b` (scipy-style ids: 0..n-1 are
    * leaves, n+m is the cluster made by merge m) at linkage `height`.
    */
  final case class Merge(a: Int, b: Int, height: Double)

  /** Full merge tree over n leaves. */
  final case class Dendrogram(n: Int, merges: Vector[Merge]) {
    require(merges.length == math.max(0, n - 1), s"expected ${n - 1} merges, got ${merges.length}")

    /** Labels (0..k-1, in order of first appearance) for a k-cluster cut. */
    def cut(k: Int): Array[Int] = {
      require(k >= 1 && k <= n, s"cut k=$k outside [1, $n]")
      // Stable sort by height: parents never precede their children because
      // UPGMA heights are monotone and formation order breaks ties.
      val ordered = merges.sortBy(_.height)
      // Union-find over leaves; every cluster id maps to one member leaf.
      val parent = Array.tabulate(n)(identity)
      def find(x: Int): Int = { var r = x; while (parent(r) != r) r = parent(r); var c = x
        while (parent(c) != r) { val nx = parent(c); parent(c) = r; c = nx }; r }
      val member = new Array[Int](2 * n - 1)
      var i = 0
      while (i < n) { member(i) = i; i += 1 }
      // Map original (unsorted) merge index -> cluster id for member lookup.
      val idOf = merges.zipWithIndex.map { case (m, j) => m -> (n + j) }.toMap
      ordered.take(n - k).foreach { m =>
        val ra = find(member(m.a)); val rb = find(member(m.b))
        parent(rb) = ra
        member(idOf(m)) = ra
      }
      // But member() for un-applied merges is never read; fill applied above.
      val labelOf = scala.collection.mutable.HashMap.empty[Int, Int]
      val labels = new Array[Int](n)
      i = 0
      while (i < n) {
        val r = find(i)
        labels(i) = labelOf.getOrElseUpdate(r, labelOf.size)
        i += 1
      }
      labels
    }
  }

  /** Symmetric distance matrix of a point set. */
  def distMatrix[A](points: IndexedSeq[A], dist: (A, A) => Double): Array[Array[Double]] = {
    val n = points.length
    val d = Array.ofDim[Double](n, n)
    var i = 0
    while (i < n) {
      var j = i + 1
      while (j < n) { val v = dist(points(i), points(j)); d(i)(j) = v; d(j)(i) = v; j += 1 }
      j = 0
      i += 1
    }
    d
  }

  /** UPGMA dendrogram via nearest-neighbour chain. `d0` is consumed as
    * scratch space (cloned internally).
    */
  def upgma(d0: Array[Array[Double]]): Dendrogram = {
    val n = d0.length
    if (n == 0) return Dendrogram(0, Vector.empty)
    if (n == 1) return Dendrogram(1, Vector.empty)
    val d = d0.map(_.clone())
    val active = Array.fill(n)(true)
    val size = Array.fill(n)(1)
    val cid = Array.tabulate(n)(identity) // slot -> current cluster id
    var nextId = n
    val merges = Vector.newBuilder[Merge]
    var nMerges = 0
    val chain = new Array[Int](n + 1)
    var chainLen = 0

    def nearest(s: Int): Int = {
      var best = -1; var bd = Double.MaxValue
      var t = 0
      while (t < n) {
        if (active(t) && t != s && d(s)(t) < bd) { bd = d(s)(t); best = t }
        t += 1
      }
      best
    }

    while (nMerges < n - 1) {
      if (chainLen == 0) {
        var s = 0
        while (!active(s)) s += 1
        chain(0) = s; chainLen = 1
      }
      val top = chain(chainLen - 1)
      val nn = nearest(top)
      if (chainLen >= 2 && nn == chain(chainLen - 2)) {
        // Reciprocal nearest neighbours: merge top into nn's slot (keep top).
        val i = top; val j = nn
        merges += Merge(cid(i), cid(j), d(i)(j))
        var s = 0
        while (s < n) {
          if (active(s) && s != i && s != j) {
            val v = (size(i) * d(i)(s) + size(j) * d(j)(s)) / (size(i) + size(j))
            d(i)(s) = v; d(s)(i) = v
          }
          s += 1
        }
        size(i) += size(j)
        active(j) = false
        cid(i) = nextId; nextId += 1
        nMerges += 1
        chainLen -= 2
      } else {
        chain(chainLen) = nn; chainLen += 1
      }
    }
    Dendrogram(n, merges.result())
  }

  /** Convenience: labels of a k-cluster UPGMA cut over points. */
  def clusterLabels[A](points: IndexedSeq[A], k: Int, dist: (A, A) => Double): Array[Int] = {
    if (points.isEmpty) return Array.empty
    upgma(distMatrix(points, dist)).cut(math.min(k, points.length))
  }
}
