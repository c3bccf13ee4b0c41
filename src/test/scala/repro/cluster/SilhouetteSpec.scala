package repro.cluster

import repro.SparkSpec
import repro.util.{Rng, VecOps}

class SilhouetteSpec extends SparkSpec {

  private def dm(pts: Seq[Array[Double]]) =
    Hac.distMatrix(pts.toIndexedSeq, VecOps.euclidean)

  test("perfect two-blob clustering scores near 1") {
    val rng = new Rng(1)
    val pts = Vector.fill(10)(Array(rng.nextGaussian() * 0.01)) ++
              Vector.fill(10)(Array(10.0 + rng.nextGaussian() * 0.01))
    val labels = Array.fill(10)(0) ++ Array.fill(10)(1)
    assert(Silhouette.score(dm(pts), labels) > 0.95)
  }

  test("random labels score poorly") {
    val rng = new Rng(2)
    val pts = Vector.fill(20)(Array(rng.nextGaussian()))
    val labels = Array.tabulate(20)(_ % 2)
    assert(Silhouette.score(dm(pts), labels) < 0.5)
  }

  test("single cluster is undefined (-1)") {
    val pts = Seq(Array(0.0), Array(1.0))
    assert(Silhouette.score(dm(pts), Array(0, 0)) == -1.0)
  }

  test("singleton clusters contribute zero") {
    val pts = Seq(Array(0.0), Array(5.0), Array(5.1))
    val s = Silhouette.score(dm(pts), Array(0, 1, 1))
    assert(s > 0.0) // the pair contributes positively, singleton zero
  }

  test("correct split scores above a merged mis-split") {
    val rng = new Rng(3)
    val a = Vector.fill(8)(Array(0.0 + rng.nextGaussian() * 0.05))
    val b = Vector.fill(8)(Array(4.0 + rng.nextGaussian() * 0.05))
    val pts = a ++ b
    val good = Array.fill(8)(0) ++ Array.fill(8)(1)
    val bad = Array.tabulate(16)(_ % 2)
    assert(Silhouette.score(dm(pts), good) > Silhouette.score(dm(pts), bad))
  }

  test("bestCut picks the true number of blobs") {
    val rng = new Rng(4)
    val pts = Vector(0.0, 6.0, 12.0).flatMap(c => Vector.fill(8)(Array(c + rng.nextGaussian() * 0.1)))
    val d = dm(pts)
    val den = Hac.upgma(d.map(_.clone()))
    val cuts = (2 to 8).map(k => (k, den.cut(k)))
    val (bestK, _, _) = Silhouette.bestCut(d, cuts)
    assert(bestK == 3)
  }

  test("bestCut rejects empty candidate list") {
    intercept[IllegalArgumentException](Silhouette.bestCut(Array.empty, Nil))
  }

  test("bestCut prefers smaller k on ties") {
    val pts = Seq(Array(0.0), Array(10.0))
    val d = dm(pts)
    val cuts = Seq((2, Array(0, 1)))
    assert(Silhouette.bestCut(d, cuts)._1 == 2)
  }
}
