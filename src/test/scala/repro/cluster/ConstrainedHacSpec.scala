package repro.cluster

import repro.SparkSpec
import repro.util.VecOps

class ConstrainedHacSpec extends SparkSpec {

  private def dm(pts: Seq[Array[Double]]) =
    Hac.distMatrix(pts.toIndexedSeq, VecOps.euclidean)

  test("never merges points of the same group") {
    // Two close points share a group: they must stay apart at every level.
    val pts = Seq(Array(0.0), Array(0.01), Array(5.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 1, 2))
    res.levels.foreach { case (_, labels) => assert(labels(0) != labels(1)) }
  }

  test("unconstrained groups merge down to one cluster") {
    val pts = Seq(Array(0.0), Array(1.0), Array(2.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 2, 3))
    assert(res.minK == 1)
  }

  test("levels run from n down to minK") {
    val pts = Seq(Array(0.0), Array(1.0), Array(2.0), Array(3.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 2, 3, 4))
    assert(res.levels.map(_._1) == Vector(4, 3, 2, 1))
  }

  test("closest compatible pair merges first") {
    val pts = Seq(Array(0.0), Array(0.1), Array(5.0), Array(9.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 2, 3, 4))
    val at3 = res.labelsAt(3).get
    assert(at3(0) == at3(1))
  }

  test("constraint forces the second-best merge") {
    val pts = Seq(Array(0.0), Array(0.1), Array(0.3))
    // 0 and 1 are closest but same group; 1-2 is next (0.2) vs 0-2 (0.3).
    val res = ConstrainedHac.cluster(dm(pts), Array(7, 7, 8))
    val at2 = res.labelsAt(2).get
    assert(at2(1) == at2(2) && at2(0) != at2(1))
  }

  test("merged clusters accumulate group constraints") {
    // After merging {a(g1), b(g2)}, the cluster can no longer take g1 or g2.
    val pts = Seq(Array(0.0), Array(0.1), Array(0.2), Array(10.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 2, 1, 3))
    // Point 2 (group 1) can never join a cluster containing point 0 (group 1).
    res.levels.foreach { case (_, labels) => assert(labels(0) != labels(2)) }
  }

  test("labels at every level are contiguous from 0") {
    val pts = Seq(Array(0.0), Array(2.0), Array(4.0), Array(6.0))
    val res = ConstrainedHac.cluster(dm(pts), Array(1, 2, 3, 4))
    res.levels.foreach { case (k, labels) =>
      assert(labels.toSet == (0 until k).toSet)
    }
  }

  test("empty input yields empty result") {
    assert(ConstrainedHac.cluster(Array.empty, Array.empty).levels.isEmpty)
  }

  test("fully constrained input cannot merge at all") {
    val pts = Seq(Array(0.0), Array(0.1))
    val res = ConstrainedHac.cluster(dm(pts), Array(5, 5))
    assert(res.minK == 2)
  }
}
