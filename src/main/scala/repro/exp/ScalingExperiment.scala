package repro.exp

import repro.core.{DiversifyTuples, DiversityMetrics}
import repro.core.DiversifyTuples.EmbTuple
import repro.divbase._
import repro.util.{Rng, VecOps}

/** Fig 7 + Appendices A.2.2/A.2.3 — runtime scaling of the diversification
  * algorithms over synthetic embedding clouds, the effect of pruning on
  * DUST's runtime, and the impact of the candidate multiplier p.
  */
object ScalingExperiment {

  /** Synthetic cloud: `nClusters` Gaussian blobs in `dim` dimensions —
    * mimics the topical structure of unionable-tuple embeddings.
    */
  def cloud(n: Int, dim: Int = 32, nClusters: Int = 12, seed: Long = 33): Vector[EmbTuple] = {
    val rng = new Rng(seed)
    val centers = Vector.fill(nClusters)(Array.fill(dim)(rng.nextGaussian()))
    (0 until n).toVector.map { i =>
      val c = centers(rng.nextInt(nClusters))
      EmbTuple(i.toLong, s"tab${i % 10}", c.map(_ + 0.35 * rng.nextGaussian()))
    }
  }

  def queryCloud(n: Int, dim: Int = 32, seed: Long = 44): Vector[Array[Double]] = {
    val rng = new Rng(seed)
    Vector.fill(n)(Array.fill(dim)(rng.nextGaussian()))
  }

  final case class TimingRow(method: String, s: Int, k: Int, millis: Double)

  /** Fig 7(a): vary the candidate count s at fixed k. */
  def varyS(sValues: Seq[Int], k: Int, includeGne: Boolean = false): Vector[TimingRow] = {
    val query = queryCloud(40)
    sValues.toVector.flatMap { s =>
      val cands = cloud(s)
      val algos: Vector[DivAlgo] =
        Vector(Gmc(), Clt(), DustDiv()) ++ (if (includeGne) Vector(Gne()) else Vector.empty)
      algos.map { a =>
        val (_, ns) = Fmt.timed(a.select(cands, query, k))
        TimingRow(a.name, s, k, ns / 1e6)
      }
    }
  }

  /** Fig 7(b): vary the output size k at fixed s. */
  def varyK(kValues: Seq[Int], s: Int): Vector[TimingRow] = {
    val query = queryCloud(40)
    val cands = cloud(s)
    kValues.toVector.flatMap { k =>
      Vector[DivAlgo](Gmc(), Clt(), DustDiv()).map { a =>
        val (_, ns) = Fmt.timed(a.select(cands, query, k))
        TimingRow(a.name, s, k, ns / 1e6)
      }
    }
  }

  /** A.2.3: DUST runtime with and without pruning (same selection quality
    * comparison is in the bench output).
    */
  final case class PruningRow(variant: String, inputSize: Int, clusteredSize: Int, millis: Double)

  def pruningEffect(nTuples: Int, s: Int, k: Int): Vector[PruningRow] = {
    val cands = cloud(nTuples)
    val query = queryCloud(40)
    val (withP, t1) = Fmt.timed {
      val pruned = DiversifyTuples.prune(cands, s)
      DustDiv().select(pruned, query, k)
      pruned.size
    }
    val (withoutP, t2) = Fmt.timed {
      DustDiv().select(cands, query, k)
      cands.size
    }
    Vector(
      PruningRow("with pruning", nTuples, withP, t1 / 1e6),
      PruningRow("without pruning", nTuples, withoutP, t2 / 1e6),
    )
  }

  /** A.2.2: percentage improvement of the diversity metrics as p grows. */
  final case class PRow(p: Int, avgDiv: Double, minDiv: Double)

  def pImpact(ps: Seq[Int], s: Int = 800, k: Int = 30): Vector[PRow] = {
    // Query tuples live in the same embedding region as the candidates
    // (they are unionable), so re-ranking among > k candidates has query
    // overlap to avoid — the situation p controls (App. A.2.2).
    val all = cloud(s + 40)
    val cands = all.take(s)
    val query = all.drop(s).map(_.vec)
    ps.toVector.map { p =>
      val sel = DustDiv(p = p).select(cands, query, k).map(_.vec)
      PRow(p,
        DiversityMetrics.averageDiversity(query, sel),
        DiversityMetrics.minDiversity(query, sel))
    }
  }

  def renderTimings(rows: Seq[TimingRow], varying: String): String =
    Fmt.table(
      Seq("Method", "s", "k", "Time(ms)"),
      rows.map(r => Seq(r.method, r.s.toString, r.k.toString, Fmt.f2(r.millis))))
}
