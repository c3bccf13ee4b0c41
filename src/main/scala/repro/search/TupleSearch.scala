package repro.search

import repro.core.OuterUnion.UnionTuple
import repro.embed.HashLm
import repro.util.VecOps

/** Starmie adapted to tuple search (§6.5.1): every lake tuple is indexed as
  * a single-row table and the top-k "tables" (tuples) most similar to the
  * query table are returned. Pure similarity ranking — near-duplicates of
  * query rows win, which is exactly the failure mode Table 3 exposes.
  */
object TupleSearch {

  private val lm = HashLm.starmieBase

  /** Starmie's representation of a single-row table. */
  def tupleEmbedding(t: UnionTuple): Array[Double] =
    lm.embedTokens(repro.core.Serializer.tokens(t.pairs))

  /** Representation of the query table = mean of its tuple embeddings. */
  def queryEmbedding(queryTuples: Seq[UnionTuple]): Array[Double] =
    VecOps.normalize(VecOps.mean(queryTuples.map(tupleEmbedding)))

  /** Top-k lake tuples by similarity to the query table. */
  def topK(lakeTuples: Vector[UnionTuple], queryTuples: Vector[UnionTuple], k: Int): Vector[UnionTuple] = {
    val q = queryEmbedding(queryTuples)
    lakeTuples
      .map(t => (t, VecOps.cosineSim(tupleEmbedding(t), q)))
      .sortBy { case (t, s) => (-s, t.id) }
      .take(k)
      .map(_._1)
  }
}
