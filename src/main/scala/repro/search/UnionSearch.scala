package repro.search

import repro.data.{LakeBenchmark, SimpleTable}
import repro.embed.{ColumnEmbedder, TfIdf}
import repro.util.VecOps

/** Starmie-style table union search (Fan et al. [11], §3.3): rank lake
  * tables by the maximum-weight bipartite matching score between their
  * column embeddings and the query's. Because scoring is pure similarity,
  * near-copies of the query rank on top — the redundancy DUST addresses.
  */
object UnionSearch {

  final case class Scored(table: SimpleTable, score: Double)

  /** Greedy maximum-weight bipartite matching score, normalized by the
    * number of query columns.
    */
  def unionabilityScore(qEmb: Vector[Array[Double]], tEmb: Vector[Array[Double]]): Double = {
    if (qEmb.isEmpty || tEmb.isEmpty) return 0.0
    val sims = for {
      qj <- qEmb.indices
      tj <- tEmb.indices
    } yield (VecOps.cosineSim(qEmb(qj), tEmb(tj)), qj, tj)
    val usedQ = scala.collection.mutable.HashSet.empty[Int]
    val usedT = scala.collection.mutable.HashSet.empty[Int]
    var total = 0.0
    sims.sortBy { case (s, qj, tj) => (-s, qj, tj) }.foreach { case (s, qj, tj) =>
      if (!usedQ.contains(qj) && !usedT.contains(tj)) {
        usedQ += qj; usedT += tj; total += s
      }
    }
    total / qEmb.size
  }

  /** Rank the whole lake against a query; descending score. */
  def rankTables(query: SimpleTable, bench: LakeBenchmark,
                 embedder: ColumnEmbedder, tfidf: TfIdf): Vector[Scored] = {
    val qEmb = embedder.embedAll(query, tfidf)
    bench.lake
      .map(t => Scored(t, unionabilityScore(qEmb, embedder.embedAll(t, tfidf))))
      .sortBy(s => (-s.score, s.table.name))
  }

  /** Top-N unionable tables (the `SearchTables` step of Algorithm 1). */
  def searchTables(query: SimpleTable, bench: LakeBenchmark, topN: Int,
                   embedder: ColumnEmbedder, tfidf: TfIdf): Vector[SimpleTable] =
    rankTables(query, bench, embedder, tfidf).take(topN).map(_.table)

  /** Mean Average Precision of a ranking against same-base ground truth —
    * used to report search quality alongside Table 3 (§6.5.2).
    */
  def averagePrecision(query: SimpleTable, ranked: Seq[SimpleTable]): Double = {
    val relevantTotal = ranked.count(_.baseId == query.baseId)
    if (relevantTotal == 0) return 0.0
    var hits = 0; var sum = 0.0
    ranked.zipWithIndex.foreach { case (t, i) =>
      if (t.baseId == query.baseId) { hits += 1; sum += hits.toDouble / (i + 1) }
    }
    sum / relevantTotal
  }
}
