package repro.core

import repro.cluster.{ConstrainedHac, Hac, Silhouette}
import repro.data.SimpleTable
import repro.embed.{ColumnEmbedder, TfIdf}
import repro.util.VecOps

/** Holistic column alignment (§3.3, Appendix A.1.1).
  *
  * All columns of the query and the discovered unionable tables are embedded,
  * clustered with constrained agglomerative clustering (columns of one table
  * never share a cluster), the cluster count is chosen by silhouette, and
  * clusters without a query column are discarded. Also implements the
  * per-table maximum-weight bipartite matcher used as the Starmie (B)
  * baseline, and the pairwise P/R/F1 evaluation of §6.2.2.
  */
object ColumnAlignment {

  /** Identity of a physical column. */
  final case class ColKey(table: String, colIdx: Int)

  /** One kept cluster: a query column plus the lake columns aligned to it. */
  final case class AlignedCluster(queryCol: Int, members: Vector[ColKey])

  /** Alignment of a set of lake tables to one query. */
  final case class Aligned(queryName: String, clusters: Vector[AlignedCluster]) {
    /** queryColIdx → (tableName → lake colIdx); at most one col per table. */
    def lookup: Map[Int, Map[String, Int]] =
      clusters.map { c =>
        c.queryCol -> c.members.map(m => m.table -> m.colIdx).toMap
      }.toMap
  }

  private final case class Col(key: ColKey, tableIdx: Int, isQuery: Boolean, baseCol: Int)

  private def allCols(query: SimpleTable, tables: Seq[SimpleTable]): Vector[Col] = {
    val q = query.cols.indices.map(j => Col(ColKey(query.name, j), 0, isQuery = true, query.cols(j).baseCol))
    val t = tables.zipWithIndex.flatMap { case (tab, ti) =>
      tab.cols.indices.map(j => Col(ColKey(tab.name, j), ti + 1, isQuery = false, tab.cols(j).baseCol))
    }
    (q ++ t).toVector
  }

  private def embedAllCols(query: SimpleTable, tables: Seq[SimpleTable],
                           embedder: ColumnEmbedder, tfidf: TfIdf): Vector[Array[Double]] =
    embedder.embedAll(query, tfidf) ++ tables.flatMap(t => embedder.embedAll(t, tfidf))

  /** Holistic alignment: constrained UPGMA + silhouette cluster count. */
  def alignHolistic(query: SimpleTable, tables: Seq[SimpleTable],
                    embedder: ColumnEmbedder, tfidf: TfIdf): Aligned = {
    val cols = allCols(query, tables)
    val embs = embedAllCols(query, tables, embedder, tfidf)
    require(cols.length == embs.length, "column/embedding arity mismatch")
    val d = Hac.distMatrix(embs, VecOps.euclidean)
    val groups = cols.map(_.tableIdx).toArray
    val result = ConstrainedHac.cluster(d, groups)
    // Candidate cuts: every achievable level with >= 2 clusters.
    val cuts = result.levels.filter(_._1 >= 2)
    val labels =
      if (cuts.isEmpty) result.levels.head._2
      else Silhouette.bestCut(d, cuts)._2
    val byCluster = cols.indices.groupBy(labels(_))
    val kept = byCluster.values.toVector.flatMap { members =>
      members.find(cols(_).isQuery).map { qi =>
        AlignedCluster(
          cols(qi).key.colIdx,
          members.filterNot(_ == qi).map(cols(_).key).toVector,
        )
      }
    }
    Aligned(query.name, kept.sortBy(_.queryCol))
  }

  /** Starmie (B): per-table greedy maximum-weight bipartite matching of lake
    * columns to query columns (no threshold — every column finds a partner
    * if one is free, which is what costs it precision).
    */
  def alignBipartite(query: SimpleTable, tables: Seq[SimpleTable],
                     embedder: ColumnEmbedder, tfidf: TfIdf): Aligned = {
    val qEmb = embedder.embedAll(query, tfidf)
    val perQuery = Array.fill(query.nCols)(Vector.newBuilder[ColKey])
    tables.foreach { t =>
      val tEmb = embedder.embedAll(t, tfidf)
      val sims = for {
        qj <- query.cols.indices
        tj <- t.cols.indices
      } yield (VecOps.cosineSim(qEmb(qj), tEmb(tj)), qj, tj)
      val usedQ = scala.collection.mutable.HashSet.empty[Int]
      val usedT = scala.collection.mutable.HashSet.empty[Int]
      sims.sortBy { case (s, qj, tj) => (-s, qj, tj) }.foreach { case (_, qj, tj) =>
        if (!usedQ.contains(qj) && !usedT.contains(tj)) {
          usedQ += qj; usedT += tj
          perQuery(qj) += ColKey(t.name, tj)
        }
      }
    }
    Aligned(query.name,
      query.cols.indices.map(qj => AlignedCluster(qj, perQuery(qj).result())).toVector)
  }

  // ---------------------------------------------------------------------
  // Evaluation (§6.2.2): pairwise precision / recall / F1.
  // ---------------------------------------------------------------------

  final case class Prf(precision: Double, recall: Double, f1: Double)

  private def pairKey(a: ColKey, b: ColKey): (String, String) = {
    val ka = s"${a.table}#${a.colIdx}"; val kb = s"${b.table}#${b.colIdx}"
    if (ka <= kb) (ka, kb) else (kb, ka)
  }

  private def clusterPairs(queryCol: ColKey, members: Seq[ColKey]): Set[(String, String)] =
    if (members.isEmpty) Set((s"alone:${queryCol.table}#${queryCol.colIdx}", ""))
    else {
      val all = queryCol +: members.toVector
      (for { i <- all.indices; j <- (i + 1) until all.length } yield pairKey(all(i), all(j))).toSet
    }

  /** Ground truth from generator provenance: a lake column aligns with the
    * query column sharing its `baseCol` (tables are same-base by input).
    */
  def groundTruthPairs(query: SimpleTable, tables: Seq[SimpleTable]): Set[(String, String)] =
    query.cols.indices.flatMap { qj =>
      val bc = query.cols(qj).baseCol
      val members = tables.flatMap { t =>
        t.cols.indices.filter(t.cols(_).baseCol == bc).map(j => ColKey(t.name, j))
      }
      clusterPairs(ColKey(query.name, qj), members)
    }.toSet

  def predictedPairs(aligned: Aligned): Set[(String, String)] =
    aligned.clusters.flatMap { c =>
      clusterPairs(ColKey(aligned.queryName, c.queryCol), c.members)
    }.toSet

  def evaluate(aligned: Aligned, query: SimpleTable, tables: Seq[SimpleTable]): Prf = {
    val gt = groundTruthPairs(query, tables)
    val pred = predictedPairs(aligned)
    val hit = (gt & pred).size.toDouble
    val p = if (pred.isEmpty) 0.0 else hit / pred.size
    val r = if (gt.isEmpty) 0.0 else hit / gt.size
    val f1 = if (p + r == 0.0) 0.0 else 2 * p * r / (p + r)
    Prf(p, r, f1)
  }
}
