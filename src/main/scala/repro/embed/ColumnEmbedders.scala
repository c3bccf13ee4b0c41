package repro.embed

import repro.data.SimpleTable
import repro.util.VecOps

/** Column embedding strategies evaluated in Table 1 (§6.2.3).
  *
  *  - Cell-level: each cell embedded independently, then averaged. The cell
  *    LM sees one cell at a time, so its effective context strength is
  *    reduced (α·0.6) — the paper's explanation for why cell-level trails
  *    column-level ("receives tokens only from one cell at a time").
  *  - Column-level: the 512 most representative tokens by TF-IDF embedded
  *    together with TF-IDF weights (common tokens down-weighted).
  *  - Starmie: column-level embedding contaminated with the table's mean
  *    embedding — Starmie encodes each column *with the context of the whole
  *    table* (§6.2.4), which is exactly what hurts it for alignment.
  */
sealed trait ColumnEmbedder {
  def name: String

  /** One embedding per column of `table`. */
  def embedAll(table: SimpleTable, tfidf: TfIdf): Vector[Array[Double]]
}

/** Cell-level variant of a language / word model. */
final case class CellLevelEmbedder(lm: HashLm) extends ColumnEmbedder {
  val name = s"Cell-level ${lm.name}"
  private val cellLm = lm.copy(alpha = lm.alpha * 0.6)

  def embedAll(table: SimpleTable, tfidf: TfIdf): Vector[Array[Double]] =
    table.cols.indices.toVector.map { j =>
      val cells = table.columnValues(j)
      if (cells.isEmpty) new Array[Double](lm.dim)
      else VecOps.normalize(VecOps.mean(cells.map(cellLm.embedText)))
    }
}

/** Column-level variant: TF-IDF top-512 tokens, weighted pooling. */
final case class ColumnLevelEmbedder(lm: HashLm) extends ColumnEmbedder {
  val name = s"Column-level ${lm.name}"

  def embedAll(table: SimpleTable, tfidf: TfIdf): Vector[Array[Double]] =
    table.cols.indices.toVector.map { j =>
      val top = tfidf.topTokens(table.columnValues(j))
      if (top.isEmpty) new Array[Double](lm.dim)
      else lm.embedWeighted(top.map(_._1), top.map(_._2))
    }
}

/** Starmie-style contextualized column embeddings: each column is mixed
  * with an attention-like, column-specific combination of its sibling
  * columns (contrastive training contextualizes every column against the
  * *whole* table, §6.2.4). The mixing weights depend on (table, column), so
  * the pollution is non-uniform — which is what breaks both bipartite
  * matching and holistic clustering on Starmie embeddings in Table 1.
  */
final case class StarmieEmbedder(beta: Double = 0.6) extends ColumnEmbedder {
  val name = "Starmie"
  private val inner = ColumnLevelEmbedder(HashLm.starmieBase)

  def embedAll(table: SimpleTable, tfidf: TfIdf): Vector[Array[Double]] = {
    val per = inner.embedAll(table, tfidf)
    per.indices.toVector.map { j =>
      val e = per(j)
      val v = new Array[Double](e.length)
      VecOps.addInPlace(v, e, 1.0 - beta)
      if (per.length > 1) {
        val rng = new repro.util.Rng(repro.util.Rng.mix(
          repro.util.Rng.hashString(table.name), j.toLong))
        val ws = per.indices.map(l => if (l == j) 0.0 else rng.nextDouble())
        val total = ws.sum
        per.indices.foreach { l =>
          if (l != j) VecOps.addInPlace(v, per(l), beta * ws(l) / total)
        }
      }
      VecOps.normalize(v)
    }
  }
}

object ColumnEmbedders {
  /** The ten Table-1 configurations, in the paper's row order. */
  val table1Configs: Vector[ColumnEmbedder] = Vector(
    CellLevelEmbedder(HashLm.fastText),
    CellLevelEmbedder(HashLm.glove),
    CellLevelEmbedder(HashLm.bert),
    CellLevelEmbedder(HashLm.roberta),
    CellLevelEmbedder(HashLm.sbert),
    ColumnLevelEmbedder(HashLm.bert),
    ColumnLevelEmbedder(HashLm.roberta),
    ColumnLevelEmbedder(HashLm.sbert),
    StarmieEmbedder(), // used both for Starmie (B) and Starmie (H)
  )

  /** DUST's production choice (§6.2.4): Column-level RoBERTa. */
  val dustDefault: ColumnEmbedder = ColumnLevelEmbedder(HashLm.roberta)
}
