package repro.embed

import repro.data.{SimpleTable, Tokenizer}

/** Corpus TF-IDF over columns (documents = columns), used by the
  * column-level embedders to select at most 512 representative tokens per
  * column — the paper's workaround for LM input limits (§6.2.3).
  */
final class TfIdf(idf: Map[String, Double], nDocs: Int) {

  /** IDF of a token; unseen tokens get the max IDF. */
  def idfOf(token: String): Double =
    idf.getOrElse(token, math.log(1.0 + nDocs.toDouble))

  /** Top-`limit` (token, tf·idf weight) pairs of a column, weight-descending.
    * Ties broken lexicographically so selection is deterministic.
    */
  def topTokens(values: Seq[String], limit: Int = TfIdf.TokenLimit): Vector[(String, Double)] = {
    val toks = Tokenizer.columnTokens(values)
    if (toks.isEmpty) return Vector.empty
    val tf = toks.groupBy(identity).view.mapValues(_.size.toDouble / toks.size).toMap
    tf.map { case (t, f) => (t, f * idfOf(t)) }
      .toVector
      .sortBy { case (t, w) => (-w, t) }
      .take(limit)
  }
}

object TfIdf {
  /** The paper's LM token limit. */
  val TokenLimit = 512

  /** Fit IDF over all columns of the given tables (queries + lake). */
  def fit(tables: Seq[SimpleTable]): TfIdf = {
    val docs: Seq[Set[String]] = tables.flatMap { t =>
      t.cols.indices.map(j => Tokenizer.columnTokens(t.columnValues(j)).toSet)
    }
    val n = math.max(1, docs.size)
    val df = scala.collection.mutable.HashMap.empty[String, Int]
    docs.foreach(_.foreach(tok => df.update(tok, df.getOrElse(tok, 0) + 1)))
    val idf = df.iterator.map { case (t, d) => t -> math.log(1.0 + n.toDouble / d) }.toMap
    new TfIdf(idf, n)
  }
}
