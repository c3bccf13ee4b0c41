package repro.core

import repro.embed.HashLm
import repro.util.VecOps

/** Base (pre-projection) tuple features: mean-pooled hash-LM vectors of the
  * serialized tuple's tokens. This is the "pre-trained transformer output"
  * that either goes out as-is (BERT/RoBERTa baselines in Fig 6), IDF-weighted
  * (sBERT), or through the fine-tuned head ([[DustModel]]).
  */
final case class TupleFeaturizer(lm: HashLm, idf: Option[String => Double] = None) {

  def dim: Int = lm.dim

  /** Feature vector of a tuple given as (header, value) pairs. */
  def features(pairs: Seq[(String, String)]): Array[Double] = {
    val toks = Serializer.tokens(pairs)
    if (toks.isEmpty) new Array[Double](lm.dim)
    else idf match {
      case None    => lm.embedTokens(toks)
      case Some(w) => lm.embedWeighted(toks, toks.map(t => math.max(1e-6, w(t))))
    }
  }

  def featuresOfSerialized(serialized: String): Array[Double] =
    features(Vector(("", serialized))) // tokens() re-tokenizes; header empty

  /** Cosine distance between two tuples in this base space. */
  def cosDist(a: Seq[(String, String)], b: Seq[(String, String)]): Double =
    VecOps.cosineDist(features(a), features(b))
}
