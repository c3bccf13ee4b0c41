package repro.core

import repro.data.Tokenizer

/** Tuple serialization (§4): `Ser(t) := [CLS] c1 v1 [SEP] c2 v2 … [SEP]`.
  *
  * Only columns aligned to the query (and non-null) are serialized, in the
  * query's column order — exactly Example 4's behaviour (Park Phone dropped,
  * null pads skipped).
  */
object Serializer {

  /** Serialized form for display / model input. */
  def serialize(pairs: Seq[(String, String)]): String =
    if (pairs.isEmpty) "[CLS] [SEP]"
    else pairs.map { case (h, v) => s"$h $v" }.mkString("[CLS] ", " [SEP] ", " [SEP]")

  /** Tokens fed to the featurizer: header and value tokens, specials dropped
    * (BERT-style models treat [CLS]/[SEP] as structure, not content).
    */
  def tokens(pairs: Seq[(String, String)]): Vector[String] =
    pairs.iterator.flatMap { case (h, v) => Tokenizer.tokens(h) ++ Tokenizer.tokens(v) }.toVector
}
