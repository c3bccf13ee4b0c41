package repro.exp

import repro.core.{Ditto, DustModel, TupleFeaturizer}
import repro.embed.HashLm

/** Trained-model registry shared by experiments and benches. Training is
  * deterministic, so all suites agree on the models.
  */
object Models {

  /** Base featurizers (the "pre-trained transformer output"). */
  lazy val bertBase: TupleFeaturizer    = TupleFeaturizer(HashLm.bert)
  lazy val robertaBase: TupleFeaturizer = TupleFeaturizer(HashLm.roberta)

  /** sBERT pools with IDF weighting (sentence-similarity fine-tuning
    * down-weights ubiquitous tokens).
    */
  lazy val sbertBase: TupleFeaturizer = {
    val tfidf = Benchmarks.tfidfFor(Benchmarks.tus)
    TupleFeaturizer(HashLm.sbert, idf = Some(tfidf.idfOf))
  }

  /** Encoders as the fine-tuning heads see them (token-level information
    * retained; see HashLm.dustBase).
    */
  lazy val bertEncoder: TupleFeaturizer    = TupleFeaturizer(HashLm.dustBase(HashLm.bert))
  lazy val robertaEncoder: TupleFeaturizer = TupleFeaturizer(HashLm.dustBase(HashLm.roberta))

  /** DUST (BERT): fine-tuned on the TUS pair benchmark. */
  lazy val dustBert: DustModel = {
    val s = Benchmarks.fineTune
    DustModel.finetuneOnPairs(bertEncoder, s.train, s.validation, DustModel.TrainConfig(seed = 11))._1
  }

  /** DUST (RoBERTa): the production model (§6.3.4). */
  lazy val dustRoberta: DustModel = {
    val s = Benchmarks.fineTune
    DustModel.finetuneOnPairs(robertaEncoder, s.train, s.validation, DustModel.TrainConfig(seed = 12))._1
  }

  /** Ditto: entity-matching fine-tuning of the same encoder. */
  lazy val ditto: DustModel = Ditto.train(robertaEncoder, Benchmarks.tus)
}
