package repro.exp

import repro.core.DustModel

/** Fig 6 — unionable tuple representation accuracy (§6.3): six embedders
  * classified with the fixed cosine-distance threshold (0.7) on the
  * fine-tuning benchmark's test split.
  */
object Fig6Experiment {

  final case class Row(model: String, accuracy: Double)

  def run(): Vector[Row] = {
    val test = Benchmarks.fineTune.test
    def acc(embed: Seq[(String, String)] => Array[Double]): Double =
      DustModel.accuracy(embed, test)
    Vector(
      Row("BERT", acc(Models.bertBase.features)),
      Row("RoBERTa", acc(Models.robertaBase.features)),
      Row("sBERT", acc(Models.sbertBase.features)),
      Row("Ditto", acc(Models.ditto.embed)),
      Row("DUST (BERT)", acc(Models.dustBert.embed)),
      Row("DUST (RoBERTa)", acc(Models.dustRoberta.embed)),
    )
  }

  def render(rows: Seq[Row]): String =
    Fmt.table(Seq("Model", "Accuracy"), rows.map(r => Seq(r.model, Fmt.f2(r.accuracy))))
}
