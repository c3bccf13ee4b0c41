package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.Fig6Experiment

/** Fig 6 — unionable tuple representation accuracy. */
class Fig6Bench extends AnyFunSuite {

  test("Fig 6: tuple representation accuracy") {
    val rows = Fig6Experiment.run()
    println("\n=== Fig 6: Unionable tuple representation Accuracy ===")
    println(Fig6Experiment.render(rows))
    println("Paper: BERT 0.50, RoBERTa 0.50, sBERT 0.56, Ditto 0.66, " +
      "DUST (BERT) 0.84, DUST (RoBERTa) 0.85.")

    val acc = rows.map(r => r.model -> r.accuracy).toMap
    // Pre-trained transformers are coin-tosses.
    assert(math.abs(acc("BERT") - 0.5) < 0.07)
    assert(math.abs(acc("RoBERTa") - 0.5) < 0.07)
    // sBERT is better than chance but clearly below Ditto.
    assert(acc("sBERT") > 0.5 && acc("sBERT") < acc("Ditto"))
    // DUST beats all baselines; RoBERTa flavor >= BERT flavor.
    assert(acc("DUST (RoBERTa)") >= acc("DUST (BERT)") - 0.02)
    Seq("BERT", "RoBERTa", "sBERT", "Ditto").foreach { m =>
      assert(acc("DUST (RoBERTa)") > acc(m), s"DUST vs $m")
    }
    // Headline: >= 15% better than the best baseline (Ditto).
    assert(acc("DUST (RoBERTa)") >= acc("Ditto") * 1.15,
      s"DUST ${acc("DUST (RoBERTa)")} vs Ditto ${acc("Ditto")}")
  }
}
