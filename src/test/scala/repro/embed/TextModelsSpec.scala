package repro.embed

import repro.SparkSpec
import repro.util.VecOps

class TextModelsSpec extends SparkSpec {

  test("tokenVec is unit-norm") {
    HashLm.all.foreach { lm =>
      assert(math.abs(VecOps.norm(lm.tokenVec("t1c2v3")) - 1.0) < 1e-9)
    }
  }

  test("same-column vocabulary tokens embed close (context component)") {
    val lm = HashLm.roberta
    val simSame = VecOps.cosineSim(lm.tokenVec("t1c2v3"), lm.tokenVec("t1c2v9"))
    val simDiff = VecOps.cosineSim(lm.tokenVec("t1c2v3"), lm.tokenVec("t7c4v9"))
    assert(simSame > simDiff)
  }

  test("higher alpha strengthens context similarity") {
    val lo = HashLm("lo", 1, alpha = 0.2, charNgrams = false)
    val hi = HashLm("hi", 1, alpha = 0.9, charNgrams = false)
    def ctxSim(lm: HashLm) = VecOps.cosineSim(lm.tokenVec("t1c2v3"), lm.tokenVec("t1c2v9"))
    assert(ctxSim(hi) > ctxSim(lo))
  }

  test("anisotropy inflates cross-topic similarity") {
    val iso = HashLm("iso", 1, alpha = 0.5, charNgrams = false, aniso = 0.0)
    val ani = HashLm("ani", 1, alpha = 0.5, charNgrams = false, aniso = 0.85)
    def crossSim(lm: HashLm) = VecOps.cosineSim(lm.tokenVec("t1c2v3"), lm.tokenVec("t7c4v9"))
    assert(crossSim(ani) > crossSim(iso) + 0.3)
  }

  test("anisotropic models put all tuples in a narrow cone") {
    val lm = HashLm.bert
    val sims = for (i <- 0 until 50) yield
      VecOps.cosineSim(lm.embedText(s"t${i}c0v1 t${i}c1v2"), lm.embedText(s"t${i + 50}c0v7"))
    assert(sims.min > 0.3) // everything looks "unionable" at the 0.7 dist threshold
  }

  test("different model salts give unrelated spaces") {
    val a = HashLm.bert.copy(aniso = 0.0).tokenVec("park")
    val b = HashLm.roberta.copy(aniso = 0.0).tokenVec("park")
    assert(VecOps.cosineSim(a, b) < 0.5)
  }

  test("embedTokens of empty sequence is the zero vector") {
    assert(HashLm.bert.embedTokens(Nil).forall(_ == 0.0))
  }

  test("embedTokens pools all tokens") {
    val lm = HashLm.glove
    val v = lm.embedTokens(Seq("a", "b"))
    val m = VecOps.normalize(VecOps.mean(Seq(lm.tokenVec("a"), lm.tokenVec("b"))))
    assert(VecOps.cosineSim(v, m) > 0.999)
  }

  test("embedWeighted favors heavier tokens") {
    val lm = HashLm.glove
    val v = lm.embedWeighted(Seq("a", "b"), Seq(10.0, 0.1))
    assert(VecOps.cosineSim(v, lm.tokenVec("a")) > VecOps.cosineSim(v, lm.tokenVec("b")))
  }

  test("embedText tokenizes then pools") {
    val lm = HashLm.sbert
    assert(VecOps.cosineSim(lm.embedText("Alpha Beta"), lm.embedTokens(Seq("alpha", "beta"))) > 0.999)
  }

  test("fastText uses char n-grams: shared-prefix tokens closer than for glove") {
    def sim(lm: HashLm) = {
      val l = lm.copy(aniso = 0.0, alpha = 0.0)
      VecOps.cosineSim(l.tokenVec("t1c2v3"), l.tokenVec("t1c2v8"))
    }
    assert(sim(HashLm.fastText) > sim(HashLm.glove) + 0.2)
  }

  test("table-1 model registry covers the paper's rows") {
    assert(HashLm.all.map(_.name) == Vector("FastText", "Glove", "BERT", "RoBERTa", "sBERT"))
  }
}
