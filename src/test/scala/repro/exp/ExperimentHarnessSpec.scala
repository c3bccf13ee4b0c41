package repro.exp

import repro.SparkSpec

/** Smoke tests for the experiment harnesses (full runs live in bench/). */
class ExperimentHarnessSpec extends SparkSpec {

  test("Fig5 stats cover all four lite benchmarks") {
    val rows = Fig5Stats.all()
    assert(rows.map(_.benchmark) ==
      Vector("TUS-lite", "TUS-Sampled-lite", "SANTOS-lite", "UGEN-V1-lite"))
    assert(Fig5Stats.render(rows).contains("SANTOS-lite"))
  }

  test("Table1 method registry matches the paper's ten rows") {
    assert(Table1Experiment.methods.size == 10)
    assert(Table1Experiment.methods.count(_.bipartite) == 1)
    assert(Table1Experiment.methods.map(m => (m.group, m.display)).distinct.size == 10)
  }

  test("Table1 single-method evaluation produces sane P/R/F1") {
    val r = Table1Experiment.evalMethod(
      Table1Experiment.methods(6), Benchmarks.ugen)
    assert(r.p >= 0 && r.p <= 1 && r.r >= 0 && r.r <= 1 && r.f1 >= 0 && r.f1 <= 1)
    assert(r.avgTimeMs > 0)
  }

  test("Table2 instances share the pruned candidate sets across algorithms") {
    val insts = Table2Experiment.instances(Benchmarks.ugen, s = 50)
    assert(insts.nonEmpty)
    insts.foreach { i =>
      assert(i.cands.size <= 50)
      assert(i.queryEmb.nonEmpty)
      assert(i.cands.map(_.id).distinct.size == i.cands.size)
    }
  }

  test("Scaling cloud generator is deterministic and structured") {
    val a = ScalingExperiment.cloud(100)
    val b = ScalingExperiment.cloud(100)
    assert(a.map(_.id) == b.map(_.id))
    assert(a.head.vec.toSeq == b.head.vec.toSeq)
    assert(a.size == 100)
  }

  test("Scaling varyK timings cover every (method, k) cell") {
    val rows = ScalingExperiment.varyK(Seq(5, 10), s = 120)
    assert(rows.size == 6)
    assert(rows.forall(_.millis >= 0))
  }

  test("pImpact returns one row per p") {
    val rows = ScalingExperiment.pImpact(Seq(1, 2), s = 100, k = 10)
    assert(rows.map(_.p) == Vector(1, 2))
    rows.foreach(r => assert(r.avgDiv > 0 && r.minDiv >= 0))
  }

  test("Fmt.table renders aligned rows") {
    val t = Fmt.table(Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    assert(t.linesIterator.size == 4)
    assert(t.contains("| a  | bb |"))
  }

  test("Fmt.timed measures elapsed time") {
    val (v, ns) = Fmt.timed { Thread.sleep(5); 42 }
    assert(v == 42 && ns >= 4 * 1000 * 1000L)
  }
}
