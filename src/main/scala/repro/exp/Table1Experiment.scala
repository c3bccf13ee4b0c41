package repro.exp

import repro.core.ColumnAlignment
import repro.data.LakeBenchmark
import repro.embed.{ColumnEmbedders, ColumnEmbedder, StarmieEmbedder}

/** Table 1 — column alignment effectiveness: P/R/F1 of ten embedding
  * configurations on three benchmarks (§6.2). Per query, the input to
  * alignment is the query's ground-truth unionable tables (the output of the
  * search step in the pipeline); scores are averaged over queries.
  * Also reports per-query alignment time (§6.2.5).
  */
object Table1Experiment {

  final case class Row(serialization: String, model: String, benchmark: String,
                       p: Double, r: Double, f1: Double, avgTimeMs: Double)

  /** Method descriptors: (row group, display name, embedder, bipartite?). */
  final case class Method(group: String, display: String, embedder: ColumnEmbedder, bipartite: Boolean)

  val methods: Vector[Method] = {
    val cfgs = ColumnEmbedders.table1Configs
    Vector(
      Method("Cell-level", "FastText", cfgs(0), bipartite = false),
      Method("Cell-level", "Glove", cfgs(1), bipartite = false),
      Method("Cell-level", "BERT", cfgs(2), bipartite = false),
      Method("Cell-level", "RoBERTa", cfgs(3), bipartite = false),
      Method("Cell-level", "sBERT", cfgs(4), bipartite = false),
      Method("Column-level", "BERT", cfgs(5), bipartite = false),
      Method("Column-level", "RoBERTa", cfgs(6), bipartite = false),
      Method("Column-level", "sBERT", cfgs(7), bipartite = false),
      Method("Table context", "Starmie (B)", StarmieEmbedder(), bipartite = true),
      Method("Table context", "Starmie (H)", StarmieEmbedder(), bipartite = false),
    )
  }

  def evalMethod(m: Method, bench: LakeBenchmark): Row = {
    val tfidf = Benchmarks.tfidfFor(bench)
    var sp = 0.0; var sr = 0.0; var sf = 0.0; var totalNs = 0L
    var n = 0
    bench.queries.foreach { q =>
      val tables = bench.unionableFor(q)
      if (tables.nonEmpty) {
        val (aligned, ns) = Fmt.timed {
          if (m.bipartite) ColumnAlignment.alignBipartite(q, tables, m.embedder, tfidf)
          else ColumnAlignment.alignHolistic(q, tables, m.embedder, tfidf)
        }
        val prf = ColumnAlignment.evaluate(aligned, q, tables)
        sp += prf.precision; sr += prf.recall; sf += prf.f1; totalNs += ns
        n += 1
      }
    }
    require(n > 0, s"benchmark ${bench.name} has no queries with unionable tables")
    Row(m.group, m.display, bench.name, sp / n, sr / n, sf / n, totalNs / 1e6 / n)
  }

  def run(benches: Seq[LakeBenchmark]): Vector[Row] =
    (for { b <- benches; m <- methods } yield evalMethod(m, b)).toVector

  def render(rows: Seq[Row]): String = {
    val benches = rows.map(_.benchmark).distinct
    val header = Seq("Serialization", "Model") ++
      benches.flatMap(b => Seq(s"$b P", s"$b R", s"$b F1"))
    val lines = methods.map { m =>
      val cells = benches.flatMap { b =>
        val r = rows.find(x => x.benchmark == b && x.model == m.display && x.serialization == m.group).get
        Seq(Fmt.f2(r.p), Fmt.f2(r.r), Fmt.f2(r.f1))
      }
      Seq(m.group, m.display) ++ cells
    }
    Fmt.table(header, lines)
  }
}
