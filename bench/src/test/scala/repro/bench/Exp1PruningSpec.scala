package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments

/** Exp-1 — pruning effectiveness (Figs 3-4 headline claims).
  *
  * Paper, IMDB, single-side: the original graph has 9,266,649 vertices (it
  * counts multi-valued attribute copies); at α=8 FCore keeps 12,507 and
  * CFCore keeps 1,318; at β=8 FCore keeps 13,757 and CFCore keeps 1,490.
  * Shape: both prune orders of magnitude; CFCore ⊂ FCore; remaining
  * vertices shrink as α or β grows; CFCore costs somewhat more time.
  */
class Exp1PruningSpec extends SparkSpec {

  test("Exp-1: FCore vs CFCore on imdb-s (single-side)") {
    val cfg = SynthBipartite.imdbS
    val d   = SynthBipartite.defaults(cfg.name)
    val rows = Experiments.exp1Pruning(cfg, alphas = 3 to 7, betas = 3 to 7,
                                       d.alphaS, d.betaS, bi = false)
    println("== Exp-1 (single-side, imdb-s) ==")
    rows.foreach(r => println(r.render))

    for (r <- rows) {
      assert(r.cfcoreVerts <= r.fcoreVerts, s"CFCore must prune at least as much: $r")
      assert(r.fcoreVerts < r.origVerts / 2, s"FCore should prune most of the graph: $r")
    }
    // Monotonicity along the alpha sweep (beta fixed at default).
    val alphaRows = rows.filter(_.beta == d.betaS).sortBy(_.alpha)
    assert(alphaRows.map(_.fcoreVerts).sliding(2).forall(w => w(0) >= w(1)))
    assert(alphaRows.map(_.cfcoreVerts).sliding(2).forall(w => w(0) >= w(1)))
    // CFCore strictly better somewhere (the paper's 12,507 -> 1,318 effect).
    assert(rows.exists(r => r.cfcoreVerts < r.fcoreVerts),
      "CFCore never improved over FCore")
  }

  test("Exp-1: BFCore vs BCFCore on imdb-s (bi-side)") {
    val cfg = SynthBipartite.imdbS
    val d   = SynthBipartite.defaults(cfg.name)
    val rows = Experiments.exp1Pruning(cfg, alphas = 2 to 5, betas = 2 to 5,
                                       d.alphaB, d.betaB, bi = true)
    println("== Exp-1 (bi-side, imdb-s) ==")
    rows.foreach(r => println(r.render))
    for (r <- rows) {
      assert(r.cfcoreVerts <= r.fcoreVerts)
      assert(r.fcoreVerts < r.origVerts)
    }
    val alphaRows = rows.filter(_.beta == d.betaB).sortBy(_.alpha)
    assert(alphaRows.map(_.fcoreVerts).sliding(2).forall(w => w(0) >= w(1)))
  }

  test("Exp-1: pruning results are consistent across datasets") {
    for (cfg <- Seq(SynthBipartite.youtubeS, SynthBipartite.wikicatS)) {
      val d    = SynthBipartite.defaults(cfg.name)
      val rows = Experiments.exp1Pruning(cfg, Seq(d.alphaS), Seq.empty, d.alphaS, d.betaS, bi = false)
      rows.foreach(r => println(r.render))
      assert(rows.head.cfcoreVerts <= rows.head.fcoreVerts)
      assert(rows.head.cfcoreVerts > 0, s"over-pruned ${cfg.name}")
    }
  }
}
