package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments

/** Exp-4 — numbers of maximal bicliques, SSFBCs and BSFBCs on Wiki-cat
  * (Fig 6 claims).
  *
  * Paper, Wiki-cat: α=6, β=6, δ=2 → 9,548 maximal bicliques vs 346,411
  * SSFBCs; α=3, β=6, δ=2 → 9,548 maximal bicliques vs 546,411 BSFBCs.
  * Shape: fair biclique counts exceed maximal biclique counts by 1-2
  * orders of magnitude, and all counts fall as α, β or δ rises.
  */
class Exp4CountsSpec extends SparkSpec {

  test("Exp-4: counts on wikicat-s varying alpha, beta, delta") {
    val cfg = SynthBipartite.wikicatS
    val rows = Experiments.exp4Counts(cfg, "alpha", Seq(3, 4, 5)) ++
               Experiments.exp4Counts(cfg, "beta", Seq(3, 4, 5)) ++
               Experiments.exp4Counts(cfg, "delta", Seq(1, 2, 3))
    println("== Exp-4 (wikicat-s) ==")
    rows.foreach(r => println(r.render))

    // Fair biclique counts dominate maximal biclique counts (paper's
    // 9,548 vs 346,411 shape) at the default-ish settings.
    assert(rows.exists(r => r.ssfbc > 5 * r.maximalS),
      "SSFBC count never dominated the maximal biclique count")
    assert(rows.forall(r => r.ssfbc > 0 && r.bsfbc > 0), "degenerate settings: zero results")

    // Counts decrease as alpha or beta increases.
    def seq(varied: String, f: Experiments.CountRow => Long) =
      rows.filter(_.varied == varied).sortBy(_.value).map(f)
    for (f <- Seq[Experiments.CountRow => Long](_.maximalS, _.ssfbc, _.bsfbc)) {
      assert(seq("alpha", f).sliding(2).forall(w => w(0) >= w(1)), s"non-monotone in alpha")
      assert(seq("beta", f).sliding(2).forall(w => w(0) >= w(1)), s"non-monotone in beta")
    }
    // Counts decrease as delta increases (looser balance merges results).
    assert(seq("delta", _.ssfbc).sliding(2).forall(w => w(0) >= w(1)), "non-monotone in delta")
  }
}
