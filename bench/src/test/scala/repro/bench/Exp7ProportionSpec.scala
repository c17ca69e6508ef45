package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.core.{FairBCEMpp, FairParams}
import repro.exp.Experiments

/** Exp-7 — proportional models vs θ on Youtube (Figs 11-12 claims).
  *
  * Paper shape: the number of PSSFBCs/PBSFBCs and the runtime increase as
  * θ grows towards 0.5, and at θ=0.5 the PSSFBC problem coincides with the
  * SSFBC problem at δ=0.
  */
class Exp7ProportionSpec extends SparkSpec {

  test("Exp-7: PSSFBC / PBSFBC counts and runtime vs theta on youtube-s") {
    val rows = Experiments.exp7Proportion(SynthBipartite.youtubeS, Seq(0.1, 0.2, 0.3, 0.4, 0.5))
    println("== Exp-7 (youtube-s) ==")
    rows.foreach(r => println(r.render))

    assert(rows.forall(_.results > 0), "degenerate: zero proportional fair bicliques")
    val pro = rows.filter(_.algorithm == "FairBCEMPro++").sortBy(_.theta)
    // The paper's headline: counts increase towards theta = 0.5.
    assert(pro.last.results >= pro.head.results,
      s"PSSFBC count did not grow with theta: ${pro.map(_.results)}")
  }

  test("Exp-7: theta=0.5 degenerates to the delta=0 SSFBC problem") {
    val g = SynthBipartite.generate(SynthBipartite.youtubeS)
    val d = SynthBipartite.defaults("youtube-s")
    val pro  = FairBCEMpp.enumerate(g, FairParams(d.alphaS, d.betaS, d.delta, 0.5), proportional = true)
    val fair = FairBCEMpp.enumerate(g, FairParams(d.alphaS, d.betaS, 0, 0.5))
    assert(pro.map(_.canonical).toSet == fair.map(_.canonical).toSet)
    println(s"theta=0.5 PSSFBCs == delta=0 SSFBCs: ${pro.size} results")
  }
}
