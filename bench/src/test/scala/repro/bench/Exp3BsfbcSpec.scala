package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments

/** Exp-3 — BSFBC enumeration runtime (Fig 5 claims).
  *
  * Paper shape: runtime decreases as α, β, δ grow; BFairBCEM++ is ~3-100x
  * faster than BFairBCEM (e.g. Youtube β=7: 17 s vs 1 s); BNSF is ≥ 2
  * orders slower than BFairBCEM and only terminates on DBLP.
  */
class Exp3BsfbcSpec extends SparkSpec {

  test("Exp-3: runtime sweeps on youtube-s") {
    val rows = Experiments.exp3Bsfbc(SynthBipartite.youtubeS, "alpha", Seq(3, 4, 5), naiveTimeoutMs = 0) ++
               Experiments.exp3Bsfbc(SynthBipartite.youtubeS, "beta", Seq(3, 4, 5), naiveTimeoutMs = 0) ++
               Experiments.exp3Bsfbc(SynthBipartite.youtubeS, "delta", Seq(1, 2, 3), naiveTimeoutMs = 0)
    println("== Exp-3 (youtube-s sweeps) ==")
    rows.foreach(r => println(r.render))

    def counts(varied: String) =
      rows.filter(r => r.varied == varied && r.algorithm == "BFairBCEM++").sortBy(_.value).map(_.results)
    assert(counts("alpha").sliding(2).forall(w => w(0) >= w(1)), "counts must fall with alpha")
    assert(counts("beta").sliding(2).forall(w => w(0) >= w(1)), "counts must fall with beta")

    for (v <- rows.groupBy(r => (r.varied, r.value)).values) {
      val m = v.map(r => r.algorithm -> r.seconds).toMap
      assert(m("BFairBCEM++") <= m("BFairBCEM") * 1.25 + 0.2, s"B++ slower at $v")
    }
    val speed = rows.filter(_.algorithm == "BFairBCEM").map(_.seconds).sum /
                rows.filter(_.algorithm == "BFairBCEM++").map(_.seconds).sum
    println(f"aggregate BFairBCEM++ speedup: $speed%.1fx (paper: 3-100x)")
    assert(speed > 1.2)
  }

  test("Exp-3: BNSF terminates only on the narrow-block DBLP instance") {
    val ok = Experiments.exp3Bsfbc(SynthBipartite.dblpNsfS, "alpha", Seq(3), naiveTimeoutMs = 300000)
    println("== Exp-3 (dblp-nsf incl. BNSF) ==")
    ok.foreach(r => println(r.render))
    val m = ok.map(r => r.algorithm -> r).toMap
    assert(!m("BNSF").isInf, "BNSF should terminate on dblp-nsf")
    assert(m("BNSF").results == m("BFairBCEM").results)

    val inf = Experiments.exp3Bsfbc(SynthBipartite.youtubeS, "alpha", Seq(3), naiveTimeoutMs = 20000)
    inf.foreach(r => println(r.render))
    assert(inf.find(_.algorithm == "BNSF").get.isInf, "BNSF should time out on youtube-s")
  }
}
