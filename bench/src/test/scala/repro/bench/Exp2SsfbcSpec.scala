package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments

/** Exp-2 — SSFBC enumeration runtime (Fig 2 claims).
  *
  * Paper shape: runtime of FairBCEM and FairBCEM++ decreases as α, β or δ
  * grows; FairBCEM++ is 1-3 orders of magnitude faster (e.g. IMDB α=10:
  * 29,192 s vs 91 s); NSF only terminates on DBLP and is ≥ 2 orders of
  * magnitude slower than FairBCEM there ("INF" elsewhere).
  */
class Exp2SsfbcSpec extends SparkSpec {

  test("Exp-2: runtime sweeps on youtube-s (no naive baseline)") {
    val rows = Experiments.exp2Ssfbc(SynthBipartite.youtubeS, "alpha", Seq(4, 5, 6), naiveTimeoutMs = 0) ++
               Experiments.exp2Ssfbc(SynthBipartite.youtubeS, "beta", Seq(4, 5, 6), naiveTimeoutMs = 0) ++
               Experiments.exp2Ssfbc(SynthBipartite.youtubeS, "delta", Seq(1, 2, 3), naiveTimeoutMs = 0)
    println("== Exp-2 (youtube-s sweeps) ==")
    rows.foreach(r => println(r.render))

    // Result counts fall as alpha or beta rises (stricter constraints).
    def counts(varied: String) =
      rows.filter(r => r.varied == varied && r.algorithm == "FairBCEM++").sortBy(_.value).map(_.results)
    assert(counts("alpha").sliding(2).forall(w => w(0) >= w(1)), "counts must fall with alpha")
    assert(counts("beta").sliding(2).forall(w => w(0) >= w(1)), "counts must fall with beta")

    // FairBCEM++ does not lose to FairBCEM anywhere (beyond noise).
    for (v <- rows.groupBy(r => (r.varied, r.value)).values) {
      val m = v.map(r => r.algorithm -> r.seconds).toMap
      assert(m("FairBCEM++") <= m("FairBCEM") * 1.25 + 0.2, s"++ slower at $v")
    }
  }

  test("Exp-2: NSF terminates only on the narrow-block DBLP instance") {
    // dblp-nsf: NSF finishes and is >= one order of magnitude slower.
    val ok = Experiments.exp2Ssfbc(SynthBipartite.dblpNsfS, "alpha", Seq(4), naiveTimeoutMs = 300000)
    println("== Exp-2 (dblp-nsf incl. NSF) ==")
    ok.foreach(r => println(r.render))
    val m = ok.map(r => r.algorithm -> r).toMap
    assert(!m("NSF").isInf, "NSF should terminate on dblp-nsf")
    assert(m("NSF").results == m("FairBCEM").results, "NSF must return the same set")
    val ratio = m("NSF").seconds / m("FairBCEM").seconds
    println(f"NSF / FairBCEM ratio on dblp-nsf: $ratio%.1fx (paper: >= 100x on DBLP)")
    assert(ratio > 3.0, f"NSF ratio $ratio%.1f unexpectedly small")

    // youtube-s: NSF exceeds its budget -> INF, like the paper's 24h limit.
    val inf = Experiments.exp2Ssfbc(SynthBipartite.youtubeS, "alpha", Seq(4), naiveTimeoutMs = 20000)
    inf.foreach(r => println(r.render))
    assert(inf.find(_.algorithm == "NSF").get.isInf, "NSF should time out on youtube-s")
  }
}
