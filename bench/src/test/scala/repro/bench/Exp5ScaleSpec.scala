package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments
import repro.graph.GraphIO

/** Exp-5 — scalability on 20%..100% edge samples of DBLP (Fig 7 claims).
  *
  * Paper shape: FairBCEM grows smoothly with graph size while FairBCEM++
  * stays relatively flat and ≥10x faster; BFairBCEM++ grows more smoothly
  * than BFairBCEM. Also exercises the distributed pipeline end to end.
  */
class Exp5ScaleSpec extends SparkSpec {

  test("Exp-5: runtime vs edge fraction on dblp-s") {
    // Weaker thresholds than the defaults: random edge-sampling of planted
    // blocks (unlike sampling a real graph) quickly destroys K(4,8)
    // structures, so α=3, β=2 keeps the result counts nonzero at 20%.
    val rows = Experiments.exp5Scale(SynthBipartite.dblpS, Seq(0.2, 0.4, 0.6, 0.8, 1.0),
      psOverride = Some(repro.core.FairParams(3, 2, 2)),
      pbOverride = Some(repro.core.FairParams(2, 2, 2)))
    println("== Exp-5 (dblp-s) ==")
    rows.foreach(r => println(r.render))

    for (alg <- Seq("FairBCEM", "FairBCEM++", "BFairBCEM", "BFairBCEM++")) {
      val per = rows.filter(_.algorithm == alg).sortBy(_.fraction)
      // Results grow with the edge sample (more structure survives).
      assert(per.last.results >= per.head.results, s"$alg results shrank with graph size")
      // The full graph should not be cheaper than the 20% sample by much.
      assert(per.last.seconds >= per.head.seconds * 0.5 - 0.2, s"$alg nonsensical scaling")
    }
    val full = rows.filter(_.fraction == 1.0).map(r => r.algorithm -> r.seconds).toMap
    assert(full("FairBCEM++") <= full("FairBCEM") * 1.25 + 0.2)
  }

  test("Exp-5: distributed pipeline scales across edge fractions") {
    val cfg = SynthBipartite.dblpS.scaled(0.4)
    val g0  = SynthBipartite.generate(cfg)
    val p   = repro.core.FairParams(4, 4, 2)
    for (f <- Seq(0.5, 1.0)) {
      val g  = if (f >= 1.0) g0 else SynthBipartite.sampleEdges(g0, f, 7L)
      val df = GraphIO.toEdgeDF(spark, g)
      val (n, t) = Experiments.timeMs(repro.spark.DistEnum.ssfbc(spark, df, p).count())
      println(f"dist ssfbc ${cfg.name} frac=$f: $n results in ${t / 1000}%.1f s")
      val local = repro.core.FairBCEMpp.enumerate(g, p).size.toLong
      assert(n == local, s"distributed/local mismatch at frac=$f: $n vs $local")
    }
  }
}
