package repro.jobs

import repro.bipartite.SynthBipartite
import repro.core._
import repro.exp.Experiments.timeMs

/** Scratch diagnostic: per-stage timings for one dataset. */
object Probe {
  def main(args: Array[String]): Unit = {
    val cfg = JobSession.datasetByName(args.headOption.getOrElse("twitter-s"))
    val d0  = SynthBipartite.defaults(cfg.name)
    val d = d0.copy(
      alphaS = args.lift(1).map(_.toInt).getOrElse(d0.alphaS),
      betaS  = args.lift(2).map(_.toInt).getOrElse(d0.betaS),
      alphaB = args.lift(3).map(_.toInt).getOrElse(d0.alphaB),
      betaB  = args.lift(4).map(_.toInt).getOrElse(d0.betaB))
    val (g, tg) = timeMs(SynthBipartite.generate(cfg))
    println(f"gen: $tg%.0f ms, edges=${g.numEdges}")
    val p = FairParams(d.alphaS, d.betaS, d.delta, d.theta)
    val (a1, t1) = timeMs(FCore.fairCore(g, p.alpha, p.beta))
    println(f"FCore: $t1%.0f ms, U=${a1.countU} V=${a1.countV}")
    val (a2, t2) = timeMs(CFCore.prune(g, p.alpha, p.beta))
    println(f"CFCore: $t2%.0f ms, U=${a2.countU} V=${a2.countV}")
    val (r2, t4) = timeMs(FairBCEMpp.enumerate(g, p))
    println(f"FairBCEM++: $t4%.0f ms, results=${r2.size}")
    val (r1, t3) = timeMs(FairBCEM.enumerate(g, p))
    println(f"FairBCEM: $t3%.0f ms, results=${r1.size}")
    val pb = FairParams(d.alphaB, d.betaB, d.delta, d.theta)
    val (ab, tb) = timeMs(CFCore.biPrune(g, pb.alpha, pb.beta))
    println(f"BCFCore: $tb%.0f ms, U=${ab.countU} V=${ab.countV}")
    val (rb2, tb2) = timeMs(BiFair.enumerate(g, pb, phase1 = BiFair.UseFairBCEMpp))
    println(f"BFairBCEM++: $tb2%.0f ms, results=${rb2.size}")
    val (rb1, tb1) = timeMs(BiFair.enumerate(g, pb, phase1 = BiFair.UseFairBCEM))
    println(f"BFairBCEM: $tb1%.0f ms, results=${rb1.size}")
  }
}
