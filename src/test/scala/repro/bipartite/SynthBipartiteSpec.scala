package repro.bipartite

import org.scalatest.funsuite.AnyFunSuite

/** Generator determinism and shape checks for the dataset analogues. */
class SynthBipartiteSpec extends AnyFunSuite {

  test("generation is deterministic in the config") {
    val cfg = SynthBipartite.youtubeS.copy(nU = 120, nV = 60, blocks = 5, noiseEdges = 200)
    val g1  = SynthBipartite.generate(cfg)
    val g2  = SynthBipartite.generate(cfg)
    assert(g1.numEdges == g2.numEdges)
    for (u <- 0 until g1.nU) assert(g1.adjU(u).toSeq == g2.adjU(u).toSeq)
    assert(g1.attrU.toSeq == g2.attrU.toSeq)
    assert(g1.attrV.toSeq == g2.attrV.toSeq)
  }

  test("different seeds give different graphs") {
    val cfg = SynthBipartite.youtubeS.copy(nU = 120, nV = 60, blocks = 5, noiseEdges = 200)
    val g1  = SynthBipartite.generate(cfg)
    val g2  = SynthBipartite.generate(cfg.copy(seed = cfg.seed + 1))
    val e1  = (for { u <- 0 until g1.nU; v <- g1.adjU(u) } yield (u, v)).toSet
    val e2  = (for { u <- 0 until g2.nU; v <- g2.adjU(u) } yield (u, v)).toSet
    assert(e1 != e2)
  }

  test("attributes are roughly balanced") {
    val g = SynthBipartite.generate(SynthBipartite.twitterS.copy(nU = 2000, nV = 2000, blocks = 10, noiseEdges = 100))
    val frac = g.attrV.count(_ == 0).toDouble / g.nV
    assert(frac > 0.4 && frac < 0.6, s"attrV balance $frac")
  }

  test("all five dataset analogues generate with the configured vertex counts") {
    // Tiny versions of each config keep this fast while touching all paths.
    for (cfg0 <- SynthBipartite.all) {
      val cfg = cfg0.copy(nU = cfg0.nU min 500, nV = cfg0.nV min 500,
                          blocks = cfg0.blocks min 10, noiseEdges = cfg0.noiseEdges min 1000)
      val g = SynthBipartite.generate(cfg)
      assert(g.nU == cfg.nU && g.nV == cfg.nV)
      assert(g.numEdges > 0)
      assert(SynthBipartite.defaults.contains(cfg0.name))
    }
  }

  test("zipf noise produces a heavy-tailed degree distribution") {
    val cfg = SynthBipartite.youtubeS.copy(nU = 1000, nV = 1000, blocks = 0, noiseEdges = 8000)
    val g = SynthBipartite.generate(cfg)
    val degs = (0 until g.nU).map(g.degU).sorted.reverse
    // Hub degree far above the mean (~8): Zipf 0.75 concentrates mass.
    assert(degs.head > 4 * 8, s"max degree ${degs.head} not heavy-tailed")
  }

  test("sampleEdges keeps roughly the requested fraction") {
    val g = SynthBipartite.generate(SynthBipartite.youtubeS.copy(nU = 500, nV = 300, blocks = 10, noiseEdges = 3000))
    val h = SynthBipartite.sampleEdges(g, 0.5, 42L)
    val ratio = h.numEdges.toDouble / g.numEdges
    assert(ratio > 0.42 && ratio < 0.58, s"ratio $ratio")
    // Sampled graph is a subgraph.
    for (u <- 0 until g.nU; v <- h.adjU(u)) assert(g.hasEdge(u, v))
  }

  test("scaled() shrinks the graph") {
    val cfg = SynthBipartite.youtubeS
    val s   = cfg.scaled(0.5)
    assert(s.nU == cfg.nU / 2 && s.nV == cfg.nV / 2)
    assert(s.blocks == cfg.blocks / 2)
  }

  test("randomSmall respects bounds and attribute arity") {
    val g = SynthBipartite.randomSmall(5, 6, 7, 0.5, nAttrU = 3, nAttrV = 2)
    assert(g.nU == 6 && g.nV == 7)
    assert(g.attrU.forall(a => a >= 0 && a < 3))
    assert(g.attrV.forall(a => a >= 0 && a < 2))
  }
}
