package repro.bipartite

import repro.graph.BipartiteGraph

/** Deterministic synthetic attributed bipartite graphs.
  *
  * The paper evaluates on five KONECT bipartite graphs with *randomly
  * assigned* binary attributes (§V-A). Offline, we substitute scaled-down
  * analogues: planted dense bipartite blocks (the biclique-bearing
  * structure of real affiliation networks) plus Zipf background edges (the
  * heavy-tailed degree noise), with uniformly random attributes per side —
  * the same attribute model as the paper. See DESIGN.md §2.
  */
final case class BipartiteConfig(
    name: String,
    nU: Int,
    nV: Int,
    blocks: Int,          // number of planted dense blocks
    blockUMin: Int, blockUMax: Int, // U-side block size range (inclusive)
    blockVMin: Int, blockVMax: Int, // V-side block size range (inclusive)
    blockProb: Double,    // edge probability inside a block
    noiseEdges: Int,      // Zipf-distributed background edges (pre-dedupe)
    zipfU: Double,        // Zipf exponent on the U endpoint of noise edges
    zipfV: Double,
    seed: Long,
) {
  /** Uniformly scale all size knobs (Exp-5 style whole-graph scaling). */
  def scaled(f: Double): BipartiteConfig = copy(
    name = f"$name@$f%.2f",
    nU = math.max(4, (nU * f).toInt), nV = math.max(4, (nV * f).toInt),
    blocks = math.max(1, (blocks * f).toInt), noiseEdges = (noiseEdges * f).toInt)
}

object SynthBipartite {

  /** The five dataset analogues (paper Table I, at ~1/40 scale). Default
    * fair-biclique parameters per dataset are in `Datasets`.
    */
  val youtubeS: BipartiteConfig = BipartiteConfig("youtube-s", 2400, 760, 60, 5, 10, 10, 18, 0.95, 5200, 0.75, 0.75, 101L)
  val twitterS: BipartiteConfig = BipartiteConfig("twitter-s", 4400, 13000, 140, 5, 12, 12, 20, 0.95, 29000, 0.75, 0.75, 102L)
  val imdbS:    BipartiteConfig = BipartiteConfig("imdb-s", 7600, 22000, 210, 6, 12, 12, 20, 0.95, 58000, 0.72, 0.72, 103L)
  val wikicatS: BipartiteConfig = BipartiteConfig("wikicat-s", 46000, 4600, 120, 6, 12, 12, 20, 0.95, 58000, 0.70, 0.70, 104L)
  val dblpS:    BipartiteConfig = BipartiteConfig("dblp-s", 49000, 140000, 260, 4, 9, 10, 18, 0.95, 180000, 0.68, 0.68, 105L)

  val all: Seq[BipartiteConfig] = Seq(youtubeS, twitterS, imdbS, wikicatS, dblpS)

  /** Reduced DBLP analogue for the NSF/BNSF baselines: NSF is exponential
    * in block width, so (mirroring the paper, which could only run NSF on
    * DBLP within 24h) the naive baselines get a narrower-block instance.
    */
  val dblpNsfS: BipartiteConfig =
    dblpS.copy(name = "dblp-nsf", nU = 12000, nV = 35000, blocks = 80,
               blockVMin = 7, blockVMax = 12, noiseEdges = 40000)

  /** Default parameters per dataset, mirroring Table I's structure:
    * (α*, β*) for the single-side model, (α*, β*) for the bi-side model,
    * δ* = 2, θ* = 0.4 — retuned to the synthetic scale.
    */
  final case class Defaults(alphaS: Int, betaS: Int, alphaB: Int, betaB: Int,
                            delta: Int, theta: Double)
  val defaults: Map[String, Defaults] = Map(
    "youtube-s" -> Defaults(4, 4, 3, 3, 2, 0.4),
    "twitter-s" -> Defaults(4, 4, 3, 3, 2, 0.4),
    "imdb-s"    -> Defaults(4, 5, 3, 4, 2, 0.4),
    "wikicat-s" -> Defaults(4, 4, 3, 3, 2, 0.4),
    "dblp-s"    -> Defaults(4, 4, 3, 3, 2, 0.4),
    "dblp-nsf"  -> Defaults(4, 4, 3, 3, 2, 0.4),
  )

  /** Generate the graph of `cfg` deterministically (same (cfg) → same graph). */
  def generate(cfg: BipartiteConfig): BipartiteGraph = {
    val rng   = new scala.util.Random(cfg.seed)
    val edges = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]

    // Planted blocks: sample member sets, then Bernoulli edges inside.
    for (_ <- 0 until cfg.blocks) {
      val su = cfg.blockUMin + rng.nextInt(cfg.blockUMax - cfg.blockUMin + 1)
      val sv = cfg.blockVMin + rng.nextInt(cfg.blockVMax - cfg.blockVMin + 1)
      val us = sampleDistinct(rng, cfg.nU, su)
      val vs = sampleDistinct(rng, cfg.nV, sv)
      for (u <- us; v <- vs if rng.nextDouble() < cfg.blockProb) edges += ((u, v))
    }

    // Zipf background noise: rank = vertex id (id 0 is the biggest hub).
    val cdfU = zipfCdf(cfg.nU, cfg.zipfU)
    val cdfV = zipfCdf(cfg.nV, cfg.zipfV)
    for (_ <- 0 until cfg.noiseEdges)
      edges += ((sampleCdf(cdfU, rng), sampleCdf(cdfV, rng)))

    val attrU = Array.fill(cfg.nU)(rng.nextInt(2))
    val attrV = Array.fill(cfg.nV)(rng.nextInt(2))
    BipartiteGraph.fromEdges(cfg.nU, cfg.nV, edges, attrU, attrV, 2, 2)
  }

  /** Random small graph for property tests: Bernoulli edges, random attrs. */
  def randomSmall(seed: Long, nU: Int, nV: Int, edgeProb: Double,
                  nAttrU: Int = 2, nAttrV: Int = 2): BipartiteGraph = {
    val rng = new scala.util.Random(seed)
    val edges = for {
      u <- 0 until nU
      v <- 0 until nV
      if rng.nextDouble() < edgeProb
    } yield (u, v)
    BipartiteGraph.fromEdges(nU, nV, edges,
      Array.fill(nU)(rng.nextInt(nAttrU)), Array.fill(nV)(rng.nextInt(nAttrV)),
      nAttrU, nAttrV)
  }

  /** Keep each edge independently with probability `fraction` (Exp-5). */
  def sampleEdges(g: BipartiteGraph, fraction: Double, seed: Long): BipartiteGraph = {
    val rng = new scala.util.Random(seed)
    val edges = for {
      u <- 0 until g.nU
      v <- g.adjU(u)
      if rng.nextDouble() < fraction
    } yield (u, v)
    BipartiteGraph.fromEdges(g.nU, g.nV, edges, g.attrU, g.attrV, g.nAttrU, g.nAttrV)
  }

  private def sampleDistinct(rng: scala.util.Random, n: Int, k: Int): Array[Int] = {
    val seen = scala.collection.mutable.LinkedHashSet.empty[Int]
    while (seen.size < math.min(k, n)) seen += rng.nextInt(n)
    seen.toArray
  }

  private def zipfCdf(n: Int, s: Double): Array[Double] = {
    val w   = Array.tabulate(n)(i => 1.0 / math.pow(i + 1.0, s))
    val tot = w.sum
    var acc = 0.0
    w.map { x => acc += x / tot; acc }
  }

  private def sampleCdf(cdf: Array[Double], rng: scala.util.Random): Int = {
    val x = rng.nextDouble()
    val i = java.util.Arrays.binarySearch(cdf, x)
    val idx = if (i >= 0) i else -i - 1
    math.min(idx, cdf.length - 1)
  }
}
