package repro.bench

import repro.SparkSpec
import repro.bipartite.SynthBipartite
import repro.exp.Experiments

/** Table I — dataset statistics and default parameters.
  *
  * Paper (Table I, full-scale KONECT graphs):
  *   Youtube  |U|=94,238    |V|=30,087    |E|=293,360    density 1.0e-4
  *   Twitter  |U|=175,214   |V|=530,418   |E|=1,890,661  density 2.0e-5
  *   IMDB     |U|=303,617   |V|=896,302   |E|=3,782,463  density 1.4e-5
  *   Wiki-cat |U|=1,853,493 |V|=182,947   |E|=3,795,796  density 1.1e-5
  *   DBLP     |U|=1,953,085 |V|=5,624,219 |E|=12,282,059 density 1.1e-6
  * Ours are ~1/40-scale synthetic analogues; the density ordering and the
  * U/V size relationships should match.
  */
class TableISpec extends SparkSpec {

  test("Table I: dataset statistics") {
    val rows = Experiments.tableI(spark)
    println("== Table I (reproduced) ==")
    println("dataset        |U|       |V|       |E|    density  α*s β*s  α*b β*b   δ*  θ*")
    rows.foreach(r => println(r.render))

    assert(rows.size == 5)
    assert(rows.forall(r => r.nU > 0 && r.nV > 0 && r.nE > 0))
    val byName = rows.map(r => r.dataset -> r).toMap

    // Side-size relationships from the paper's Table I.
    assert(byName("youtube-s").nU > byName("youtube-s").nV)   // Youtube: U > V
    assert(byName("twitter-s").nV > byName("twitter-s").nU)   // Twitter: V > U
    assert(byName("imdb-s").nV > byName("imdb-s").nU)         // IMDB: V > U
    assert(byName("wikicat-s").nU > byName("wikicat-s").nV)   // Wiki-cat: U > V
    assert(byName("dblp-s").nV > byName("dblp-s").nU)         // DBLP: V > U

    // DBLP is the largest and sparsest; Youtube the smallest and densest.
    val dblp = byName("dblp-s"); val yt = byName("youtube-s")
    assert(dblp.nE == rows.map(_.nE).max)
    assert(dblp.density == rows.map(_.density).min)
    assert(yt.density == rows.map(_.density).max)
  }
}
