package repro.spark

import repro.{Oracle, SparkSpec}
import repro.bipartite.SynthBipartite
import repro.core.TwoHop
import repro.graph.GraphIO

/** Distributed 2-hop construction vs the local Alg 3/8 and DuckDB SQL. */
class DistTwoHopSpec extends SparkSpec {

  private lazy val g = SynthBipartite.generate(SynthBipartite.youtubeS.copy(
    nU = 150, nV = 80, blocks = 6, noiseEdges = 300, seed = 11L))
  private lazy val df = GraphIO.toEdgeDF(spark, g).cache()

  private def pairSet(res: org.apache.spark.sql.DataFrame): Set[(Long, Long)] =
    res.collect().map(r => (r.getLong(0), r.getLong(1))).toSet

  private def localPairs(h: repro.graph.AttributedGraph): Set[(Long, Long)] =
    (for { v <- 0 until h.n; w <- h.adj(v) if v < w } yield (v.toLong, w.toLong)).toSet

  test("twoHopEdges equals local Construct2HopGraph") {
    for (alpha <- Seq(1, 2, 3)) {
      val got = pairSet(DistTwoHop.twoHopEdges(df, alpha))
      val exp = localPairs(TwoHop.construct(g, alpha, Array.fill(g.nU)(true), Array.fill(g.nV)(true)))
      assert(got == exp, s"α=$alpha: ${got.size} vs ${exp.size} 2-hop edges")
    }
  }

  test("twoHopEdges matches DuckDB SQL") {
    val alpha = 2
    val sparkDf = DistTwoHop.twoHopEdges(df, alpha)
    Oracle.assertEquivalent(sparkDf,
      s"""SELECT v1, v2 FROM (
         |  SELECT CAST(a.v AS BIGINT) AS v1, CAST(b.v AS BIGINT) AS v2
         |  FROM edges a JOIN edges b ON a.u = b.u
         |  WHERE CAST(a.v AS BIGINT) < CAST(b.v AS BIGINT)
         |) GROUP BY v1, v2 HAVING count(*) >= $alpha""".stripMargin,
      "edges" -> df)
  }

  test("biTwoHopEdges equals local BiConstruct2HopGraph") {
    for (alpha <- Seq(1, 2)) {
      val got = pairSet(DistTwoHop.biTwoHopEdges(df, alpha, g.nAttrU))
      val exp = localPairs(TwoHop.biConstruct(g, alpha, Array.fill(g.nU)(true), Array.fill(g.nV)(true)))
      assert(got == exp, s"α=$alpha")
    }
  }

  test("biTwoHopEdges matches DuckDB SQL") {
    val alpha = 1
    val sparkDf = DistTwoHop.biTwoHopEdges(df, alpha, g.nAttrU)
    Oracle.assertEquivalent(sparkDf,
      s"""SELECT v1, v2 FROM (
         |  SELECT v1, v2, min(c) AS mc, count(*) AS ncls FROM (
         |    SELECT CAST(a.v AS BIGINT) AS v1, CAST(b.v AS BIGINT) AS v2, a.uval, count(*) AS c
         |    FROM edges a JOIN edges b ON a.u = b.u
         |    WHERE CAST(a.v AS BIGINT) < CAST(b.v AS BIGINT)
         |    GROUP BY v1, v2, a.uval
         |  ) GROUP BY v1, v2
         |) WHERE mc >= $alpha AND ncls = ${g.nAttrU}""".stripMargin,
      "edges" -> df)
  }

  test("bi 2-hop edge set is a subset of the single 2-hop edge set") {
    val single = pairSet(DistTwoHop.twoHopEdges(df, 2))
    val bi     = pairSet(DistTwoHop.biTwoHopEdges(df, 1, 2))
    assert(bi.subsetOf(single))
  }
}
