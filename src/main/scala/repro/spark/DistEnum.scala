package repro.spark

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.core._
import repro.graph.GraphIO

/** End-to-end distributed enumeration driver.
  *
  * Shape: (1) distributed fair-core pruning over the edge DataFrame — this
  * is where the bulk data reduction happens and is pure dataflow; (2) the
  * surviving graph (small by construction: that is the point of the
  * paper's pruning) is collected, colourful-core pruned, and broadcast;
  * (3) the branch-and-bound search fans out over top-level roots, one
  * independent subproblem per root, via an RDD flatMap; (4) results come
  * back as a DataFrame in the original vertex ids.
  */
object DistEnum {

  val resultSchema: StructType = StructType(Seq(
    StructField("l", ArrayType(LongType, containsNull = false), nullable = false),
    StructField("r", ArrayType(LongType, containsNull = false), nullable = false),
  ))

  sealed trait Algo
  case object SSFBC_BCEM   extends Algo // FairBCEM
  case object SSFBC_BCEMpp extends Algo // FairBCEM++
  case object BSFBC_BCEMpp extends Algo // BFairBCEM++

  /** Enumerate single-side fair bicliques of the attributed edge table. */
  def ssfbc(spark: SparkSession, edges: DataFrame, p: FairParams,
            ordering: VertexOrdering = VertexOrdering.DegOrd,
            plusPlus: Boolean = true, nAttrU: Int = 2, nAttrV: Int = 2): DataFrame = {
    val prunedDf = DistFCore.fairCore(edges, p.alpha, p.beta, nAttrV)
    val loc      = GraphIO.toLocal(prunedDf, nAttrU, nAttrV)
    val alive    = CFCore.prune(loc.graph, p.alpha, p.beta)
    val g        = loc.graph.restrict(alive.u, alive.v)

    val sc = spark.sparkContext
    val results: Seq[Biclique] =
      if (plusPlus) {
        val searcher = new FairBCEMpp.Searcher(g, alive, p, proportional = false)
        val roots    = searcher.roots(ordering)
        val bs       = sc.broadcast(searcher)
        val br       = sc.broadcast(roots)
        sc.parallelize(roots.indices, math.min(roots.length max 1, sc.defaultParallelism * 4))
          .flatMap { i =>
            val buf = Vector.newBuilder[Biclique]
            bs.value.runRoot(br.value, i, buf += _)
            buf.result()
          }.collect().toSeq
      } else {
        val searcher = new FairBCEM.Searcher(g, alive, p, naive = false)
        val roots    = searcher.roots(ordering)
        val bs       = sc.broadcast(searcher)
        val br       = sc.broadcast(roots)
        sc.parallelize(roots.indices, math.min(roots.length max 1, sc.defaultParallelism * 4))
          .flatMap { i =>
            val buf = Vector.newBuilder[Biclique]
            bs.value.runRoot(br.value, i, buf += _)
            buf.result()
          }.collect().toSeq
      }
    toDF(spark, results, loc)
  }

  /** Enumerate bi-side fair bicliques: distributed BFCore, local BCFCore,
    * root-parallel SSFBC phase, then a parallel left-side expansion over
    * the phase-1 results.
    */
  def bsfbc(spark: SparkSession, edges: DataFrame, p: FairParams,
            ordering: VertexOrdering = VertexOrdering.DegOrd,
            nAttrU: Int = 2, nAttrV: Int = 2): DataFrame = {
    val prunedDf = DistFCore.biFairCore(edges, p.alpha, p.beta, nAttrU, nAttrV)
    val loc      = GraphIO.toLocal(prunedDf, nAttrU, nAttrV)
    val alive    = CFCore.biPrune(loc.graph, p.alpha, p.beta)
    val g        = loc.graph.restrict(alive.u, alive.v)

    val sc       = spark.sparkContext
    val searcher = new FairBCEMpp.Searcher(g, alive, p, proportional = false)
    val roots    = searcher.roots(ordering)
    val bs       = sc.broadcast(searcher)
    val br       = sc.broadcast(roots)
    val ssfbcs = sc.parallelize(roots.indices, math.min(roots.length max 1, sc.defaultParallelism * 4))
      .flatMap { i =>
        val buf = Vector.newBuilder[Biclique]
        bs.value.runRoot(br.value, i, buf += _)
        buf.result()
      }.collect().toSeq

    val bg = sc.broadcast(g)
    val bp = sc.broadcast(p)
    val results = sc.parallelize(ssfbcs, math.min(ssfbcs.length max 1, sc.defaultParallelism * 4))
      .flatMap(b => BiFair.expandLeft(bg.value, bp.value, b, proportional = false))
      .collect().toSeq
    toDF(spark, results, loc)
  }

  private def toDF(spark: SparkSession, bicliques: Seq[Biclique], loc: GraphIO.Localized): DataFrame = {
    val rows = bicliques.map { b =>
      Row(b.left.map(u => loc.uIds(u)), b.right.map(v => loc.vIds(v)))
    }
    spark.createDataFrame(spark.sparkContext.parallelize(rows, 1), resultSchema)
  }
}
