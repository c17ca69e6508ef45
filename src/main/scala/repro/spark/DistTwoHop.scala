package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed 2-hop (common-neighbour) graph construction on the fair
  * side — the dataflow form of Alg 3 / Alg 8: a self-join on the shared
  * U endpoint, then a count (per U-attribute for the bi-side variant).
  *
  * Output: one row per undirected 2-hop edge with `v1 < v2`.
  */
object DistTwoHop {

  /** Alg 3: (v1, v2) with ≥ α common U-neighbours. */
  def twoHopEdges(edges: DataFrame, alpha: Int): DataFrame = {
    val a = edges.select(col("u"), col("v").as("v1"))
    val b = edges.select(col("u"), col("v").as("v2"))
    a.join(b, Seq("u"))
      .where(col("v1") < col("v2"))
      .groupBy("v1", "v2").agg(count(lit(1)).as("common"))
      .where(col("common") >= alpha)
      .select("v1", "v2")
  }

  /** Alg 8: (v1, v2) with ≥ α common U-neighbours of *every* U-attribute. */
  def biTwoHopEdges(edges: DataFrame, alpha: Int, nAttrU: Int): DataFrame = {
    val a = edges.select(col("u"), col("uval"), col("v").as("v1"))
    val b = edges.select(col("u"), col("v").as("v2"))
    a.join(b, Seq("u"))
      .where(col("v1") < col("v2"))
      .groupBy("v1", "v2", "uval").agg(count(lit(1)).as("c"))
      .groupBy("v1", "v2").agg(min("c").as("minc"), countDistinct("uval").as("ncls"))
      .where(col("minc") >= alpha && col("ncls") === nAttrU)
      .select("v1", "v2")
  }
}
