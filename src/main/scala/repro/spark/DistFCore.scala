package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Distributed fair α-β core pruning: the dataflow formulation of Alg 1
  * (`FCore`) and its bi-side variant (`BFCore`).
  *
  * Instead of the sequential peel, each round computes the currently
  * violating vertices with two aggregations and anti-joins them out; the
  * fixpoint equals the peeling fixpoint (cores are order-independent).
  * Rounds are O(core-peeling depth), each a shuffle — the standard
  * iterative-dataflow core decomposition.
  *
  * Input/output: the canonical edge table `[u, v, uval, vval]`
  * (`repro.graph.GraphIO.edgeSchema`). A vertex is "removed" when it has no
  * remaining edges.
  */
object DistFCore {

  /** Fair α-β core: U needs every V-attribute-class degree ≥ β (a class
    * with no edges at all counts as degree 0 — hence the countDistinct
    * guard), V needs degree ≥ α.
    */
  def fairCore(edges: DataFrame, alpha: Int, beta: Int, nAttrV: Int,
               maxRounds: Int = 1000): DataFrame = {
    var e       = edges.select("u", "v", "uval", "vval").localCheckpoint()
    var rounds  = 0
    var changed = true
    while (changed && rounds < maxRounds) {
      val badU = e.groupBy("u", "vval").agg(count(lit(1)).as("c"))
        .groupBy("u").agg(min("c").as("minc"), countDistinct("vval").as("ncls"))
        .where(col("minc") < beta || col("ncls") < nAttrV)
        .select("u")
      val badV = e.groupBy("v").agg(count(lit(1)).as("c"))
        .where(col("c") < alpha)
        .select("v")
      val nBad = badU.count() + badV.count()
      if (nBad == 0) changed = false
      else {
        e = e.join(badU, Seq("u"), "left_anti")
             .join(badV, Seq("v"), "left_anti")
             .localCheckpoint()
      }
      rounds += 1
    }
    e
  }

  /** Bi-fair α-β core (Def 13): V-vertices are peeled on per-U-attribute
    * degree < α instead of total degree.
    */
  def biFairCore(edges: DataFrame, alpha: Int, beta: Int, nAttrU: Int, nAttrV: Int,
                 maxRounds: Int = 1000): DataFrame = {
    var e       = edges.select("u", "v", "uval", "vval").localCheckpoint()
    var rounds  = 0
    var changed = true
    while (changed && rounds < maxRounds) {
      val badU = e.groupBy("u", "vval").agg(count(lit(1)).as("c"))
        .groupBy("u").agg(min("c").as("minc"), countDistinct("vval").as("ncls"))
        .where(col("minc") < beta || col("ncls") < nAttrV)
        .select("u")
      val badV = e.groupBy("v", "uval").agg(count(lit(1)).as("c"))
        .groupBy("v").agg(min("c").as("minc"), countDistinct("uval").as("ncls"))
        .where(col("minc") < alpha || col("ncls") < nAttrU)
        .select("v")
      val nBad = badU.count() + badV.count()
      if (nBad == 0) changed = false
      else {
        e = e.join(badU, Seq("u"), "left_anti")
             .join(badV, Seq("v"), "left_anti")
             .localCheckpoint()
      }
      rounds += 1
    }
    e
  }
}
