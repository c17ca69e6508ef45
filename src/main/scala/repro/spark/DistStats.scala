package repro.spark

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** DataFrame aggregations for the dataset statistics of Table I. */
object DistStats {

  final case class Stats(nU: Long, nV: Long, nE: Long) {
    /** Edge density |E| / (|U|·|V|) as reported in Table I. */
    def density: Double = nE.toDouble / (nU.toDouble * nV.toDouble)
  }

  def stats(edges: DataFrame): Stats = {
    val row = edges.agg(
      countDistinct("u").as("nu"),
      countDistinct("v").as("nv"),
      count(lit(1)).as("ne"),
    ).head()
    Stats(row.getLong(0), row.getLong(1), row.getLong(2))
  }

  /** Per-side degree distribution summary (used in dataset sanity tests). */
  def degreeSummary(edges: DataFrame, side: String): DataFrame =
    edges.groupBy(side).agg(count(lit(1)).as("deg"))
      .agg(min("deg").as("min_deg"), max("deg").as("max_deg"),
           avg("deg").as("avg_deg"))
}
