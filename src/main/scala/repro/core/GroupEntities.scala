package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}

/** Group-Entities operator (paper §6.3): fold every set of duplicates into
  * one "hyper-entity" record per cluster, concatenating the distinct
  * member values of each attribute with " | " (nulls and blanks dropped),
  * exactly as the paper's Table 3 presentation.
  */
object GroupEntities {
  import Tokenizer.EidCol

  /** Grouped representation of `rows`, one output row per cluster.
    *
    * Output columns: `cluster` (smallest member id), `members`
    * (comma-joined sorted member ids — used by equivalence tests), and one
    * concatenated column per attribute.
    */
  def group(rows: DataFrame, clusterOf: Map[Long, Long], attrs: Seq[String]): DataFrame = {
    val cUdf = F.udf((id: Long) => clusterOf.getOrElse(id, id))
    val attrAggs = attrs.map { a =>
      F.array_join(
        F.array_sort(F.collect_set(
          F.when(F.length(F.trim(F.col(a).cast("string"))) > 0, F.col(a).cast("string")))),
        " | ").as(a)
    }
    val membersAgg = F.array_join(
      F.expr(s"transform(array_sort(collect_set($EidCol)), x -> cast(x as string))"),
      ",").as("members")
    val aggs = membersAgg +: attrAggs
    rows
      .withColumn("cluster", cUdf(F.col(EidCol)))
      .groupBy("cluster")
      .agg(aggs.head, aggs.tail: _*)
  }
}
