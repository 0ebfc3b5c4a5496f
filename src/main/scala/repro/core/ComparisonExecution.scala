package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}

/** Comparison-Execution (paper §6.1.iv): run the resolution function on
  * every candidate pair that survived meta-blocking and keep pairs whose
  * schema-agnostic profile similarity reaches the match threshold.
  */
object ComparisonExecution {

  /** Matched links and the executed-comparison count.
    *
    * @param links       `(aid, bid, sim)` of matched pairs, aid < bid
    * @param comparisons number of pairs the similarity function ran on —
    *                    the paper's `Comp.` measure
    */
  final case class Result(links: DataFrame, comparisons: Long)

  /** Execute the comparisons in `pairs` against the entity rows of `ctx`.
    *
    * @param pairs     `(aid, bid, ...)` candidate pairs (canonical order)
    * @param threshold profile-similarity match threshold θ
    */
  def execute(ctx: TableContext, pairs: DataFrame, threshold: Double): Result = {
    val freq = ctx.valueFreq // captured in the UDF closure; values are lowercased
    val simUdf = F.udf((a: Seq[String], b: Seq[String]) =>
      Similarity.profileSimilarity(a, b,
        v => if (v == null) 1L else freq.getOrElse(v.toLowerCase, 1L)))
    val attrArr = F.array(ctx.attrs.map(a => F.col(a).cast("string")): _*)
    val left  = ctx.rows.select(F.col(Tokenizer.EidCol).as("aid"), attrArr.as("aAttrs"))
    val right = ctx.rows.select(F.col(Tokenizer.EidCol).as("bid"), attrArr.as("bAttrs"))
    val candidates = pairs.select("aid", "bid")
    val comparisons = candidates.count()
    val links = candidates
      .join(left, "aid")
      .join(right, "bid")
      .withColumn("sim", simUdf(F.col("aAttrs"), F.col("bAttrs")))
      .where(F.col("sim") >= threshold)
      .select("aid", "bid", "sim")
    Result(links, comparisons)
  }
}
