package repro.core

import org.apache.spark.sql.{DataFrame, functions => F}
import org.apache.spark.sql.expressions.Window

/** Meta-blocking configuration (paper §6.1.iii, Table 8).
  *
  * `ALL`   = BP + BF + EP (the paper's default),
  * `BP+BF` = purging and filtering only,
  * `BP+EP` = purging and edge pruning only.
  */
final case class MbConfig(
    purge: Boolean = true,
    filter: Boolean = true,
    edgePruning: Boolean = true,
    purgeSf: Double = MbConfig.DefaultPurgeSf,
    filterP: Double = 0.8,
) {
  def label: String =
    (Seq("BP").filter(_ => purge) ++ Seq("BF").filter(_ => filter) ++
      Seq("EP").filter(_ => edgePruning)).mkString("+") match {
      case "BP+BF+EP" => "ALL"
      case other      => other
    }
}

object MbConfig {
  /** Comparison-budget multiplier of Block Purging: the retained blocks
    * carry at most `purgeSf · |E|` comparisons (see
    * [[MetaBlocking.purgeThreshold]] for why this replaces the paper's
    * SF = 1.025, whose literal inequality is vacuous).
    */
  val DefaultPurgeSf: Double = 50.0

  val All: MbConfig  = MbConfig()
  val BpBf: MbConfig = MbConfig(edgePruning = false)
  val BpEp: MbConfig = MbConfig(filter = false)
  val None: MbConfig = MbConfig(purge = false, filter = false, edgePruning = false)
}

/** Block-refinement (Block Purging, Block Filtering) and
  * comparison-refinement (Edge Pruning) methods over a block collection
  * held as an `(token, eid, isQuery)` DataFrame (paper §4, §6.1, [27]).
  */
object MetaBlocking {

  /** Cardinality ‖b‖ of a block of |b| entities. */
  def cardinality(size: Long): Long = size * (size - 1) / 2

  /** Block Purging comparison threshold (paper §7.2.1, [23]).
    *
    * The paper's consecutive-level inequality |bᵢ|·‖bᵢ₋₁‖ < SF·‖bᵢ‖·|bᵢ₋₁|
    * with SF = 1.025 is vacuously true for every ascending level when read
    * literally (per-block comparison density (|b|−1)/2 is monotone in |b|),
    * so we implement BP's stated intent — "cleaning the block processing
    * list from oversized blocks that correspond to tokens of little
    * discriminativeness" — with a comparison-budget criterion: scanning
    * the distinct cardinality levels in ascending order, levels are kept
    * while the cumulative retained comparisons stay within `sf · |E|`
    * (the smallest, most discriminative blocks win the budget; the heavy
    * tail is purged). This enforces BP's goal — total comparisons
    * near-linear in the collection size — directly and scale-invariantly.
    * The smallest level is always kept. Input: histogram of
    * (blockSize, numberOfBlocks) plus the collection size |E|.
    */
  def purgeThreshold(
      sizeHistogram: Seq[(Long, Long)],
      sf: Double = MbConfig.DefaultPurgeSf,
      nEntities: Long,
  ): Long = {
    val levels = sizeHistogram
      .filter(_._1 >= 2)
      .map { case (sz, cnt) => (cardinality(sz), cardinality(sz) * cnt) }
      .groupBy(_._1)
      .map { case (card, rows) => (card, rows.map(_._2).sum) }
      .toSeq
      .sortBy(_._1)
    if (levels.isEmpty) return Long.MaxValue
    val budget = sf * nEntities
    var cum = levels.head._2.toDouble
    var t   = levels.head._1
    var stopped = false
    for ((card, comps) <- levels.tail if !stopped) {
      if (cum + comps <= budget) { t = card; cum += comps }
      else stopped = true
    }
    t
  }

  /** Block Purging: drop blocks whose cardinality exceeds the threshold
    * computed from this collection's own size histogram. Returns the
    * filtered entries and the chosen threshold.
    */
  def purge(entries: DataFrame, sf: Double = MbConfig.DefaultPurgeSf): (DataFrame, Long) = {
    val nEntities = entries.select("eid").distinct().count()
    val hist = entries
      .groupBy("token").count()
      .groupBy("count").agg(F.count("*").as("nblocks"))
      .collect()
      .map(r => (r.getLong(0), r.getLong(1)))
      .toSeq
    val t = purgeThreshold(hist, sf, nEntities)
    val keep = entries
      .groupBy("token").agg(F.count("*").as("bsize"))
      .where(F.expr(s"bsize * (bsize - 1) / 2 <= ${t}L"))
      .select("token")
    (entries.join(keep, "token"), t)
  }

  /** Block Filtering: every entity is retained only in its
    * ⌈p·‖Bₑ‖⌉ smallest blocks (ties broken by token for determinism),
    * reflecting that a block has different importance per entity [27].
    */
  def filter(entries: DataFrame, p: Double = 0.8): DataFrame = {
    val sizes = entries.groupBy("token").agg(F.count("*").as("bsize"))
    val byEntity  = Window.partitionBy("eid").orderBy(F.col("bsize"), F.col("token"))
    val perEntity = Window.partitionBy("eid")
    entries
      .join(sizes, "token")
      .withColumn("rk", F.row_number().over(byEntity))
      .withColumn("nb", F.count("*").over(perEntity))
      .where(F.col("rk") <= F.greatest(F.lit(1), F.ceil(F.col("nb") * p)))
      .drop("bsize", "rk", "nb")
  }

  /** Candidate comparisons of a block collection: one row per unordered
    * entity pair co-occurring in ≥1 block and touching the query side
    * (paper §6.1.iv restricts Comparison-Execution to QE × block); the
    * aggregation also deduplicates multi-block pairs so no comparison is
    * executed twice. The edge weight is the ARCS scheme [25] — the sum of
    * reciprocal block cardinalities over the pair's common blocks — so
    * co-occurrence in a rare (discriminative) block outweighs
    * co-occurrence in an oversized one.
    */
  def candidatePairs(entries: DataFrame): DataFrame = {
    val sizes = entries.groupBy("token").agg(F.count("*").as("bsize"))
    // blocks reduced to one entity (e.g. by Block Filtering) carry no pairs
    val withCard = entries.join(sizes.where(F.col("bsize") >= 2), "token")
      .withColumn("invCard", F.lit(2.0) / (F.col("bsize") * (F.col("bsize") - 1)))
    val a = withCard.select(
      F.col("token"), F.col("eid").as("aid"), F.col("isQuery").as("aq"), F.col("invCard"))
    val b = withCard.select(
      F.col("token"), F.col("eid").as("bid"), F.col("isQuery").as("bq"))
    a.join(b, "token")
      .where(F.col("aid") < F.col("bid") && (F.col("aq") || F.col("bq")))
      .groupBy("aid", "bid")
      .agg(F.sum("invCard").as("weight"), F.max("aq").as("aq"), F.max("bq").as("bq"))
  }

  /** Weighted Edge Pruning: drop blocking-graph edges whose ARCS weight
    * is below the collection's mean edge weight [25, 27]. The threshold
    * is capped at 1.0: an edge of ARCS ≥ 1 co-occurs in a dedicated
    * two-entity block (or several near-dedicated ones) — intrinsically
    * strong evidence that must not depend on how heavy the rest of the
    * graph happens to be, which also keeps the pruning decision stable
    * between a query's EQBI sub-graph and the full-table graph (DQ
    * Correctness, paper §6.1).
    */
  def edgePruning(pairs: DataFrame): DataFrame = {
    val mean = pairs.agg(F.avg("weight")).collect()(0) match {
      case r if r.isNullAt(0) => return pairs
      case r                  => r.getDouble(0)
    }
    pairs.where(F.col("weight") >= math.min(mean, 1.0))
  }

  /** Full meta-blocking pass per the configured method combination; the
    * BP → BF → EP order is strict (paper §6.1.iii). Returns the surviving
    * candidate pairs `(aid, bid, weight, aq, bq)`.
    */
  def run(entries: DataFrame, cfg: MbConfig): DataFrame = {
    var cur = entries
    if (cfg.purge) cur = purge(cur, cfg.purgeSf)._1
    if (cfg.filter) cur = MetaBlocking.filter(cur, cfg.filterP)
    var pairs = candidatePairs(cur)
    if (cfg.edgePruning) pairs = edgePruning(pairs)
    pairs
  }
}
