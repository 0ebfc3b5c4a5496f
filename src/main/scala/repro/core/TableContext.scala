package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession, functions => F}
import org.apache.spark.storage.StorageLevel

/** Per-table state mirroring the paper's once-off initialisation (§3):
  * the cached entity rows, the Table Block Index TBI_E (with its block
  * sizes, i.e. the sorted ITBI view), and the Link Index LI_E. Built once
  * when a table is registered; shared by every query against the table.
  *
  * @param truth optional ground-truth `(eid, cluster)` table from the
  *              dirty-data generator, used only by the PC measure.
  */
final class TableContext(
    val name: String,
    val df: DataFrame,
    val truth: Option[DataFrame] = None,
) {
  import Tokenizer.EidCol

  require(df.columns.contains(EidCol), s"table $name needs an '$EidCol' column")

  def spark: SparkSession = df.sparkSession

  /** Attribute names (everything but the entity id). */
  val attrs: Seq[String] = Tokenizer.attrCols(df)

  /** Entity rows, cached — queries repeatedly scan them. */
  lazy val rows: DataFrame = {
    val d = df.persist(StorageLevel.MEMORY_AND_DISK)
    d.count()
    d
  }

  /** TBI_E as `(eid, token)` entity/block incidence pairs. */
  lazy val tbi: DataFrame = {
    val t = Tokenizer.tokenize(rows).persist(StorageLevel.MEMORY_AND_DISK)
    t.count()
    t
  }

  /** Block sizes |b| per blocking key. */
  lazy val blockSizes: DataFrame = {
    val s = tbi.groupBy("token").agg(F.count("*").as("bsize"))
      .persist(StorageLevel.MEMORY_AND_DISK)
    s.count()
    s
  }

  lazy val size: Long          = rows.count()
  lazy val tbiBlockCount: Long = blockSizes.count()

  /** Frequency of every repeated cell value across all attributes —
    * the discriminativeness weights of the resolution function (values
    * occurring once are omitted; the lookup defaults to 1).
    */
  lazy val valueFreq: Map[String, Long] = {
    val attrArr = F.array(attrs.map(a => F.lower(F.col(a).cast("string"))): _*)
    rows.select(F.explode(attrArr).as("v"))
      .where(F.col("v").isNotNull)
      .groupBy("v").count()
      .where(F.col("count") >= 2)
      .collect()
      .map(r => r.getString(0) -> r.getLong(1))
      .toMap
  }

  /** The progressive Link Index; starts empty, amended per query. */
  val li = new LinkIndex

  private val retainedMemo =
    scala.collection.concurrent.TrieMap.empty[(Boolean, Boolean, Double, Double), DataFrame]

  /** TBI after the block-refinement methods (Block Purging + Block
    * Filtering) under a meta-blocking configuration — computed once per
    * table and reused by every query. Evaluating BP/BF on the full TBI
    * rather than per-query EQBI keeps the refinement decisions identical
    * between a query's sub-graph and the full-table graph (the paper's
    * DQ-Correctness needs deterministic, scope-stable meta-blocking) and
    * moves the cost into the once-off initialisation.
    */
  def retainedTbi(mb: MbConfig): DataFrame =
    retainedMemo.getOrElseUpdate((mb.purge, mb.filter, mb.purgeSf, mb.filterP), {
      var cur = tbi
      if (mb.purge) cur = MetaBlocking.purge(cur, mb.purgeSf)._1
      if (mb.filter) cur = MetaBlocking.filter(cur, mb.filterP)
      val d = cur.persist(StorageLevel.MEMORY_AND_DISK)
      d.count()
      d
    })

  /** Memoised planner statistics (duplication factor, join percentages). */
  private[repro] var dupFactorMemo: Option[Double]                 = None
  private[repro] val joinPercentMemo =
    scala.collection.concurrent.TrieMap.empty[(String, String, String), (Double, Double)]

  /** Forget all progressive state (used between benchmark configurations). */
  def resetLinkIndex(): Unit = li.clear()

  def unpersistAll(): Unit = {
    blockSizes.unpersist(); tbi.unpersist(); rows.unpersist()
  }
}

object TableContext {
  def apply(name: String, df: DataFrame, truth: Option[DataFrame] = None): TableContext =
    new TableContext(name, df, truth)
}
