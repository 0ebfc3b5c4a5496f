package repro.sql

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{DedupConfig, TableContext}
import repro.planner._

/** Programmatic facade of the QueryER framework: register dirty tables,
  * then run `SELECT DEDUP …` statements (or pre-built specs) against them.
  */
object QueryEr {

  /** Register a dirty table; builds its TBI/LI context once-off. */
  def register(spark: SparkSession, name: String, df: DataFrame,
               truth: Option[DataFrame] = None): TableContext =
    TableRegistry.register(spark, name, df, truth)

  /** Evaluate a DEDUP SQL statement, returning the grouped result. */
  def sql(
      spark: SparkSession,
      sqlText: String,
      kind: PlannerKind = AdvancedPlanner,
      cfg: DedupConfig = DedupConfig(),
  ): DataFrame = sqlWithStats(spark, sqlText, kind, cfg)._1

  /** Same, also returning the execution statistics. */
  def sqlWithStats(
      spark: SparkSession,
      sqlText: String,
      kind: PlannerKind = AdvancedPlanner,
      cfg: DedupConfig = DedupConfig(),
  ): (DataFrame, ExecStats) =
    DedupSqlParser.parse(spark, sqlText) match {
      case DedupSqlParser.ParsedSelect(spec) =>
        Executor.runSelect(TableRegistry(spec.table), spec, cfg)
      case DedupSqlParser.ParsedJoin(spec) =>
        Executor.runJoin(TableRegistry(spec.left.table), TableRegistry(spec.right.table),
          spec, kind, cfg)
    }
}
