package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.data.MotivatingExample

/** Test-scope alias of the motivating-example fixture (kept in main scope
  * as [[repro.data.MotivatingExample]] so jobs and benches can reuse it).
  */
object Fixtures {
  def publications(spark: SparkSession): DataFrame      = MotivatingExample.publications(spark)
  def publicationsTruth(spark: SparkSession): DataFrame = MotivatingExample.publicationsTruth(spark)
  def venues(spark: SparkSession): DataFrame            = MotivatingExample.venues(spark)
  def venuesTruth(spark: SparkSession): DataFrame       = MotivatingExample.venuesTruth(spark)
}
