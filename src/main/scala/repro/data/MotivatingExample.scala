package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}

/** The paper's motivating example — Tables 1 (publications P) and 2
  * (venues V) verbatim, with ground truth [P1,P2], [P3,P4,P5], [P6,P7,P8]
  * and [V1,V4], [V2,V3], [V5,V6] (§2). Used by the Table 3/Table 5
  * reproductions and the integration tests.
  */
object MotivatingExample {

  def publications(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(
      (1L, "Collective Entity Resolution", null, "EDBT", "2008"),
      (2L, "Collective E.R.", "Allan Blake", "International Conference on Extending Database Technology", "2008"),
      (3L, "Entity Resolution on Big Data", "Jane Davids, John Doe", "ACM Sigmod", "2017"),
      (4L, "E.R on Big Data", "J. Davids, J. Doe", "Sigmod", null),
      (5L, "Entity Resolution on Big Data", "J. Davids, John Doe.", "Proc of ACM SIGMOD", "2017"),
      (6L, "E.R for consumer data", "Allan Blake, Lisa Davidson", "EDBT", "2015"),
      (7L, "Entity-Resolution for consumer data", "A. Blake, L. Davidson", "International Conference on Extending Database Technology", null),
      (8L, "Entity-Resolution for consumer data", "Allan Blake , Davidson Lisa", "EDBT", "2015"),
    ).toDF("eid", "title", "author", "venue", "year")
  }

  def publicationsTruth(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(1L -> 1L, 2L -> 1L, 3L -> 3L, 4L -> 3L, 5L -> 3L, 6L -> 6L, 7L -> 6L, 8L -> 6L)
      .toDF("eid", "cluster")
  }

  def venues(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(
      (1L, "International Conference on Extending Database Technology", "Extending Database Technology", "1", "annual", "1984"),
      (2L, "SIGMOD", "ACM SIGMOD Conference", "1", null, "1975"),
      (3L, "ACM SIGMOD", null, "1", "annual", "1975"),
      (4L, "EDBT", "International Conference on Extending Database Technology", null, "yearly", null),
      (5L, "CIDR", "Conference on Innovative Data Systems Research", null, "biennial", "2002"),
      (6L, "Conference on Innovative Data Systems Research", null, "2", "biyearly", "2002"),
    ).toDF("eid", "title", "description", "rank", "frequency", "est")
  }

  def venuesTruth(spark: SparkSession): DataFrame = {
    import spark.implicits._
    Seq(1L -> 1L, 2L -> 2L, 3L -> 2L, 4L -> 1L, 5L -> 5L, 6L -> 5L).toDF("eid", "cluster")
  }
}
