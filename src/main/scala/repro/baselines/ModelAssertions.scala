package repro.baselines

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.{Sources, TrackedObs}

/** The ad-hoc model assertions of Kang et al. (MLSys 2020) used as baselines
  * in §8.2/§8.4: black-box predicates over associated observations with
  * hand-specified severity orderings.
  */
object ModelAssertions {

  /** §8.2 "consistency" assertion: a time-consistent model track with no
    * human label is flagged as a potential missing label. Candidate set
    * matches Fixy's (model-only tracks with ≥ `minObs` observations); the
    * ad-hoc part is the severity ordering:
    *  - `rand`: uniformly random severity with the given seed;
    *  - `conf`: mean model confidence, highest first.
    * Adds `rank` (1-based, per scene).
    */
  def consistency(
      tracked: Dataset[TrackedObs],
      ordering: String,
      minObs: Int = 3,
      seed: Long = 0,
  )(implicit spark: SparkSession): DataFrame = {
    val agg = tracked.toDF()
      .groupBy("scene", "trackId")
      .agg(
        count(lit(1)).as("nObs"),
        sum(when(col("source") === Sources.Human, 1).otherwise(0)).as("nHuman"),
        avg(when(col("source") === Sources.Model, col("conf"))).as("meanConf"),
        min("cls").as("cls"),
      )
      .where(col("nHuman") === 0 && col("nObs") >= minObs)
    val severity = ordering match {
      case "rand" => agg.withColumn("severity", abs(hash(col("trackId"), lit(seed))).cast("double"))
      case "conf" => agg.withColumn("severity", col("meanConf"))
      case other  => throw new IllegalArgumentException(s"unknown ordering: $other")
    }
    val w = Window.partitionBy("scene").orderBy(desc("severity"), col("trackId"))
    severity.withColumn("rank", row_number().over(w))
  }

  /** §8.4 "appear": an observation should have observations in nearby
    * timestamps — flags tracks with ≤ `minObs` observations (2 in Kang et
    * al.; a stricter setting also catches slightly longer detection
    * fragments).
    */
  def appearFlagged(tracked: Dataset[TrackedObs], minObs: Int = 2)(implicit spark: SparkSession): Seq[Long] =
    tracked.toDF()
      .groupBy("trackId").agg(count(lit(1)).as("nObs"))
      .where(col("nObs") <= minObs)
      .select("trackId").collect().map(_.getLong(0)).toSeq

  /** §8.4 "flicker": a track should not appear and disappear rapidly — flags
    * tracks whose frame sequence has gaps.
    */
  def flickerFlagged(tracked: Dataset[TrackedObs])(implicit spark: SparkSession): Seq[Long] = {
    val frames = tracked.toDF().select("trackId", "frame").distinct()
    frames
      .groupBy("trackId")
      .agg(min("frame").as("lo"), max("frame").as("hi"), count(lit(1)).as("n"))
      .where(col("hi") - col("lo") + 1 > col("n"))
      .select("trackId").collect().map(_.getLong(0)).toSeq
  }

  /** §8.4 "multibox": three boxes should not overlap — flags tracks containing
    * a bundle with ≥ 3 model observations in one frame.
    */
  def multiboxFlagged(tracked: Dataset[TrackedObs])(implicit spark: SparkSession): Seq[Long] =
    tracked.toDF()
      .where(col("source") === Sources.Model)
      .groupBy("trackId", "bundleId", "frame").agg(count(lit(1)).as("n"))
      .where(col("n") >= 3)
      .select("trackId").distinct().collect().map(_.getLong(0)).toSeq

  /** Union of the three §8.4 assertions. */
  def allFlagged(tracked: Dataset[TrackedObs], appearMinObs: Int = 2)(implicit spark: SparkSession): Seq[Long] =
    (appearFlagged(tracked, appearMinObs) ++ flickerFlagged(tracked) ++ multiboxFlagged(tracked)).distinct
}
