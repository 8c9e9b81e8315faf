package repro.baselines

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.{Sources, TrackedObs}

/** Uncertainty sampling (§8.4 baseline): "we sampled predictions around a
  * confidence threshold" — tracks are ranked by how close their mean model
  * confidence is to the threshold (closest first).
  */
object Uncertainty {

  def rankTracks(
      tracked: Dataset[TrackedObs],
      threshold: Double = 0.5,
      minObs: Int = 1,
  )(implicit spark: SparkSession): DataFrame = {
    val agg = tracked.toDF()
      .where(col("source") === Sources.Model)
      .groupBy("scene", "trackId")
      .agg(count(lit(1)).as("nObs"), avg("conf").as("meanConf"), max("conf").as("maxConf"))
      .where(col("nObs") >= minObs)
      .withColumn("severity", -abs(col("meanConf") - lit(threshold)))
    val w = Window.orderBy(desc("severity"), col("trackId"))
    agg.withColumn("rank", row_number().over(w))
  }
}
