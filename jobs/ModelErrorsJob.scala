package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.eval.Experiments

/** Reproduces §8.4: Fixy finds novel model-prediction errors that the ad-hoc
  * MAs cannot (paper: P@10 82% vs 42% for uncertainty sampling; errors with
  * confidence as high as 95%).
  */
object ModelErrorsJob {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("fixy-model-errors")
    try {
      val r = Experiments.modelErrorsExperiment
      println(f"Fixy P@10:        ${r.fixyP10 * 100}%.0f%% (paper: 82%%)")
      println(f"Uncertainty P@10: ${r.uncertaintyP10 * 100}%.0f%% (paper: 42%%)")
      println(f"Max confidence among Fixy true positives: ${r.maxConfAmongFixyHits * 100}%.0f%% (paper: up to 95%%)")
    } finally spark.stop()
  }
}
