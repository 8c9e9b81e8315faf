package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.eval.Experiments

/** Reproduces the §8.2 recall number: Fixy's recall of the 24 missing tracks
  * in the exhaustively audited internal scene (paper: 18/24 = 75%).
  */
object RecallJob {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("fixy-recall")
    try {
      val r = Experiments.recallExperiment
      println(f"Recall: ${r.found}/${r.total} = ${r.recall * 100}%.0f%% (paper: 18/24 = 75%%)")
    } finally spark.stop()
  }
}
