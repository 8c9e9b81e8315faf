package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.eval.Experiments

/** Reproduces §8.3: the injected consistent missing observation within a
  * human track is ranked first among candidate bundles (paper: ranked at the
  * top).
  */
object MissingObsJob {
  def main(args: Array[String]): Unit = {
    implicit val spark: SparkSession = JobSession.build("fixy-missing-obs")
    try {
      val r = Experiments.missingObsExperiment
      println(s"Injected missing observation global rank: ${r.goodRank} of ${r.nCandidates} candidates (paper: rank 1)")
    } finally spark.stop()
  }
}
