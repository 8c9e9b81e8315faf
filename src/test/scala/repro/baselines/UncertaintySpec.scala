package repro.baselines

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.core._
import repro.core.TestObs.movingTrack

class UncertaintySpec extends SparkSpec {
  implicit private lazy val ss: SparkSession = spark

  private def toDs(os: Seq[Obs]) = {
    import ss.implicits._
    ss.createDataset(os)
  }
  private def tracked(os: Seq[Obs]) = Association.assignTracks(toDs(os))

  test("tracks nearest the threshold rank first") {
    val borderline = movingTrack(5, trueId = 1, conf = 0.52)
    val confident = movingTrack(5, trueId = 2, y0 = 50, conf = 0.95)
    val out = Uncertainty.rankTracks(tracked(borderline ++ confident)).collect().sortBy(_.getAs[Int]("rank"))
    assert(math.abs(out.head.getAs[Double]("meanConf") - 0.52) < 0.01)
  }
  test("high-confidence errors are ranked last (the §8.4 blind spot)") {
    val novel = movingTrack(5, trueId = -1, conf = 0.95)
    val borderline = movingTrack(5, trueId = 2, y0 = 50, conf = 0.5)
    val out = Uncertainty.rankTracks(tracked(novel ++ borderline)).collect().sortBy(_.getAs[Int]("rank"))
    assert(out.last.getAs[Double]("meanConf") > 0.9)
  }
  test("threshold is configurable") {
    val a = movingTrack(5, trueId = 1, conf = 0.3)
    val b = movingTrack(5, trueId = 2, y0 = 50, conf = 0.9)
    val out = Uncertainty.rankTracks(tracked(a ++ b), threshold = 0.9).collect().sortBy(_.getAs[Int]("rank"))
    assert(out.head.getAs[Double]("meanConf") > 0.8)
  }
  test("human observations are ignored") {
    val human = movingTrack(5, trueId = 1, source = Sources.Human, conf = 1.0)
    assert(Uncertainty.rankTracks(tracked(human)).count() == 0)
  }
  test("global rank is dense from 1") {
    val os = (1 to 6).flatMap(i => movingTrack(4, trueId = i, y0 = i * 30, conf = 0.3 + 0.1 * i))
    val out = Uncertainty.rankTracks(tracked(os)).collect()
    assert(out.map(_.getAs[Int]("rank")).sorted.toSeq == (1 to out.length))
  }
}
