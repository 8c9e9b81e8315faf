package repro.baselines

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.core._
import repro.core.TestObs.movingTrack

class ModelAssertionsSpec extends SparkSpec {
  implicit private lazy val ss: SparkSession = spark
  import org.apache.spark.sql.functions._

  private def toDs(os: Seq[Obs]) = {
    import ss.implicits._
    ss.createDataset(os)
  }
  private def tracked(os: Seq[Obs]) = Association.assignTracks(toDs(os))

  // --- consistency (§8.2 baseline) ------------------------------------------

  test("consistency flags model-only tracks of sufficient length") {
    val missed = movingTrack(6, trueId = 1)
    val labeled = movingTrack(6, trueId = 2, y0 = 50, source = Sources.Human)
    val out = ModelAssertions.consistency(tracked(missed ++ labeled), "rand").collect()
    assert(out.length == 1)
    assert(out.head.getAs[Long]("nHuman") == 0)
  }
  test("consistency drops short tracks") {
    val short = movingTrack(2, trueId = 1)
    assert(ModelAssertions.consistency(tracked(short), "rand").count() == 0)
  }
  test("rand ordering is deterministic for a fixed seed") {
    val os = (1 to 5).flatMap(i => movingTrack(5, trueId = i, y0 = i * 40))
    val t = tracked(os).cache()
    val a = ModelAssertions.consistency(t, "rand", seed = 3).select("trackId", "rank").collect().toSet
    val b = ModelAssertions.consistency(t, "rand", seed = 3).select("trackId", "rank").collect().toSet
    assert(a == b)
    t.unpersist()
  }
  test("rand ordering changes with the seed") {
    val os = (1 to 8).flatMap(i => movingTrack(5, trueId = i, y0 = i * 40))
    val t = tracked(os).cache()
    val a = ModelAssertions.consistency(t, "rand", seed = 1).select("trackId", "rank").collect().toSet
    val b = ModelAssertions.consistency(t, "rand", seed = 2).select("trackId", "rank").collect().toSet
    assert(a != b)
    t.unpersist()
  }
  test("conf ordering ranks by mean confidence descending") {
    val hi = movingTrack(5, trueId = 1, conf = 0.95)
    val lo = movingTrack(5, trueId = 2, y0 = 50, conf = 0.4)
    val out = ModelAssertions.consistency(tracked(hi ++ lo), "conf").collect().sortBy(_.getAs[Int]("rank"))
    assert(out.head.getAs[Double]("meanConf") > out.last.getAs[Double]("meanConf"))
  }
  test("unknown ordering is rejected") {
    assertThrows[IllegalArgumentException] {
      ModelAssertions.consistency(tracked(movingTrack(5)), "bogus")
    }
  }

  // --- appear / flicker / multibox (§8.4) -----------------------------------

  test("appear flags tracks with <= 2 observations") {
    val short = movingTrack(2, trueId = 1)
    val long = movingTrack(6, trueId = 2, y0 = 50)
    val t = tracked(short ++ long)
    val flagged = ModelAssertions.appearFlagged(t)
    assert(flagged.size == 1)
  }
  test("flicker flags tracks with frame gaps") {
    val gappy = movingTrack(8, trueId = 1).filterNot(_.frame == 4)
    val smooth = movingTrack(8, trueId = 2, y0 = 50)
    val t = tracked(gappy ++ smooth).cache()
    val flagged = ModelAssertions.flickerFlagged(t)
    assert(flagged.size == 1)
    // the flagged track is the gappy one
    val gappyTrack = t.collect().filter(_.trueId == 1).map(_.trackId).distinct
    assert(flagged.toSet == gappyTrack.toSet)
    t.unpersist()
  }
  test("flicker does not flag gap-free tracks") {
    assert(ModelAssertions.flickerFlagged(tracked(movingTrack(10))).isEmpty)
  }
  test("multibox flags bundles with 3+ overlapping model boxes") {
    val triple = (0 until 4).flatMap { f =>
      (0 until 3).map(b => TestObs.obs(frame = f, trueId = -1, x = 10 + 0.2 * b, y = 0.2 * b, conf = 0.6))
    }
    val t = tracked(triple)
    assert(ModelAssertions.multiboxFlagged(t).nonEmpty)
  }
  test("multibox ignores pairs") {
    val pair = (0 until 4).flatMap { f =>
      (0 until 2).map(b => TestObs.obs(frame = f, trueId = -1, x = 10 + 0.2 * b, conf = 0.6))
    }
    assert(ModelAssertions.multiboxFlagged(tracked(pair)).isEmpty)
  }
  test("allFlagged unions the three assertions without duplicates") {
    val short = movingTrack(2, trueId = 1)
    val gappy = movingTrack(8, trueId = 2, y0 = 50).filterNot(_.frame == 4)
    val t = tracked(short ++ gappy)
    val all = ModelAssertions.allFlagged(t)
    assert(all.size == all.distinct.size)
    assert(all.size == 2)
  }
  test("ma ghosts in the 8.4 preset are flagged, novel errors are not") {
    import ss.implicits._
    val spec = repro.perception.PerceptionData.modelErrorSim.copy(nScenes = 2)
    val modelObs = repro.perception.PerceptionData.observations(spec).filter(_.source == Sources.Model)
    val t = Association.assignTracks(modelObs).cache()
    val flagged = ModelAssertions.allFlagged(t).toSet
    val rows = t.collect()
    val novelTracks = rows.filter(o => o.trueId < 0 && -o.trueId % repro.perception.PerceptionData.IdStride >= 50000)
      .groupBy(_.trackId)
      // only tracks that are purely novel-error observations
      .collect { case (tid, os) if rows.filter(_.trackId == tid).forall(o => os.map(_.trueId).contains(o.trueId)) => tid }
    assert(novelTracks.nonEmpty)
    assert(novelTracks.forall(tid => !flagged.contains(tid)), "novel errors must evade the ad-hoc MAs")
    t.unpersist()
  }
}
