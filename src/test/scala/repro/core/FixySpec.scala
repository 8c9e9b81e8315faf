package repro.core

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.perception.PerceptionData
import TestObs.movingTrack

class FixySpec extends SparkSpec {
  implicit private lazy val ss: SparkSession = spark
  import org.apache.spark.sql.functions._

  private val cfg = FixyConfig()
  private lazy val trainSpec = PerceptionData.internalTrain.copy(nScenes = 4)
  private lazy val learned: LearnedModel = Fixy.learn(PerceptionData.observations(trainSpec), cfg)

  private def toDs(os: Seq[Obs]) = {
    import ss.implicits._
    ss.createDataset(os)
  }

  // --- offline learning (§5.2) ---------------------------------------------

  test("learned volume KDE peaks near canonical class volumes") {
    val car = PerceptionData.params(Classes.Car)
    val carVol = car.l * car.w * car.h
    assert(learned.volumeLik(Classes.Car, carVol) > 0.3)
    assert(learned.volumeLik(Classes.Car, carVol * 20) < 0.01)
  }
  test("learned volume KDE is class-conditional") {
    val car = PerceptionData.params(Classes.Car)
    val carVol = car.l * car.w * car.h
    assert(learned.volumeLik(Classes.Pedestrian, carVol) < 0.05)
    assert(learned.volumeLik(Classes.Pedestrian, 1.1) > 0.2)
  }
  test("learned velocity KDE accepts class-typical speeds, rejects extremes") {
    assert(learned.velocityLik(Classes.Pedestrian, 1.4) > 0.05)
    assert(learned.velocityLik(Classes.Pedestrian, 15.0) < 0.01)
    assert(learned.velocityLik(Classes.Car, 40.0) < 0.01)
  }
  test("unknown class falls back to the pooled distribution") {
    assert(learned.volumeLik("unicycle", 14.5) == learned.volumePooled.likelihood(14.5))
  }
  test("distance likelihood decays exponentially") {
    assert(learned.distanceLik(0) === 1.0)
    assert(math.abs(learned.distanceLik(60) - math.exp(-1)) < 1e-12)
    assert(learned.distanceLik(10) > learned.distanceLik(50))
  }
  test("all four classes get class-conditional distributions") {
    assert(Classes.All.forall(learned.volumeByClass.contains))
    assert(Classes.All.forall(learned.velocityByClass.contains))
  }
  test("track length KDE sees plausible lengths") {
    assert(learned.trackLengthLik(140.0) > 0.0) // full-vis human+model track
  }
  test("learn is deterministic") {
    val again = Fixy.learn(PerceptionData.observations(trainSpec), cfg)
    assert(again.volumeLik(Classes.Car, 14.5) == learned.volumeLik(Classes.Car, 14.5))
    assert(again.velocityLik(Classes.Car, 8.0) == learned.velocityLik(Classes.Car, 8.0))
  }
  test("learn fails cleanly with no human labels") {
    assertThrows[IllegalArgumentException] {
      Fixy.learn(toDs(movingTrack(5, source = Sources.Model)), cfg)
    }
  }

  // --- differential test: Spark scorer vs factor-graph reference (§4.3/§6) --

  private def differential(useDistance: Boolean, useTrackLength: Boolean, invert: Boolean): Unit = {
    val spec = PerceptionData.internalTrain.copy(nScenes = 2, objectsPerScene = 8, ghostsPerScene = 4)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc)
    val sparkScores = Fixy.scoreTracks(tracked, learned, cfg, useDistance, useTrackLength, invert)
      .select("trackId", "score").collect().map(r => r.getLong(0) -> r.getDouble(1)).toMap

    val rows = tracked.collect().toSeq
    val features = Fixy.driverFeatures(learned, cfg, useDistance, useTrackLength, invert)
    val driverScores = Loa.fromTracked(rows).flatMap(_.tracks.map { t =>
      t.trackId -> FactorGraph.compileTrack(t, features).score
    }).toMap

    assert(sparkScores.keySet == driverScores.keySet)
    for ((tid, s) <- sparkScores) {
      assert(math.abs(s - driverScores(tid)) < 1e-6, s"track $tid: spark=$s driver=${driverScores(tid)}")
    }
  }

  test("spark scorer matches factor-graph reference (missing-track feature set)") {
    differential(useDistance = true, useTrackLength = false, invert = false)
  }
  test("spark scorer matches factor-graph reference (model-error feature set)") {
    differential(useDistance = false, useTrackLength = true, invert = true)
  }
  test("spark scorer matches factor-graph reference (volume+velocity only)") {
    differential(useDistance = false, useTrackLength = false, invert = false)
  }

  // --- application 1: missing tracks (§8.2) ---------------------------------

  test("missing-track candidates contain no human observations") {
    val spec = PerceptionData.internalTrain.copy(nScenes = 2, pMissingTrack = 0.3)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc)
    val ranked = Fixy.rankMissingTracks(tracked, learned, cfg)
    assert(ranked.where(col("nHuman") > 0).count() == 0)
  }
  test("count filter drops tracks with fewer than 3 observations") {
    val spec = PerceptionData.internalTrain.copy(nScenes = 2, pMissingTrack = 0.3)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc)
    val ranked = Fixy.rankMissingTracks(tracked, learned, cfg)
    assert(ranked.where(col("nObs") < 3).count() == 0)
  }
  test("rank is dense per scene starting at 1") {
    val spec = PerceptionData.internalTrain.copy(nScenes = 2, pMissingTrack = 0.3)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc)
    val ranked = Fixy.rankMissingTracks(tracked, learned, cfg)
    val perScene = ranked.groupBy("scene").agg(min("rank").as("lo"), max("rank").as("hi"), count(lit(1)).as("n"))
      .collect()
    perScene.foreach { r =>
      assert(r.getAs[Int]("lo") == 1)
      assert(r.getAs[Int]("hi") == r.getAs[Long]("n"))
    }
  }
  test("a consistent missed object outranks an implausible ghost") {
    // missed car: plausible volume/motion; ghost: pedestrian-labeled truck-size box
    val car = movingTrack(10, trueId = 1, cls = Classes.Car, x0 = 10, dxPerFrame = 1.5)
    val ghost = (0 until 10).map { f =>
      TestObs.obs(frame = f, trueId = -5, cls = Classes.Pedestrian,
        x = -20 + 0.2 * f, y = 5, l = 8.0, w = 2.5, h = 3.0, conf = 0.7)
    }
    val tracked = Association.assignTracks(toDs(car ++ ghost), cfg.assoc)
    val ranked = Fixy.rankMissingTracks(tracked, learned, cfg).collect()
    assert(ranked.length == 2)
    val byRank = ranked.sortBy(_.getAs[Int]("rank"))
    // the real car's track contains trueId=1 observations
    val top = byRank.head
    assert(top.getAs[String]("cls") == Classes.Car)
  }
  test("a human-labeled track is never proposed") {
    val labeled = movingTrack(10, source = Sources.Human, conf = 1.0) ++
      movingTrack(10, source = Sources.Model).map(o => o.copy(x = o.x + 0.05))
    val missed = movingTrack(10, trueId = 2, y0 = 50)
    val tracked = Association.assignTracks(toDs(labeled ++ missed), cfg.assoc)
    val ranked = Fixy.rankMissingTracks(tracked, learned, cfg).collect()
    assert(ranked.length == 1)
  }

  // --- application 2: missing observations (§8.3) ---------------------------

  test("missing-obs candidates are model-only bundles inside human tracks") {
    val spec = PerceptionData.missingObsSim.copy(nScenes = 2)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc).cache()
    val ranked = Fixy.rankMissingObservations(tracked, learned, cfg)
    // every candidate's track must contain human observations
    val humanTracks = tracked.toDF().where(col("source") === Sources.Human)
      .select("trackId").distinct().collect().map(_.getLong(0)).toSet
    val candTracks = ranked.select("trackId").collect().map(_.getLong(0))
    assert(candTracks.forall(humanTracks.contains))
    tracked.unpersist()
  }
  test("good injected missing observation outranks distorted distractors") {
    val spec = PerceptionData.missingObsSim.copy(nScenes = 3)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc).cache()
    val truth = PerceptionData.truth(spec).collect()
    val goodId = truth.find(_.missingObsKind == "good").get.trueId
    val ranked = Fixy.rankMissingObservations(tracked, learned, cfg)
    val bundleTrue = tracked.toDF().groupBy("bundleId").agg(min("trueId").as("tid"))
    val joined = ranked.join(bundleTrue, Seq("bundleId"))
      .orderBy(desc("score")).select("tid").collect().map(_.getLong(0))
    assert(joined.nonEmpty)
    assert(joined.head == goodId, s"top candidate was ${joined.head}, expected $goodId")
    tracked.unpersist()
  }

  // --- application 3: model errors (§8.4) -----------------------------------

  test("inverted AOF ranks implausible tracks first") {
    val good = movingTrack(10, trueId = 1, x0 = 10, dxPerFrame = 1.5)
    val bad = (0 until 10).map { f =>
      TestObs.obs(frame = f, trueId = -7, cls = Classes.Pedestrian,
        x = 30 + 0.1 * f, y = 0, l = 8.0, w = 2.5, h = 3.0, conf = 0.95)
    }
    val tracked = Association.assignTracks(toDs(good ++ bad), cfg.assoc)
    val ranked = Fixy.rankModelErrors(tracked, learned, cfg).collect().sortBy(_.getAs[Int]("rank"))
    assert(ranked.length == 2)
    assert(ranked.head.getAs[String]("cls") == Classes.Pedestrian)
  }
  test("excluded track ids are not proposed") {
    val good = movingTrack(10, trueId = 1)
    val tracked = Association.assignTracks(toDs(good), cfg.assoc)
    val all = Fixy.rankModelErrors(tracked, learned, cfg).collect()
    assert(all.length == 1)
    val excluded = Fixy.rankModelErrors(tracked, learned, cfg,
      excludedTrackIds = Seq(all.head.getAs[Long]("trackId"))).collect()
    assert(excluded.isEmpty)
  }
  test("model-error ranking is global (one list across scenes)") {
    val spec = PerceptionData.modelErrorSim.copy(nScenes = 2)
    import ss.implicits._
    val modelObs = PerceptionData.observations(spec).filter(_.source == Sources.Model)
    val tracked = Association.assignTracks(modelObs, cfg.assoc)
    val ranked = Fixy.rankModelErrors(tracked, learned, cfg).collect()
    val ranks = ranked.map(_.getAs[Int]("rank")).sorted
    assert(ranks.toSeq == (1 to ranked.length))
  }

  // --- scoring invariants ---------------------------------------------------

  test("scores are finite for every track") {
    val spec = PerceptionData.internalTrain.copy(nScenes = 2)
    val tracked = Association.assignTracks(PerceptionData.observations(spec), cfg.assoc)
    val scores = Fixy.scoreTracks(tracked, learned, cfg).select("score").collect().map(_.getDouble(0))
    assert(scores.nonEmpty)
    assert(scores.forall(s => !s.isNaN && !s.isInfinity))
  }
  test("identity vs inverted scores flip the order of a plausible vs implausible track") {
    val plausible = movingTrack(8, trueId = 1, x0 = 10, dxPerFrame = 1.5)
    val implausible = (0 until 8).map { f =>
      TestObs.obs(frame = f, trueId = 2, cls = Classes.Pedestrian,
        x = 40 + 0.1 * f, y = 0, l = 8.0, w = 2.5, h = 3.0, conf = 0.8)
    }
    val tracked = Association.assignTracks(toDs(plausible ++ implausible), cfg.assoc).cache()
    def scores(invert: Boolean): Map[String, Double] =
      Fixy.scoreTracks(tracked, learned, cfg, useDistance = false, invert = invert)
        .select("cls", "score").collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    val id = scores(invert = false)
    val inv = scores(invert = true)
    assert(id(Classes.Car) > id(Classes.Pedestrian))
    assert(inv(Classes.Car) < inv(Classes.Pedestrian))
    tracked.unpersist()
  }
}
