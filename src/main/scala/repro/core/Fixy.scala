package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** The learned feature distributions (§5) — fitted offline from existing
  * (possibly noisy) human labels and broadcast to executors for scoring.
  *
  * Classes with too few training examples fall back to the pooled (all-class)
  * distribution so an unseen class never crashes scoring.
  */
final case class LearnedModel(
    volumeByClass: Map[String, Kde],
    velocityByClass: Map[String, Kde],
    volumePooled: Kde,
    velocityPooled: Kde,
    trackLength: Kde,
    distanceScale: Double,
) extends Serializable {
  /** Class-conditional box-volume likelihood (Table 2 "Volume"). */
  def volumeLik(cls: String, vol: Double): Double =
    volumeByClass.getOrElse(cls, volumePooled).likelihood(vol)

  /** Class-conditional instantaneous-speed likelihood (Table 2 "Velocity"). */
  def velocityLik(cls: String, speed: Double): Double =
    velocityByClass.getOrElse(cls, velocityPooled).likelihood(speed)

  /** Manual severity distribution over distance-to-AV (Table 2 "Distance"). */
  def distanceLik(d: Double): Double = math.exp(-d / distanceScale)

  /** Learned track-length likelihood (§8.4 "track feature over the total
    * number of observations").
    */
  def trackLengthLik(nObs: Double): Double = trackLength.likelihood(nObs)
}

/** Pipeline configuration; defaults follow §3/§8. */
final case class FixyConfig(
    assoc: Association.Config = Association.Config(),
    fps: Double = 5.0,
    /** Table 2 "Count": filter tracks with two or fewer observations. */
    minTrackObs: Int = 3,
    /** e-fold scale (m) of the manual distance severity distribution. */
    distanceScale: Double = 60.0,
    /** Minimum per-class sample count before falling back to the pooled KDE. */
    minClassSamples: Int = 10,
)

/** Fixy (§3): offline feature-distribution learning over existing labels and
  * online scoring/ranking of potential errors, implemented as DataFrame jobs.
  *
  * All rankers take *already associated* observations ([[TrackedObs]]) so the
  * association pass is shared; `Association.assignTracks` produces them.
  */
object Fixy {
  import FactorGraph.Eps

  // --------------------------------------------------------------------------
  // Offline phase: learn feature distributions from existing human labels (§5.2).
  // --------------------------------------------------------------------------

  /** Fit volume/velocity/track-length distributions from the human-proposed
    * labels in `obs`. Labels may themselves contain errors — the paper's point
    * is that the aggregate distributions are still informative.
    */
  def learn(obs: Dataset[Obs], cfg: FixyConfig = FixyConfig())(implicit spark: SparkSession): LearnedModel = {
    import spark.implicits._
    val human = obs.filter(_.source == Sources.Human)
    val tracked = Association.assignTracks(human, cfg.assoc)
    val df = tracked.toDF().cache()
    try {
      val volumes: Seq[(String, Double)] =
        df.select(col("cls"), (col("l") * col("w") * col("h")).as("v")).as[(String, Double)].collect().toSeq

      val speeds: Seq[(String, Double)] = bundleTransitions(df, cfg).select("bcls", "speed").as[(String, Double)].collect().toSeq

      val lengths: Seq[Double] =
        df.groupBy("trackId").agg(count(lit(1)).as("n")).select(col("n").cast("double")).as[Double].collect().toSeq

      require(volumes.nonEmpty, "no human labels to learn volume distribution from")
      require(speeds.nonEmpty, "no human tracks to learn velocity distribution from")

      def byClass(pairs: Seq[(String, Double)]): Map[String, Kde] =
        pairs.groupBy(_._1).collect {
          case (c, vs) if vs.size >= cfg.minClassSamples => c -> Kde.fit(vs.map(_._2))
        }

      LearnedModel(
        volumeByClass = byClass(volumes),
        velocityByClass = byClass(speeds),
        volumePooled = Kde.fit(volumes.map(_._2)),
        velocityPooled = Kde.fit(speeds.map(_._2)),
        trackLength = Kde.fit(lengths),
        distanceScale = cfg.distanceScale,
      )
    } finally df.unpersist()
  }

  /** The paper's feature set (Table 2) as LOA driver-side applied features —
    * the reference semantics the Spark scorer must match factor-for-factor.
    * The "model only" and "count" features are hard filters applied outside
    * the score (see [[rankMissingTracks]]), so they do not appear here.
    */
  def driverFeatures(
      model: LearnedModel,
      cfg: FixyConfig = FixyConfig(),
      useDistance: Boolean = true,
      useTrackLength: Boolean = false,
      invert: Boolean = false,
  ): Seq[Loa.AppliedFeature] = {
    val aof: Aof = if (invert) Aof.Invert else Aof.Identity
    val volume = Loa.ObsFeature("volume", aof, o => model.volumeLik(o.cls, o.volume))
    val distance = Loa.ObsFeature("distance", aof, o => model.distanceLik(o.distanceToAv))
    val velocity = Loa.TransitionFeature("velocity", aof, (p, n) =>
      Loa.transitionSpeed(p, n, cfg.fps)
        .map(s => model.velocityLik(n.obs.map(_.cls).min, s))
        .getOrElse(1.0))
    val length = Loa.TrackFeature("count", aof, t => model.trackLengthLik(t.nObs.toDouble))
    Seq(volume) ++
      (if (useDistance) Seq(distance) else Seq.empty) ++
      Seq(velocity) ++
      (if (useTrackLength) Seq(length) else Seq.empty)
  }

  // --------------------------------------------------------------------------
  // Shared scoring machinery (Eq. 2 over the compiled factor graph, as a
  // DataFrame aggregation; differential-tested against FactorGraph).
  // --------------------------------------------------------------------------

  /** Per-bundle representative centers + the speed to the previous bundle of
    * the same track (the transition feature's raw value). `bcls` is the
    * bundle's deterministic class representative (min, matching the driver
    * reference semantics).
    */
  private[core] def bundleTransitions(trackedDf: DataFrame, cfg: FixyConfig): DataFrame = {
    val centers = trackedDf
      .groupBy("scene", "trackId", "bundleId", "frame")
      .agg(avg("x").as("cx"), avg("y").as("cy"), min("cls").as("bcls"))
    val w = Window.partitionBy("trackId").orderBy("frame", "bundleId")
    centers
      .withColumn("pcx", lag("cx", 1).over(w))
      .withColumn("pcy", lag("cy", 1).over(w))
      .withColumn("pframe", lag("frame", 1).over(w))
      .where(col("pframe").isNotNull && col("frame") > col("pframe"))
      .withColumn(
        "speed",
        hypot(col("cx") - col("pcx"), col("cy") - col("pcy")) * cfg.fps / (col("frame") - col("pframe")),
      )
      .select("scene", "trackId", "bundleId", "frame", "bcls", "speed")
  }

  /** Score every track of `tracked` per Eq. 2.
    *
    * Feature set toggles mirror the applications of §7/§8:
    *  - `useDistance` — include the manual distance severity factor (off for
    *     the model-error application, §8.4).
    *  - `useTrackLength` — include the learned track-length factor (on for
    *     the model-error application).
    *  - `invert` — apply the `1 − x` AOF to every learned factor (searching
    *     for unlikely tracks).
    *
    * Output columns: scene, trackId, score, nObs, nHuman, nModel, nFrames,
    * meanConf, maxConf, cls.
    */
  def scoreTracks(
      tracked: Dataset[TrackedObs],
      model: LearnedModel,
      cfg: FixyConfig = FixyConfig(),
      useDistance: Boolean = true,
      useTrackLength: Boolean = false,
      invert: Boolean = false,
  )(implicit spark: SparkSession): DataFrame = {
    val bc = spark.sparkContext.broadcast(model)
    val volLikU = udf((cls: String, v: Double) => bc.value.volumeLik(cls, v))
    val distLikU = udf((d: Double) => bc.value.distanceLik(d))
    val velLikU = udf((cls: String, s: Double) => bc.value.velocityLik(cls, s))
    val lenLikU = udf((n: Double) => bc.value.trackLengthLik(n))
    def aof(p: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
      if (invert) lit(1.0) - p else p
    def lnF(p: org.apache.spark.sql.Column): org.apache.spark.sql.Column =
      log(greatest(lit(Eps), aof(p)))

    val df = tracked.toDF()

    val perObs = df
      .withColumn("lnVol", lnF(volLikU(col("cls"), col("l") * col("w") * col("h"))))
      .withColumn("lnDist", if (useDistance) lnF(distLikU(hypot(col("x"), col("y")))) else lit(0.0))
    val obsFactorsPerObs = if (useDistance) 2 else 1

    val obsAgg = perObs
      .groupBy("scene", "trackId")
      .agg(
        sum(col("lnVol") + col("lnDist")).as("obsLog"),
        count(lit(1)).as("nObs"),
        sum(when(col("source") === Sources.Human, 1).otherwise(0)).as("nHuman"),
        sum(when(col("source") === Sources.Model, 1).otherwise(0)).as("nModel"),
        countDistinct("frame").as("nFrames"),
        avg(when(col("source") === Sources.Model, col("conf"))).as("meanConf"),
        max(when(col("source") === Sources.Model, col("conf"))).as("maxConf"),
        min("cls").as("cls"),
      )

    val transAgg = bundleTransitions(df, cfg)
      .withColumn("lnVel", lnF(velLikU(col("bcls"), col("speed"))))
      .groupBy("scene", "trackId")
      .agg(sum("lnVel").as("transLog"), count(lit(1)).as("nTrans"))

    val joined = obsAgg
      .join(transAgg, Seq("scene", "trackId"), "left")
      .na.fill(Map("transLog" -> 0.0, "nTrans" -> 0L))

    val withLen =
      if (useTrackLength)
        joined
          .withColumn("lenLog", lnF(lenLikU(col("nObs").cast("double"))))
          .withColumn("nLenFactors", lit(1L))
      else joined.withColumn("lenLog", lit(0.0)).withColumn("nLenFactors", lit(0L))

    withLen
      .withColumn("nFactors", col("nObs") * obsFactorsPerObs + col("nTrans") + col("nLenFactors"))
      .withColumn("score", (col("obsLog") + col("transLog") + col("lenLog")) / col("nFactors"))
      .select("scene", "trackId", "score", "nObs", "nHuman", "nModel", "nFrames", "meanConf", "maxConf", "cls")
  }

  // --------------------------------------------------------------------------
  // Application 1 (§7, §8.2): finding tracks missed entirely by human labels.
  // --------------------------------------------------------------------------

  /** Rank model-only tracks by plausibility, most plausible first. The AOF
    * zeroes out tracks containing any human proposal ("model only", Table 2)
    * and tracks with ≤ 2 observations ("count"); both are hard filters, so we
    * implement them as predicates rather than ε-score factors.
    *
    * Adds `rank` (1-based, per scene).
    */
  def rankMissingTracks(
      tracked: Dataset[TrackedObs],
      model: LearnedModel,
      cfg: FixyConfig = FixyConfig(),
  )(implicit spark: SparkSession): DataFrame = {
    val scored = scoreTracks(tracked, model, cfg, useDistance = true)
      .where(col("nHuman") === 0 && col("nObs") >= cfg.minTrackObs)
    val w = Window.partitionBy("scene").orderBy(desc("score"), col("trackId"))
    scored.withColumn("rank", row_number().over(w))
  }

  // --------------------------------------------------------------------------
  // Application 2 (§7, §8.3): finding missing labels *within* human tracks.
  // --------------------------------------------------------------------------

  /** Rank model-only bundles that belong to tracks containing at least one
    * human proposal — the AOF of §8.3: P(bundle with human) := 0,
    * P(track without human) := 0. We additionally zero bundles at frames
    * where the same track already has a human observation (the label exists
    * at that frame; it merely failed same-frame bundling), which is the
    * track-level reading of "bundle contains a human proposal". Higher score
    * = more likely a real missing label. Adds `rank` (1-based, per scene).
    */
  def rankMissingObservations(
      tracked: Dataset[TrackedObs],
      model: LearnedModel,
      cfg: FixyConfig = FixyConfig(),
  )(implicit spark: SparkSession): DataFrame = {
    val bc = spark.sparkContext.broadcast(model)
    val volLikU = udf((cls: String, v: Double) => bc.value.volumeLik(cls, v))
    val distLikU = udf((d: Double) => bc.value.distanceLik(d))
    val velLikU = udf((cls: String, s: Double) => bc.value.velocityLik(cls, s))
    def lnF(p: org.apache.spark.sql.Column) = log(greatest(lit(Eps), p))

    val df = tracked.toDF()

    val bundleAgg = df
      .withColumn("lnVol", lnF(volLikU(col("cls"), col("l") * col("w") * col("h"))))
      .withColumn("lnDist", lnF(distLikU(hypot(col("x"), col("y")))))
      .groupBy("scene", "trackId", "bundleId", "frame")
      .agg(
        sum(col("lnVol") + col("lnDist")).as("obsLog"),
        count(lit(1)).as("nObs"),
        sum(when(col("source") === Sources.Human, 1).otherwise(0)).as("nHumanInBundle"),
        min("cls").as("cls"),
      )

    val trackHuman = df
      .groupBy("trackId")
      .agg(sum(when(col("source") === Sources.Human, 1).otherwise(0)).as("nHumanInTrack"))

    val humanFrames = df
      .where(col("source") === Sources.Human)
      .select(col("trackId"), col("frame"))
      .distinct()
      .withColumn("humanAtFrame", lit(true))

    val trans = bundleTransitions(df, cfg)
      .withColumn("lnVel", lnF(velLikU(col("bcls"), col("speed"))))
      .select("bundleId", "lnVel")

    val scored = bundleAgg
      .join(trackHuman, Seq("trackId"))
      .join(humanFrames, Seq("trackId", "frame"), "left")
      .join(trans, Seq("bundleId"), "left")
      .where(col("nHumanInBundle") === 0 && col("nHumanInTrack") > 0 && col("humanAtFrame").isNull)
      .withColumn("nTrans", when(col("lnVel").isNotNull, 1L).otherwise(0L))
      .withColumn(
        "score",
        (col("obsLog") + coalesce(col("lnVel"), lit(0.0))) / (col("nObs") * 2 + col("nTrans")),
      )
      .select("scene", "trackId", "bundleId", "frame", "score", "nObs", "cls")
    val w = Window.partitionBy("scene").orderBy(desc("score"), col("bundleId"))
    scored.withColumn("rank", row_number().over(w))
  }

  // --------------------------------------------------------------------------
  // Application 3 (§7, §8.4): finding erroneous ML model predictions.
  // --------------------------------------------------------------------------

  /** Rank model tracks by *implausibility* (the `1 − x` AOF), excluding any
    * track in `excludedTrackIds` (the errors the ad-hoc MAs already found,
    * per §8.4). Input should contain model observations only. Adds `rank`
    * (1-based, global — the paper reports a single top-10 over 5 scenes).
    */
  def rankModelErrors(
      tracked: Dataset[TrackedObs],
      model: LearnedModel,
      cfg: FixyConfig = FixyConfig(),
      excludedTrackIds: Seq[Long] = Seq.empty,
  )(implicit spark: SparkSession): DataFrame = {
    val scored = scoreTracks(tracked, model, cfg, useDistance = false, useTrackLength = true, invert = true)
      .where(col("nObs") >= cfg.minTrackObs)
      .where(!col("trackId").isInCollection(if (excludedTrackIds.isEmpty) Seq(-1L) else excludedTrackIds))
    val w = Window.orderBy(desc("score"), col("trackId"))
    scored.withColumn("rank", row_number().over(w))
  }
}
