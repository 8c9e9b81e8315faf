package repro.core

/** The LOA DSL (§4): scenes, tracks, observation bundles, observations (OBTs),
  * features over each level, feature distributions, and the applied-feature
  * form that [[FactorGraph]] compiles to factors.
  *
  * This driver-side object model is the *reference semantics* of LOA. The
  * Spark scorer in [[Fixy]] implements the same semantics as a DataFrame job
  * and is differential-tested against this model.
  */
object Loa {

  /** Observation bundle β: same-frame observations associated by IOU. */
  final case class Bundle(frame: Int, obs: Seq[Obs]) {
    /** Representative (centroid) box used for transitions and tracking. */
    def representative: Box = {
      val k = obs.size.toDouble
      Box(
        obs.map(_.x).sum / k, obs.map(_.y).sum / k,
        obs.map(_.l).sum / k, obs.map(_.w).sum / k,
        obs.map(_.z).sum / k, obs.map(_.h).sum / k,
      )
    }
    def hasSource(s: String): Boolean = obs.exists(_.source == s)
  }

  /** Track τ: bundles ordered by frame. */
  final case class Track(trackId: Long, bundles: Seq[Bundle]) {
    def allObs: Seq[Obs] = bundles.flatMap(_.obs)
    def nObs: Int = allObs.size
    def hasSource(s: String): Boolean = allObs.exists(_.source == s)
    /** Majority class over member observations (ties broken lexicographically). */
    def majorityClass: String =
      allObs.groupBy(_.cls).toSeq.map { case (c, os) => (os.size, c) }.sortBy(t => (-t._1, t._2)).head._2
  }

  /** Scene s: a set of tracks. */
  final case class Scene(scene: Long, tracks: Seq[Track])

  /** Rebuild the LOA object model from association output. */
  def fromTracked(rows: Seq[TrackedObs]): Seq[Scene] =
    rows.groupBy(_.scene).toSeq.sortBy(_._1).map { case (sceneId, sceneRows) =>
      val tracks = sceneRows.groupBy(_.trackId).toSeq.sortBy(_._1).map { case (tid, trackRows) =>
        val bundles = trackRows.groupBy(_.bundleId).toSeq.sortBy { case (bid, rs) => (rs.head.frame, bid) }
          .map { case (_, rs) => Bundle(rs.head.frame, rs.sortBy(o => (o.source, o.trueId, o.x)).map(_.toObs)) }
        Track(tid, bundles)
      }
      Scene(sceneId, tracks)
    }

  // --------------------------------------------------------------------------
  // Feature distributions (§5): a feature (π) composed with a learned or
  // manual distribution, plus an AOF (§5.3). `likelihood` returns the
  // distribution's (max-normalized) probability of the feature value.
  // --------------------------------------------------------------------------

  sealed trait AppliedFeature extends Serializable {
    def name: String
    def aof: Aof
  }

  /** Feature over a single observation, e.g. class-conditional box volume. */
  final case class ObsFeature(name: String, aof: Aof, likelihood: Obs => Double) extends AppliedFeature

  /** Feature over an observation bundle, e.g. "model predictions only". */
  final case class BundleFeature(name: String, aof: Aof, likelihood: Bundle => Double) extends AppliedFeature

  /** Feature over adjacent bundles in a track, e.g. instantaneous velocity. */
  final case class TransitionFeature(name: String, aof: Aof, likelihood: (Bundle, Bundle) => Double)
      extends AppliedFeature

  /** Feature over an entire track, e.g. observation count. */
  final case class TrackFeature(name: String, aof: Aof, likelihood: Track => Double) extends AppliedFeature

  /** Instantaneous speed (m/s) between bundle representatives — the paper's
    * canonical transition feature. Returns None for same-frame bundle pairs
    * (no time elapsed, no factor emitted).
    */
  def transitionSpeed(prev: Bundle, next: Bundle, fps: Double): Option[Double] = {
    val df = next.frame - prev.frame
    if (df <= 0) None
    else Some(Geometry.centerDistance(prev.representative, next.representative) * fps / df)
  }
}
