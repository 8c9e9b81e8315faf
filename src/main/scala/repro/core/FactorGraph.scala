package repro.core

import repro.core.Loa._

/** Factor-graph compilation (§4.3) and relative-plausibility scoring (§6).
  *
  * A compiled graph is bipartite: variable nodes are observations, factor
  * nodes are feature-distribution instances, and an edge connects a factor to
  * every observation it applies over. The score of any component is
  *
  *   Σ_factors ln(max(ε, AOF(likelihood))) / #factors   (Eq. 2 + §6 normalization)
  *
  * This driver-side implementation is the reference semantics; the Spark
  * scorer in [[Fixy]] is differential-tested against it.
  */
object FactorGraph {

  /** Likelihood floor before ln, so hard-zeroed factors yield a large negative
    * but finite score contribution (rank-equivalent to −∞ in a top-k list).
    */
  val Eps: Double = 1e-6

  /** One factor node: the (AOF-transformed) value and the obs it connects to. */
  final case class Factor(name: String, memberObs: Seq[Int], value: Double)

  /** A compiled graph over one track's observations. */
  final case class Compiled(obs: IndexedSeq[Obs], factors: Seq[Factor]) {
    def nVariables: Int = obs.size
    def nFactors: Int = factors.size
    def nEdges: Int = factors.map(_.memberObs.size).sum

    /** Eq. 2 score over the whole compiled component. */
    def score: Double = scoreOf(factors)

    /** Eq. 2 score over the factors touching a subset of observations. */
    def scoreSubset(obsIdx: Set[Int]): Double =
      scoreOf(factors.filter(_.memberObs.exists(obsIdx.contains)))

    private def scoreOf(fs: Seq[Factor]): Double =
      if (fs.isEmpty) math.log(Eps)
      else fs.map(f => math.log(math.max(Eps, f.value))).sum / fs.size
  }

  /** Compile one track against a feature set (§4.3): one factor per
    * (obs feature × obs), (bundle feature × bundle), (transition feature ×
    * adjacent bundle pair), (track feature × track).
    */
  def compileTrack(track: Track, features: Seq[AppliedFeature]): Compiled = {
    val obs = track.allObs.toIndexedSeq
    val obsIdx = obs.zipWithIndex.toMap
    val bundleMembers: Map[Bundle, Seq[Int]] =
      track.bundles.map(b => b -> b.obs.map(obsIdx)).toMap

    val ordered = track.bundles.sortBy(_.frame)
    val factors = Seq.newBuilder[Factor]

    features.foreach {
      case f: ObsFeature =>
        obs.zipWithIndex.foreach { case (o, i) =>
          factors += Factor(f.name, Seq(i), f.aof(f.likelihood(o)))
        }
      case f: BundleFeature =>
        ordered.foreach { b =>
          factors += Factor(f.name, bundleMembers(b), f.aof(f.likelihood(b)))
        }
      case f: TransitionFeature =>
        ordered.sliding(2).foreach {
          case Seq(prev, next) if next.frame > prev.frame =>
            factors += Factor(f.name, bundleMembers(prev) ++ bundleMembers(next), f.aof(f.likelihood(prev, next)))
          case _ => // same-frame pair or singleton track: no transition factor
        }
      case f: TrackFeature =>
        factors += Factor(f.name, obs.indices, f.aof(f.likelihood(track)))
    }
    Compiled(obs, factors.result())
  }

  /** Compile and score every track of a scene; returns (track, score) ranked
    * descending (most plausible first under identity AOFs).
    */
  def rankTracks(scene: Scene, features: Seq[AppliedFeature]): Seq[(Track, Double)] =
    scene.tracks
      .map(t => t -> compileTrack(t, features).score)
      .sortBy { case (t, s) => (-s, t.trackId) }
}
