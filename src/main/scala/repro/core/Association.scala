package repro.core

import org.apache.spark.sql.{Dataset, SparkSession}

/** Association substrate (§3 "the analyst first associates observations"):
  *
  *  1. *Bundling* — observations within the same (scene, frame) whose BEV IOU
  *     is ≥ `bundleIou` are merged into an observation bundle (β). This is the
  *     paper's default `TrackBundler` (IOU > 0.5).
  *  2. *Tracking* — bundles in nearby frames (gap ≤ `maxGap`) whose
  *     representative boxes have IOU ≥ `trackIou` are merged into a track (τ).
  *     A gap tolerance > 1 lets a flickering detector stay in one track, which
  *     is what the flicker model assertion (§8.4) inspects.
  *
  * The per-scene algorithm is pure Scala (exhaustive O(n²)-per-frame pairing +
  * union-find) so it can be unit-tested without Spark; `assignTracks` shards
  * it over scenes with `groupByKey(scene).flatMapGroups` — scenes are
  * independent, so this is embarrassingly parallel.
  */
object Association {

  /** Association thresholds; defaults follow §3/§8.2. `maxGap` is the largest
    * frame *difference* bridged when tracking (maxGap = 3 tolerates up to two
    * consecutive missed detections, so a flickering detector stays in one
    * track — which is exactly what the flicker assertion inspects).
    *
    * `distGateFactor`: when no predecessor reaches `trackIou`, the nearest
    * predecessor within `min(distGateFactor · max(l, w), distGateCap)` of the
    * bundle's representative box is matched instead (doubled when bridging a
    * detection gap). This is standard tracker distance gating; it compensates
    * for our axis-aligned-box substitution, where a fast object moving across
    * its box's long axis can drop to IOU 0 between consecutive frames
    * (oriented boxes, which the paper's data has, would not). The absolute
    * cap reflects the largest plausible per-frame displacement (~14 m/s at
    * 5 Hz) so large boxes don't vacuum up their neighbours. Set the factor to
    * 0 to disable gating.
    */
  final case class Config(
      bundleIou: Double = 0.5,
      trackIou: Double = 0.1,
      maxGap: Int = 3,
      distGateFactor: Double = 0.8,
      distGateCap: Double = 2.8)

  /** Scene-local ids are packed below this; scene id is the high digits. */
  val SceneStride: Long = 1000000L

  /** Assign bundle and track ids to one scene's observations.
    *
    * Output order and ids are deterministic: input is sorted by
    * (frame, source, trueId, x, y) before id assignment.
    */
  def assignScene(obsIn: Seq[Obs], cfg: Config = Config()): IndexedSeq[TrackedObs] = {
    val obs = obsIn.toIndexedSeq.sortBy(o => (o.frame, o.source, o.trueId, o.x, o.y))
    if (obs.isEmpty) return IndexedSeq.empty
    require(obs.map(_.scene).distinct.size == 1, "assignScene expects a single scene")
    val scene = obs.head.scene
    val n = obs.length

    // --- Bundling: union same-frame observations with IOU >= bundleIou. ---
    val byFrame = obs.indices.groupBy(i => obs(i).frame)
    val ufObs = new UnionFind(n)
    for ((_, idxs) <- byFrame) {
      for (ai <- idxs.indices; bi <- (ai + 1) until idxs.length) {
        val a = idxs(ai); val b = idxs(bi)
        if (Geometry.iou(obs(a).box, obs(b).box) >= cfg.bundleIou) ufObs.union(a, b)
      }
    }
    val bundleOfObs = ufObs.componentIds
    val nBundles = if (n == 0) 0 else bundleOfObs.max + 1

    // --- Representative box per bundle: member-box average (centroid box). ---
    val bundleMembers = Array.fill(nBundles)(List.empty[Int])
    obs.indices.foreach(i => bundleMembers(bundleOfObs(i)) ::= i)
    val bundleFrame = new Array[Int](nBundles)
    val bundleBox = new Array[Box](nBundles)
    for (b <- 0 until nBundles) {
      val ms = bundleMembers(b)
      bundleFrame(b) = obs(ms.head).frame
      val k = ms.size.toDouble
      bundleBox(b) = Box(
        x = ms.map(obs(_).x).sum / k,
        y = ms.map(obs(_).y).sum / k,
        l = ms.map(obs(_).l).sum / k,
        w = ms.map(obs(_).w).sum / k,
        z = ms.map(obs(_).z).sum / k,
        h = ms.map(obs(_).h).sum / k,
      )
    }

    // --- Tracking: greedily match each bundle to its best predecessor. ---
    val bundlesByFrame = (0 until nBundles).groupBy(bundleFrame)
    val frames = bundlesByFrame.keys.toIndexedSeq.sorted
    val ufBundle = new UnionFind(nBundles)
    for (f <- frames; b <- bundlesByFrame(f).sorted) {
      // Nearest prior frame wins; within it, the highest-IOU bundle, falling
      // back to the nearest bundle inside the distance gate.
      val gateBase =
        math.min(cfg.distGateFactor * math.max(bundleBox(b).l, bundleBox(b).w), cfg.distGateCap)
      var gap = 1
      var matched = false
      while (!matched && gap <= cfg.maxGap) {
        val prev = bundlesByFrame.getOrElse(f - gap, IndexedSeq.empty)
        if (prev.nonEmpty) {
          var best = -1
          var bestIou = cfg.trackIou
          for (p <- prev) {
            val i = Geometry.iou(bundleBox(b), bundleBox(p))
            if (i >= bestIou) { best = p; bestIou = i }
          }
          val gate = if (cfg.distGateFactor > 0) gateBase * math.min(gap, 2) else 0.0
          if (best < 0 && gate > 0) {
            var bestDist = gate
            for (p <- prev) {
              val d = Geometry.centerDistance(bundleBox(b), bundleBox(p))
              if (d <= bestDist) { best = p; bestDist = d }
            }
          }
          if (best >= 0) { ufBundle.union(b, best); matched = true }
        }
        gap += 1
      }
    }
    val trackOfBundle = ufBundle.componentIds

    obs.indices.map { i =>
      val o = obs(i)
      val b = bundleOfObs(i)
      TrackedObs(
        o.scene, o.frame, o.source, o.trueId, o.cls,
        o.x, o.y, o.z, o.l, o.w, o.h, o.conf,
        bundleId = scene * SceneStride + b,
        trackId = scene * SceneStride + trackOfBundle(b),
      )
    }
  }

  /** Distributed wrapper: one `assignScene` task per scene. */
  def assignTracks(obs: Dataset[Obs], cfg: Config = Config())(implicit spark: SparkSession): Dataset[TrackedObs] = {
    import spark.implicits._
    obs.groupByKey(_.scene).flatMapGroups { (_, it) => assignScene(it.toSeq, cfg) }
  }
}
