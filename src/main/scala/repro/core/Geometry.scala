package repro.core

/** Axis-aligned birds-eye-view (BEV) box centered at (x, y) with footprint
  * l (extent along x) × w (extent along y), plus vertical extent h at base z
  * for volume computation.
  *
  * Substitution note (DESIGN.md): the paper uses oriented 3D boxes; none of
  * its features (volume, velocity, distance) depend on heading, and IOU-based
  * association is only perturbed at second order, so axis-aligned BEV boxes
  * preserve the behaviour Fixy exploits.
  */
final case class Box(x: Double, y: Double, l: Double, w: Double, z: Double = 0.0, h: Double = 0.0) {
  /** 3D volume of the box (m³). */
  def volume: Double = l * w * h

  /** BEV footprint area (m²). */
  def area: Double = l * w

  /** Euclidean distance of the box center from the origin (the AV). */
  def distanceToAv: Double = math.hypot(x, y)
}

/** Pure geometry used by association and by feature computation. */
object Geometry {

  /** Length of the 1D overlap of [c1 − e1/2, c1 + e1/2] and [c2 − e2/2, c2 + e2/2]. */
  def overlap1d(c1: Double, e1: Double, c2: Double, e2: Double): Double = {
    val lo = math.max(c1 - e1 / 2, c2 - e2 / 2)
    val hi = math.min(c1 + e1 / 2, c2 + e2 / 2)
    math.max(0.0, hi - lo)
  }

  /** BEV intersection-over-union of two axis-aligned boxes; in [0, 1]. */
  def iou(a: Box, b: Box): Double = {
    val inter = overlap1d(a.x, a.l, b.x, b.l) * overlap1d(a.y, a.w, b.y, b.w)
    if (inter <= 0.0) 0.0
    else {
      val union = a.area + b.area - inter
      if (union <= 0.0) 0.0 else inter / union
    }
  }

  /** Center-to-center BEV distance (m) — the basis of the velocity transition feature. */
  def centerDistance(a: Box, b: Box): Double = math.hypot(a.x - b.x, a.y - b.y)
}
