package repro.core

/** Shared helpers for building observation fixtures in tests. */
object TestObs {
  /** A car-sized observation with sensible defaults. */
  def obs(
      scene: Long = 0,
      frame: Int = 0,
      source: String = Sources.Model,
      trueId: Long = 1,
      cls: String = Classes.Car,
      x: Double = 0.0,
      y: Double = 0.0,
      l: Double = 4.5,
      w: Double = 1.9,
      h: Double = 1.7,
      conf: Double = 0.9,
  ): Obs = Obs(scene, frame, source, trueId, cls, x, y, 0.0, l, w, h, conf)

  /** A straight-moving track of `n` model observations, one per frame. */
  def movingTrack(
      n: Int,
      scene: Long = 0,
      trueId: Long = 1,
      cls: String = Classes.Car,
      x0: Double = 10.0,
      y0: Double = 0.0,
      dxPerFrame: Double = 1.0,
      source: String = Sources.Model,
      conf: Double = 0.9,
  ): Seq[Obs] =
    (0 until n).map(f => obs(scene, f, source, trueId, cls, x0 + f * dxPerFrame, y0, conf = conf))
}
