package repro.embed

/** Axis-aligned pixel box, end-exclusive: [x0, x1) × [y0, y1). */
final case class Box(x0: Double, y0: Double, x1: Double, y1: Double) {
  require(x1 >= x0 && y1 >= y0, s"degenerate box ($x0,$y0,$x1,$y1)")
  def width: Double = x1 - x0
  def height: Double = y1 - y0
  def area: Double = width * height

  def intersectionArea(o: Box): Double = {
    val w = math.min(x1, o.x1) - math.max(x0, o.x0)
    val h = math.min(y1, o.y1) - math.max(y0, o.y0)
    if (w <= 0 || h <= 0) 0.0 else w * h
  }

  def overlaps(o: Box): Boolean = intersectionArea(o) > 0.0
}

/** Multiscale patch tiling (paper §4.3).
  *
  * Every image gets one *coarse* patch covering the full frame. If the image
  * is larger than the embedding model's native window (224px), it also gets a
  * finer tiling of patches of half the image's short side (but at least
  * 224px), striding at half the tile size — e.g. a 448×448 image yields
  * 1 coarse + 9 fine patches, the example in the paper.
  */
object Multiscale {

  /** The embedding model's native input size (CLIP: 224×224). */
  val NativeSize = 224

  /** All patches for an image of size w×h; coarse patch is always index 0. */
  def patches(w: Int, h: Int, multiscale: Boolean = true): IndexedSeq[Box] = {
    require(w > 0 && h > 0, s"image size ${w}x$h must be positive")
    val coarse = Box(0, 0, w, h)
    if (!multiscale || math.min(w, h) <= NativeSize) IndexedSeq(coarse)
    else coarse +: fineTiles(w, h)
  }

  private def fineTiles(w: Int, h: Int): IndexedSeq[Box] = {
    val tile = math.max(NativeSize, math.min(w, h) / 2)
    val stride = math.max(1, tile / 2)
    val xs = positions(w, tile, stride)
    val ys = positions(h, tile, stride)
    for (y <- ys; x <- xs) yield Box(x, y, math.min(x + tile, w), math.min(y + tile, h))
  }

  /** Tile origins along one axis; a dimension shorter than the tile yields
    * one flush-left tile clamped at the image edge.
    */
  private def positions(extent: Int, tile: Int, stride: Int): IndexedSeq[Int] = {
    if (extent <= tile) IndexedSeq(0)
    else 0 to (extent - tile) by stride
  }
}
