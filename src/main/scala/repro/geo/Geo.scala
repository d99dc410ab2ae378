package repro.geo

/** A WGS-84 coordinate. */
final case class LatLng(lat: Double, lng: Double) extends Serializable

/** Planar (metres) coordinate in a city-local projection. */
final case class XY(x: Double, y: Double) extends Serializable {
  def dist(o: XY): Double = math.hypot(x - o.x, y - o.y)
  def -(o: XY): XY = XY(x - o.x, y - o.y)
  def +(o: XY): XY = XY(x + o.x, y + o.y)
  def dot(o: XY): Double = x * o.x + y * o.y
  def norm: Double = math.hypot(x, y)
}

/** Geometry helpers.
  *
  * City-scale work uses a local equirectangular projection anchored at the
  * city centre: accurate to well under GPS noise (cm-level over ~30 km) and
  * far cheaper than haversine inside the R-tree / HMM inner loops. Haversine
  * is kept for sanity tests against the projection.
  */
object Geo {
  val EarthRadiusM: Double = 6371008.8

  /** Great-circle distance in metres. */
  def haversineM(a: LatLng, b: LatLng): Double = {
    val dLat = math.toRadians(b.lat - a.lat)
    val dLng = math.toRadians(b.lng - a.lng)
    val s = math.pow(math.sin(dLat / 2), 2) +
      math.cos(math.toRadians(a.lat)) * math.cos(math.toRadians(b.lat)) *
        math.pow(math.sin(dLng / 2), 2)
    2 * EarthRadiusM * math.asin(math.min(1.0, math.sqrt(s)))
  }

  /** Local equirectangular projection anchored at `origin`. */
  final case class Projection(origin: LatLng) extends Serializable {
    private val cosLat0 = math.cos(math.toRadians(origin.lat))
    def toXY(p: LatLng): XY = XY(
      math.toRadians(p.lng - origin.lng) * EarthRadiusM * cosLat0,
      math.toRadians(p.lat - origin.lat) * EarthRadiusM,
    )
    def toLatLng(p: XY): LatLng = LatLng(
      origin.lat + math.toDegrees(p.y / EarthRadiusM),
      origin.lng + math.toDegrees(p.x / (EarthRadiusM * cosLat0)),
    )
  }

  /** Unclamped-to-[0,1] projection parameter of `p` onto segment `a -> b`. */
  private def projParam(p: XY, a: XY, b: XY): Double = {
    val ab = b - a
    val len2 = ab.dot(ab)
    if (len2 <= 0) 0.0 else math.min(1.0, math.max(0.0, ((p - a).dot(ab)) / len2))
  }

  /** Position ratio (Definition 5: r in [0, 1)) of the orthogonal projection
    * of `p` onto segment `a -> b`.
    */
  def projectRatio(p: XY, a: XY, b: XY): Double =
    math.min(0.999999, projParam(p, a, b))

  /** Distance in metres from `p` to segment `a -> b`. */
  def pointSegDist(p: XY, a: XY, b: XY): Double = {
    val t = projParam(p, a, b)
    p.dist(XY(a.x + (b.x - a.x) * t, a.y + (b.y - a.y) * t))
  }

  /** Point at ratio `r` along segment `a -> b`. */
  def lerp(a: XY, b: XY, r: Double): XY =
    XY(a.x + (b.x - a.x) * r, a.y + (b.y - a.y) * r)

  /** Cosine similarity of two planar vectors; 0 when either is degenerate. */
  def cosine(u: XY, v: XY): Double = {
    val d = u.norm * v.norm
    if (d < 1e-12) 0.0 else math.max(-1.0, math.min(1.0, u.dot(v) / d))
  }
}
