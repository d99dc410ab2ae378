package repro.geo

import org.scalatest.funsuite.AnyFunSuite

class GeoSpec extends AnyFunSuite {
  private val origin = LatLng(41.15, -8.6)
  private val proj = Geo.Projection(origin)

  test("projection round-trips") {
    val p = LatLng(41.2, -8.55)
    val back = proj.toLatLng(proj.toXY(p))
    assert(math.abs(back.lat - p.lat) < 1e-9)
    assert(math.abs(back.lng - p.lng) < 1e-9)
  }

  test("projection distance matches haversine at city scale") {
    val a = LatLng(41.15, -8.60)
    val b = LatLng(41.19, -8.55)
    val dProj = proj.toXY(a).dist(proj.toXY(b))
    val dHav = Geo.haversineM(a, b)
    assert(math.abs(dProj - dHav) / dHav < 0.002, s"$dProj vs $dHav")
  }

  test("origin maps to (0,0)") {
    val xy = proj.toXY(origin)
    assert(math.abs(xy.x) < 1e-9 && math.abs(xy.y) < 1e-9)
  }

  test("projectRatio endpoints and midpoint") {
    val a = XY(0, 0); val b = XY(10, 0)
    assert(Geo.projectRatio(XY(-5, 3), a, b) == 0.0)
    assert(Geo.projectRatio(XY(5, 3), a, b) === 0.5)
    assert(Geo.projectRatio(XY(50, 3), a, b) < 1.0) // clamped below 1
  }

  test("projectRatio of degenerate segment is 0") {
    assert(Geo.projectRatio(XY(1, 1), XY(2, 2), XY(2, 2)) == 0.0)
  }

  test("pointSegDist perpendicular case") {
    assert(math.abs(Geo.pointSegDist(XY(5, 7), XY(0, 0), XY(10, 0)) - 7.0) < 1e-12)
  }

  test("pointSegDist beyond endpoint uses endpoint distance") {
    assert(math.abs(Geo.pointSegDist(XY(13, 4), XY(0, 0), XY(10, 0)) - 5.0) < 1e-12)
  }

  test("pointSegDist is non-negative and bounded by endpoint distances (property)") {
    val rnd = new scala.util.Random(99)
    def c() = rnd.nextDouble() * 200 - 100
    (1 to 500).foreach { _ =>
      val p = XY(c(), c()); val a = XY(c(), c()); val b = XY(c(), c())
      val d = Geo.pointSegDist(p, a, b)
      assert(d >= -1e-12)
      assert(d <= math.min(p.dist(a), p.dist(b)) + 1e-9)
    }
  }

  test("lerp endpoints") {
    val a = XY(1, 2); val b = XY(5, 10)
    assert(Geo.lerp(a, b, 0.0) == a)
    assert(Geo.lerp(a, b, 1.0) == b)
    assert(Geo.lerp(a, b, 0.5) == XY(3, 6))
  }

  test("cosine of parallel, orthogonal, opposite vectors") {
    assert(math.abs(Geo.cosine(XY(1, 0), XY(3, 0)) - 1.0) < 1e-12)
    assert(math.abs(Geo.cosine(XY(1, 0), XY(0, 2))) < 1e-12)
    assert(math.abs(Geo.cosine(XY(1, 0), XY(-4, 0)) + 1.0) < 1e-12)
    assert(Geo.cosine(XY(0, 0), XY(1, 1)) == 0.0)
  }
}
