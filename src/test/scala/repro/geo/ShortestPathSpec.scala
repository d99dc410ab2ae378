package repro.geo

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ShortestPathSpec extends AnyFunSuite {

  private val net = RoadNetwork.generate(
    RoadNetwork.CityConfig("test", LatLng(41.15, -8.6), gridW = 7, gridH = 6, spacingM = 150, seed = 3))

  private def floydWarshall(n: RoadNetwork): Array[Array[Double]] = {
    val m = n.numNodes
    val d = Array.fill(m, m)(Double.PositiveInfinity)
    (0 until m).foreach(i => d(i)(i) = 0.0)
    n.segments.foreach(s => d(s.from)(s.to) = math.min(d(s.from)(s.to), s.lengthM))
    for (k <- 0 until m; i <- 0 until m; j <- 0 until m)
      if (d(i)(k) + d(k)(j) < d(i)(j)) d(i)(j) = d(i)(k) + d(k)(j)
    d
  }

  private lazy val fw = floydWarshall(net)

  test("network is strongly connected (generator invariant)") {
    val d = ShortestPath.dijkstra(net, 0)
    assert(d.forall(_.isFinite))
  }

  test("dijkstra matches Floyd-Warshall from several sources") {
    Seq(0, 5, net.numNodes / 2, net.numNodes - 1).foreach { src =>
      val d = ShortestPath.dijkstra(net, src)
      (0 until net.numNodes).foreach { v =>
        assert(math.abs(d(v) - fw(src)(v)) < 1e-6, s"src=$src v=$v")
      }
    }
  }

  test("aStar matches Floyd-Warshall on random pairs") {
    val rnd = new Random(11)
    (1 to 60).foreach { _ =>
      val a = rnd.nextInt(net.numNodes); val b = rnd.nextInt(net.numNodes)
      assert(math.abs(ShortestPath.aStar(net, a, b) - fw(a)(b)) < 1e-6, s"$a->$b")
    }
  }

  test("aStar to self is 0") {
    assert(ShortestPath.aStar(net, 4, 4) == 0.0)
  }

  test("DistCache matchedDist same segment") {
    val cache = new ShortestPath.DistCache(net)
    val s = net.segments(0)
    val d = cache.matchedDist(0, 0.2, 0, 0.7)
    assert(math.abs(d - 0.5 * s.lengthM) < 1e-9)
  }

  test("DistCache matchedDist is symmetric and near-planar for nearby points") {
    val cache = new ShortestPath.DistCache(net)
    val rnd = new Random(5)
    (1 to 40).foreach { _ =>
      val sa = rnd.nextInt(net.numSegments); val sb = rnd.nextInt(net.numSegments)
      val ra = rnd.nextDouble(); val rb = rnd.nextDouble()
      val d1 = cache.matchedDist(sa, ra, sb, rb)
      val d2 = cache.matchedDist(sb, rb, sa, ra)
      assert(math.abs(d1 - d2) < 1e-6)
      // Network distance can never beat the straight line (modulo the lane
      // offset: path lengths are centreline, point geometry is lane-shifted).
      val planar = net.pointAt(sa, ra).dist(net.pointAt(sb, rb))
      assert(d1 >= planar - 2 * RoadNetwork.LaneOffsetM - 1e-6)
    }
  }

  test("segmentRoute connects adjacent segments directly") {
    val s0 = net.segments(0)
    val next = net.nextSegments(0)
    assume(next.nonEmpty)
    val r = ShortestPath.segmentRoute(net, 0, next.head)
    assert(r.contains(List(next.head)))
  }

  test("segmentRoute from a segment to itself is empty") {
    assert(ShortestPath.segmentRoute(net, 3, 3).contains(Nil))
  }

  test("segmentRoute forms a connected chain") {
    val rnd = new Random(13)
    (1 to 30).foreach { _ =>
      val a = rnd.nextInt(net.numSegments); val b = rnd.nextInt(net.numSegments)
      ShortestPath.segmentRoute(net, a, b).foreach { path =>
        val full = a :: path
        full.sliding(2).foreach {
          case List(x, y) => assert(net.nextSegments(x).contains(y), s"$x !-> $y")
          case _          => ()
        }
        if (a != b) assert(full.last == b)
      }
    }
  }
}
