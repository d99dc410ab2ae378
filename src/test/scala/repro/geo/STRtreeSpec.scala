package repro.geo

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class STRtreeSpec extends AnyFunSuite {
  private val rnd = new Random(7)

  private def randomSegments(n: Int): Array[Segment] =
    Array.tabulate(n) { i =>
      val a = XY(rnd.nextDouble() * 5000, rnd.nextDouble() * 5000)
      val b = XY(a.x + rnd.nextDouble() * 200 - 100, a.y + rnd.nextDouble() * 200 - 100)
      Segment(i, 0, 0, a, b, a.dist(b))
    }

  private def bruteTopK(segs: Array[Segment], p: XY, k: Int): Array[Int] =
    segs.map(s => (Geo.pointSegDist(p, s.a, s.b), s.id)).sortBy(e => (e._1, e._2)).take(k).map(_._2)

  test("top-1 matches brute force on 500 random queries") {
    val segs = randomSegments(400)
    val tree = STRtree.build(segs)
    (1 to 500).foreach { _ =>
      val p = XY(rnd.nextDouble() * 5000, rnd.nextDouble() * 5000)
      assert(tree.nearest(p, 1).toSeq == bruteTopK(segs, p, 1).toSeq)
    }
  }

  test("top-10 matches brute force (distance multiset) on 200 random queries") {
    val segs = randomSegments(700)
    val tree = STRtree.build(segs)
    (1 to 200).foreach { _ =>
      val p = XY(rnd.nextDouble() * 5000, rnd.nextDouble() * 5000)
      val got = tree.nearest(p, 10)
      val exp = bruteTopK(segs, p, 10)
      // Ties may be ordered differently; compare the distance sequences.
      val gd = got.map(tree.distTo(p, _)).toSeq
      val ed = exp.map(tree.distTo(p, _)).toSeq
      assert(gd.zip(ed).forall { case (a, b) => math.abs(a - b) < 1e-9 }, s"$gd vs $ed")
    }
  }

  test("results are sorted by ascending distance") {
    val segs = randomSegments(300)
    val tree = STRtree.build(segs)
    (1 to 100).foreach { _ =>
      val p = XY(rnd.nextDouble() * 5000, rnd.nextDouble() * 5000)
      val ds = tree.nearest(p, 8).map(tree.distTo(p, _))
      assert(ds.sliding(2).forall(w => w.length < 2 || w(0) <= w(1) + 1e-12))
    }
  }

  test("k larger than segment count returns all segments") {
    val segs = randomSegments(5)
    val tree = STRtree.build(segs)
    assert(tree.nearest(XY(0, 0), 50).length == 5)
  }

  test("k = 0 and empty input behave") {
    val segs = randomSegments(10)
    val tree = STRtree.build(segs)
    assert(tree.nearest(XY(0, 0), 0).isEmpty)
    intercept[IllegalArgumentException](STRtree.build(Array.empty[Segment]))
  }

  test("single-segment tree") {
    val s = Segment(0, 0, 1, XY(0, 0), XY(10, 0), 10)
    val tree = STRtree.build(Array(s))
    assert(tree.nearest(XY(5, 3), 3).toSeq == Seq(0))
    assert(math.abs(tree.distTo(XY(5, 3), 0) - 3.0) < 1e-12)
  }
}
