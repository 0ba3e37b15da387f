package repro.index

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ARTreeSpec extends AnyFunSuite {

  private def randomItems(rnd: Random, n: Int, dim: Int): Seq[(MBR, Int)] =
    (0 until n).map { i =>
      val lo = Array.fill(dim)(rnd.nextDouble())
      val hi = lo.map(x => math.min(1.0, x + rnd.nextDouble() * 0.2))
      (MBR.of(lo, hi), i)
    }

  test("MBR intersects / containsPoint basics") {
    val a = MBR.of(Array(0.0, 0.0), Array(0.5, 0.5))
    val b = MBR.of(Array(0.4, 0.4), Array(0.9, 0.9))
    val c = MBR.of(Array(0.6, 0.6), Array(0.9, 0.9))
    assert(a.intersects(b) && b.intersects(a))
    assert(!a.intersects(c))
    assert(a.containsPoint(Array(0.25, 0.25)))
    assert(!a.containsPoint(Array(0.75, 0.25)))
  }

  test("MBR union covers both boxes") {
    val a = MBR.of(Array(0.1, 0.2), Array(0.3, 0.4))
    val b = MBR.of(Array(0.2, 0.0), Array(0.5, 0.3))
    val u = a union b
    assert(u.lo.toSeq == Seq(0.1, 0.0) && u.hi.toSeq == Seq(0.5, 0.4))
  }

  test("build rejects empty input") {
    assertThrows[IllegalArgumentException](
      ARTree.build[Int, Int](2, Seq.empty)(identity, _ + _))
  }

  test("allEntries returns every inserted item exactly once") {
    val rnd   = new Random(21)
    val items = randomItems(rnd, 500, 3)
    val tree  = ARTree.build(3, items)(_ => 1, (a: Int, b: Int) => a + b)
    assert(tree.allEntries.sorted == (0 until 500).toVector)
    assert(tree.size == 500)
  }

  test("root aggregate merges all leaf aggregates") {
    val rnd   = new Random(22)
    val items = randomItems(rnd, 300, 2)
    val tree  = ARTree.build(2, items)(_ => 1, (a: Int, b: Int) => a + b)
    assert(tree.root.agg == 300)
  }

  test("root MBR bounds every item") {
    val rnd   = new Random(23)
    val items = randomItems(rnd, 200, 2)
    val tree  = ARTree.build(2, items)(_ => 0, (a: Int, _: Int) => a)
    items.foreach { case (m, _) =>
      assert(tree.root.mbr.containsPoint(m.lo) && tree.root.mbr.containsPoint(m.hi))
    }
  }

  test("point search finds exactly the intersecting items (randomized)") {
    val rnd   = new Random(24)
    val items = randomItems(rnd, 400, 2)
    val tree  = ARTree.build(2, items)(_ => 1, (a: Int, b: Int) => a + b)
    (1 to 50).foreach { _ =>
      val pt  = Array.fill(2)(rnd.nextDouble())
      val exp = items.collect { case (m, i) if m.containsPoint(pt) => i }.toSet
      val got = collection.mutable.Set.empty[Int]
      tree.search((mbr, _) => mbr.containsPoint(pt), (m, _) => m.containsPoint(pt))(got += _)
      assert(got == exp)
    }
  }

  test("node pruning via aggregate is consistent: pruned nodes hide only their entries") {
    val rnd   = new Random(25)
    // Aggregate = max item id; prune nodes whose max id < threshold.
    val items = randomItems(rnd, 300, 2)
    val tree  = ARTree.build(2, items)(i => i, (a: Int, b: Int) => math.max(a, b))
    val got   = collection.mutable.Set.empty[Int]
    tree.search((_, agg) => agg >= 250, (_, _) => true)(i => if (i >= 250) got += i)
    assert(got == (250 until 300).toSet)
  }

  test("search returns the number of visited leaves, bounded by the leaf count") {
    val rnd    = new Random(26)
    val items  = randomItems(rnd, 600, 3)
    val tree   = ARTree.build(3, items)(_ => 1, (a: Int, b: Int) => a + b)
    val all    = tree.search((_, _) => true, (_, _) => true)(_ => ())
    val pruned = tree.search((_, _) => false, (_, _) => true)(_ => ())
    assert(all >= math.ceil(600.0 / ARTree.LeafCap).toInt / ARTree.Fanout && pruned == 0)
    assert(all <= 600)
  }

  test("degenerate point entries are handled") {
    val items = (0 until 40).map(i => (MBR.point(Array(i / 40.0, i / 40.0)), i))
    val tree  = ARTree.build(2, items)(_ => 1, (a: Int, b: Int) => a + b)
    val got   = collection.mutable.Set.empty[Int]
    tree.search((m, _) => m.containsPoint(Array(0.5, 0.5)), (m, _) => m.containsPoint(Array(0.5, 0.5)))(got += _)
    assert(got == Set(20))
  }
}
