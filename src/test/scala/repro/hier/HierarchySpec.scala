package repro.hier

import org.scalatest.funsuite.AnyFunSuite
import repro.Fixtures

class HierarchySpec extends AnyFunSuite {
  private val h = Fixtures.geo

  test("depth of root is 0 and grows by 1 per level") {
    assert(h.depth(0) == 0)
    assert(h.depth(Fixtures.USA) == 1)
    assert(h.depth(Fixtures.NY) == 2)
    assert(h.depth(Fixtures.LibertyIsland) == 3)
  }

  test("height is the max depth") { assert(h.height == 3) }

  test("ancestors returns the path to the root") {
    assert(h.ancestors(Fixtures.LibertyIsland) == List(Fixtures.NY, Fixtures.USA, 0))
    assert(h.ancestors(0) == Nil)
  }

  test("ancestorsNoRoot excludes the root") {
    assert(h.ancestorsNoRoot(Fixtures.LibertyIsland) == List(Fixtures.NY, Fixtures.USA))
    assert(h.ancestorsNoRoot(Fixtures.USA) == Nil)
  }

  test("isAncestor agrees with ancestors()") {
    for (a <- 0 until h.size; d <- 0 until h.size)
      assert(h.isAncestor(a, d) == h.ancestors(d).contains(a), s"a=$a d=$d")
  }

  test("isAncestor is irreflexive and antisymmetric") {
    for (v <- 0 until h.size) assert(!h.isAncestor(v, v))
    for (a <- 0 until h.size; d <- 0 until h.size if h.isAncestor(a, d))
      assert(!h.isAncestor(d, a))
  }

  test("lca of NY and LA is USA; of LibertyIsland and London is the root") {
    assert(h.lca(Fixtures.NY, Fixtures.LA) == Fixtures.USA)
    assert(h.lca(Fixtures.LibertyIsland, Fixtures.London) == 0)
  }

  test("lca with self and with ancestor") {
    assert(h.lca(Fixtures.NY, Fixtures.NY) == Fixtures.NY)
    assert(h.lca(Fixtures.USA, Fixtures.LibertyIsland) == Fixtures.USA)
  }

  test("distance examples") {
    assert(h.distance(Fixtures.LibertyIsland, Fixtures.LibertyIsland) == 0)
    assert(h.distance(Fixtures.LibertyIsland, Fixtures.NY) == 1)
    assert(h.distance(Fixtures.NY, Fixtures.LA) == 3) // NY -> USA -> CA -> LA
    assert(h.distance(Fixtures.London, Fixtures.Manchester) == 2)
  }

  test("distance is symmetric and satisfies the triangle inequality") {
    for (a <- 0 until h.size; b <- 0 until h.size) {
      assert(h.distance(a, b) == h.distance(b, a))
      for (c <- 0 until h.size)
        assert(h.distance(a, b) + h.distance(b, c) >= h.distance(a, c))
    }
  }

  test("children adjacency is consistent with parent") {
    for (p <- 0 until h.size; c <- h.children(p)) assert(h.parent(c) == p)
    assert(h.children.map(_.length).sum == h.size - 1)
  }

  test("leaves have no children") {
    assert(h.leaves.toSet == Set(Fixtures.LibertyIsland, Fixtures.LA, Fixtures.London, Fixtures.Manchester))
  }

  test("root 0 must exist and parent arrays are validated") {
    intercept[IllegalArgumentException](Hierarchy.fromParents(Array(0)))
    intercept[IllegalArgumentException](new Hierarchy(Array(-1), Array.empty[String]))
  }

  test("randomTree: node count is close to target and height is exact") {
    for (n <- Seq(50, 200, 1000, 3000); height <- 3 to 6; seed <- 0L to 2L) {
      val t = Hierarchy.randomTree(n, height, seed)
      assert(math.abs(t.size - n) <= math.max(4, n / 10), s"size=${t.size} target=$n h=$height seed=$seed")
      assert(t.height == height, s"height=${t.height} wanted=$height n=$n seed=$seed")
    }
  }

  test("randomTree is deterministic in the seed") {
    val a = Hierarchy.randomTree(500, 5, 11)
    val b = Hierarchy.randomTree(500, 5, 11)
    assert(a.parent.sameElements(b.parent))
  }

  test("randomTree: every non-root node has a valid earlier parent") {
    val t = Hierarchy.randomTree(800, 5, 3)
    for (i <- 1 until t.size) assert(t.parent(i) >= 0 && t.parent(i) < i)
  }

  test("randomTree: depths never exceed the requested height") {
    for (n <- Seq(20, 100, 500); height <- 2 to 7; seed <- 0L to 3L) {
      val t = Hierarchy.randomTree(n, height, seed)
      assert(t.depth.max <= height)
    }
  }

  test("nodesAtDepth partitions the tree") {
    val t = Hierarchy.randomTree(300, 4, 9)
    assert((0 to t.height).map(t.nodesAtDepth(_).length).sum == t.size)
  }
}
