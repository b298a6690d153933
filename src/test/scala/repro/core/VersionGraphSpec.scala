package repro.core

import org.scalatest.funsuite.AnyFunSuite

import scala.util.Random

class VersionGraphSpec extends AnyFunSuite {

  private def randomTree(n: Int, seed: Long): VersionTree = {
    val rnd = new Random(seed)
    new VersionTree(Array.tabulate(n)(v => if (v == 0) -1 else rnd.nextInt(v)))
  }

  test("chain has depth equal to position+1") {
    val t = VersionTree.chain(10)
    assert(t.depth.toSeq == (1 to 10))
    assert(t.avgDepth == 5.5)
  }

  test("chain children link each version to the next") {
    val t = VersionTree.chain(5)
    assert(t.children(0) == List(1))
    assert(t.children(4) == Nil)
    assert(t.isLeaf(4) && !t.isLeaf(0))
  }

  test("rejects a root with a parent") {
    intercept[IllegalArgumentException](new VersionTree(Array(0)))
  }

  test("rejects forward parent references") {
    intercept[IllegalArgumentException](new VersionTree(Array(-1, 2, 1)))
  }

  for (seed <- 1 to 5) {
    test(s"bfs order visits parents before children (seed=$seed)") {
      val t = randomTree(50, seed)
      val pos = t.bfsOrder.zipWithIndex.toMap
      (1 until t.size).foreach(v => assert(pos(t.parent(v)) < pos(v)))
      assert(t.bfsOrder.sorted.toSeq == (0 until 50))
    }

    test(s"dfs order visits parents before children and keeps subtrees contiguous (seed=$seed)") {
      val t = randomTree(50, seed)
      val order = t.dfsOrder
      val pos = order.zipWithIndex.toMap
      (1 until t.size).foreach(v => assert(pos(t.parent(v)) < pos(v)))
      // subtree contiguity: all descendants of v occupy consecutive positions after v
      def subtreeSize(v: Int): Int = 1 + t.children(v).map(subtreeSize).sum
      (0 until t.size).foreach { v =>
        val s = subtreeSize(v)
        val inSub = order.slice(pos(v), pos(v) + s).toSet
        def collect(u: Int): Set[Int] = t.children(u).flatMap(collect).toSet + u
        assert(inSub == collect(v))
      }
    }

    test(s"post order visits all children before the parent (seed=$seed)") {
      val t = randomTree(50, seed)
      val pos = t.postOrder.zipWithIndex.toMap
      (1 until t.size).foreach(v => assert(pos(t.parent(v)) > pos(v)))
      assert(t.postOrder.sorted.toSeq == (0 until 50))
    }

    test(s"bfs order is monotone in depth (seed=$seed)") {
      val t = randomTree(40, seed)
      val depths = t.bfsOrder.map(t.depth)
      assert(depths.zip(depths.tail).forall { case (a, b) => a <= b })
    }
  }

  test("pathFromRoot walks root to node inclusive") {
    val t = VersionTree(-1, 0, 1, 1, 3)
    assert(t.pathFromRoot(4) == List(0, 1, 3, 4))
    assert(t.pathFromRoot(0) == List(0))
    assert(t.pathFromRoot(2) == List(0, 1, 2))
  }

  test("avgDepth on a star is close to 2") {
    val t = new VersionTree(Array(-1) ++ Array.fill(9)(0))
    assert(math.abs(t.avgDepth - (1 + 9 * 2) / 10.0) < 1e-9)
  }

  test("VersionDag.toTree keeps the first parent of a merge (Fig 4)") {
    // V8 merges V5, V6, V7 (listed with V6 first as the kept parent)
    val dag = new VersionDag(Array(
      Nil, List(0), List(0), List(1), List(1), List(2), List(3), List(4),
      List(6, 5, 7)))
    val (tree, dropped) = dag.toTree
    assert(tree.parent(8) == 6)
    assert(dropped(8) == List(5, 7))
    assert(dropped(3) == Nil)
  }

  test("VersionDag rejects a parentless non-root") {
    intercept[IllegalArgumentException](new VersionDag(Array(Nil, Nil)))
  }
}
