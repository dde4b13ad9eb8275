package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph, Reorder}

class ColoringSpec extends AnyFunSuite {

  test("K_n needs exactly n colors") {
    for (n <- 2 to 7) {
      val g = LocalGraph.complete(n)
      val (colors, k) = Coloring.greedy(g, Array.range(0, n))
      assert(k == n)
      assert(Coloring.isValid(g, colors))
    }
  }

  test("even cycle: 2 colors along the natural order") {
    val g = LocalGraph.cycle(8)
    val (colors, k) = Coloring.greedy(g, Array.range(0, 8))
    assert(Coloring.isValid(g, colors))
    assert(k <= 3)
  }

  test("path is 2-colorable greedily") {
    val g = LocalGraph.path(9)
    val (colors, k) = Coloring.greedy(g, Array.range(0, 9))
    assert(k == 2 && Coloring.isValid(g, colors))
  }

  for (seed <- 1 to 5) {
    test(s"greedy along any order is valid (ER seed=$seed)") {
      val g = GraphGen.erLocal(50, 0.15, seed)
      val rnd = new scala.util.Random(seed)
      val rank = rnd.shuffle((0 until 50).toList).toArray
      val (colors, _) = Coloring.greedy(g, rank)
      assert(Coloring.isValid(g, colors))
    }
  }

  for (seed <- 1 to 5) {
    test(s"reverse degeneracy order uses ≤ d+1 colors (ER seed=$seed)") {
      val g = GraphGen.erLocal(60, 0.12, seed + 100)
      val (rank, _, d) = Reorder.degeneracyLocal(g)
      val (colors, k) = Coloring.greedyReverse(g, rank)
      assert(Coloring.isValid(g, colors))
      assert(k <= d + 1, s"k=$k d=$d")
    }
  }

  test("star: reverse degeneracy colors with 2 (hub last removed, colored first)") {
    val g = LocalGraph.star(10)
    val (rank, _, _) = Reorder.degeneracyLocal(g)
    val (colors, k) = Coloring.greedyReverse(g, rank)
    assert(k == 2 && Coloring.isValid(g, colors))
  }
}
