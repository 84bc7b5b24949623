package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Connected-component decomposition tests (used by the plan finder to
  * keep the valid-plan lattice tractable without losing optimality).
  */
class ComponentsSpec extends AnyFunSuite {
  import PaperFixtures._

  test("Fig 4 graph has two components: {p1..p6} and {p7}") {
    val comps = figure4Graph.components.map(_.map(figure4Graph.vertices(_).pattern).toSet)
    assert(comps.size == 2)
    assert(comps.contains(Set(p7)))
    assert(comps.contains(Set(p1, p2, p3, p4, p5, p6)))
  }

  test("components partition the vertex set") {
    for (seed <- 0L until 20L) {
      val g = RandomGraphs.graph(seed, numQueries = 6 + (seed % 6).toInt)
      val comps = g.components
      assert(comps.flatten.sorted == g.vertices.indices.toVector, s"seed=$seed")
    }
  }

  test("no edges cross components") {
    for (seed <- 0L until 20L) {
      val g = RandomGraphs.graph(seed, numQueries = 6 + (seed % 6).toInt)
      val compOf = g.components.zipWithIndex
        .flatMap { case (c, i) => c.map(_ -> i) }.toMap
      for (v <- g.vertices.indices; n <- g.neighbors(v))
        assert(compOf(v) == compOf(n), s"seed=$seed")
    }
  }

  test("per-component optimization equals global optimization") {
    for (seed <- 0L until 15L) {
      val g = RandomGraphs.graph(seed, numQueries = 6, numTypes = 8)
      if (g.size > 0 && g.size <= 16) {
        val global = RandomGraphs.bruteForceOpt(g)
        val perComp = g.components
          .map(c => RandomGraphs.bruteForceOpt(g.inducedOn(c))).sum
        assert(math.abs(global - perComp) < 1e-9, s"seed=$seed")
      }
    }
  }

  test("empty graph has no components") {
    assert(SharonGraph(Vector.empty, Vector.empty).components.isEmpty)
  }
}
