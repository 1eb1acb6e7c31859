package repro.slpa

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.LocalGraph
import repro.lfr.{LFRGenerator, LFRParams}
import repro.metrics.OverlappingNMI

class LocalSLPASpec extends AnyFunSuite {

  private def twoCliques: LocalGraph = {
    val a = for (i <- 0 until 5; j <- i + 1 until 5) yield (i, j)
    val b = for (i <- 5 until 10; j <- i + 1 until 10) yield (i, j)
    LocalGraph.fromEdges(10, a ++ b :+ (4, 5))
  }

  test("memories have length T+1 and start with the own id") {
    val g = twoCliques
    val mem = LocalSLPA.propagate(g, T = 7, seed = 1)
    assert(mem.length == 10)
    mem.zipWithIndex.foreach { case (m, i) =>
      assert(m.length == 8)
      assert(m(0) == i.toLong)
    }
  }

  test("propagation is deterministic in seed") {
    val g = twoCliques
    val a = LocalSLPA.propagate(g, 10, seed = 2).map(_.toSeq).toSeq
    val b = LocalSLPA.propagate(g, 10, seed = 2).map(_.toSeq).toSeq
    val c = LocalSLPA.propagate(g, 10, seed = 3).map(_.toSeq).toSeq
    assert(a == b)
    assert(a != c)
  }

  test("labels only come from the graph's vertex ids") {
    val g = twoCliques
    val mem = LocalSLPA.propagate(g, 20, seed = 4)
    mem.foreach(_.foreach(l => assert(l >= 0 && l < 10)))
  }

  test("an isolated vertex keeps its own label forever") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1)))
    val mem = LocalSLPA.propagate(g, 5, seed = 5)
    assert(mem(2).forall(_ == 2L))
  }

  test("selectLabel picks the unique plurality label") {
    assert(LocalSLPA.selectLabel(0, 1, Seq(7L, 7L, 3L), seed = 6) == 7L)
  }

  test("selectLabel tie-break is uniform over the tied labels") {
    val picks = (0 until 4000).map(s => LocalSLPA.selectLabel(0, 1, Seq(1L, 2L), seed = s))
    val ones = picks.count(_ == 1L)
    assert(ones > 1700 && ones < 2300, s"tie-break biased: $ones/4000")
    assert(picks.toSet == Set(1L, 2L))
  }

  test("selectLabel with no messages returns the own id") {
    assert(LocalSLPA.selectLabel(9, 1, Nil, seed = 7) == 9L)
  }

  test("two cliques converge to two communities") {
    val covers = (0 until 5).map { s =>
      LocalSLPA.detect(twoCliques, T = 50, tau = 0.2, seed = 100 + s)
    }
    // In most runs the two 5-cliques are separated (the bridge may merge them occasionally).
    val good = covers.count { c =>
      c.exists(comm => Set(0, 1, 2, 3).subsetOf(comm)) &&
      c.exists(comm => Set(6, 7, 8, 9).subsetOf(comm))
    }
    assert(good >= 3, s"cliques recovered in only $good/5 runs")
  }

  test("threshold drops rare labels") {
    val mem = Array(
      Array(0L, 0L, 0L, 1L),
      Array(0L, 0L, 0L, 0L),
      Array(0L, 0L, 2L, 0L)
    )
    val cover = LocalSLPA.threshold(mem, tau = 0.5)
    assert(cover == Vector(Set(0, 1, 2))) // only label 0 survives anywhere
  }

  test("threshold keeps the most frequent label when all fall below tau") {
    val mem = Array(Array(5L, 5L, 6L, 7L), Array(5L, 5L, 3L, 2L))
    val cover = LocalSLPA.threshold(mem, tau = 0.9)
    assert(cover == Vector(Set(0, 1))) // fallback: plurality label 5 on both
  }

  test("threshold drops singleton communities") {
    val mem = Array(Array(0L, 0L), Array(1L, 1L))
    assert(LocalSLPA.threshold(mem, tau = 0.2).isEmpty)
  }

  test("nested communities are removed") {
    val mem = Array(
      Array(0L, 0L, 1L, 1L), // retains {0, 1}
      Array(0L, 0L, 1L, 1L),
      Array(0L, 0L, 0L, 0L)  // retains {0}
    )
    val cover = LocalSLPA.threshold(mem, tau = 0.4)
    // label 0 -> {0,1,2}; label 1 -> {0,1} ⊂ {0,1,2} removed.
    assert(cover == Vector(Set(0, 1, 2)))
  }

  test("SLPA recovers planted LFR communities with decent NMI") {
    val inst = LFRGenerator.generate(
      LFRParams(n = 500, avgDeg = 16, maxDeg = 40, mu = 0.1, on = 25, om = 2, seed = 5))
    val cover = LocalSLPA.detect(inst.graph, T = 100, tau = 0.2, seed = 8)
    val nmi = OverlappingNMI.score(cover.map(_.toSet), inst.communities, inst.graph.n)
    assert(nmi > 0.5, s"NMI too low: $nmi")
  }
}
