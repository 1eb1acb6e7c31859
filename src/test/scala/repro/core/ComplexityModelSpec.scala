package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.dynamic.EditBatch
import repro.graph.GraphGen

class ComplexityModelSpec extends AnyFunSuite {

  test("pc is 0 for an empty batch") {
    assert(ComplexityModel.pc(1000, 0, 0) == 0.0)
  }

  test("pc equals the deletion fraction for deletion-only batches") {
    assert(math.abs(ComplexityModel.pc(1000, 100, 0) - 0.1) < 1e-12)
  }

  test("pc for insertion-only batches is the switch probability") {
    // m_a/(|E| + m_a) with no deletions.
    assert(math.abs(ComplexityModel.pc(900, 0, 100) - 0.1) < 1e-12)
  }

  test("pc lies in [0, 1] and grows with batch size") {
    val p1 = ComplexityModel.pc(10000, 50, 50)
    val p2 = ComplexityModel.pc(10000, 500, 500)
    assert(p1 > 0 && p2 < 1 && p2 > p1)
  }

  test("Q(0) = 1 and Q(1) = 1 - pc (Eq. 5)") {
    val q = ComplexityModel.qSeries(5, 0.2)
    assert(q(0) == 1.0)
    assert(math.abs(q(1) - 0.8) < 1e-12)
  }

  test("Q(t) is non-increasing in t (Eq. 9)") {
    val q = ComplexityModel.qSeries(50, 0.15)
    q.sliding(2).foreach { case Array(a, b) => assert(b <= a + 1e-15) }
  }

  test("Q(t) >= (1-pc)^t (Eq. 11)") {
    val pc = 0.3
    val q = ComplexityModel.qSeries(30, pc)
    (0 to 30).foreach(t => assert(q(t) >= math.pow(1 - pc, t) - 1e-12))
  }

  test("expected eta lies between the best and worst case bounds") {
    for (pc <- Seq(0.01, 0.1, 0.5); T <- Seq(10, 100)) {
      val e = ComplexityModel.expectedEta(T, 1000, pc)
      val lo = ComplexityModel.bestCaseEta(T, 1000, pc)
      val hi = ComplexityModel.worstCaseEta(T, 1000, pc)
      assert(lo <= e + 1e-9 && e <= hi + 1e-9, s"pc=$pc T=$T: lo=$lo e=$e hi=$hi")
    }
  }

  test("eta vanishes as the batch vanishes") {
    val e = ComplexityModel.expectedEta(100, 100000, ComplexityModel.pc(1000000, 1, 1))
    assert(e < 100000 * 100 * 0.01)
  }

  test("eta approaches T|V| for huge churn") {
    val e = ComplexityModel.expectedEta(100, 1000, 0.99)
    assert(e > 0.9 * 100 * 1000)
  }

  test("measured touched-label count falls inside the model's bounds") {
    val g = GraphGen.webGraphLocal(8, 1200, seed = 60)._2
    val T = 20
    for (batchSize <- Seq(20, 80)) {
      val st = LocalRSLPA.propagate(g, T, seed = 61)
      val batch = EditBatch.halfAndHalf(g, batchSize, seed = 62)
      val g1 = g.edited(batch.insertions, batch.deletions)
      val stats = LocalIncremental.update(g, g1, st, seed = 61, epoch = 1)
      val pc = ComplexityModel.pc(g.numEdges, batch.deletions.size, batch.insertions.size)
      val lo = ComplexityModel.bestCaseEta(T, g.n, pc)
      val hi = ComplexityModel.worstCaseEta(T, g.n, pc)
      // The measurement is one random draw; allow slack below the lower
      // bound (overlapping propagation paths shrink the touched set).
      assert(stats.touched <= hi * 1.5, s"batch=$batchSize touched=${stats.touched} hi=$hi")
      assert(stats.touched >= lo * 0.2, s"batch=$batchSize touched=${stats.touched} lo=$lo")
    }
  }
}
