package repro.dynamic

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphGen, LocalGraph}

class EditBatchSpec extends AnyFunSuite {

  private lazy val g = GraphGen.webGraphLocal(8, 800, seed = 30)._2

  test("uniform produces the requested counts") {
    val b = EditBatch.uniform(g, nInsert = 10, nDelete = 15, seed = 1)
    assert(b.insertions.size == 10 && b.deletions.size == 15 && b.size == 25)
  }

  test("deletions are existing edges") {
    val b = EditBatch.uniform(g, 5, 20, seed = 2)
    b.deletions.foreach { case (u, v) => assert(g.hasEdge(u, v)) }
  }

  test("insertions are absent pairs without self-loops") {
    val b = EditBatch.uniform(g, 20, 5, seed = 3)
    b.insertions.foreach { case (u, v) =>
      assert(u != v && !g.hasEdge(u, v) && u < v)
    }
  }

  test("deletions are distinct; insertions are distinct") {
    val b = EditBatch.uniform(g, 30, 30, seed = 4)
    assert(b.deletions.distinct.size == 30)
    assert(b.insertions.distinct.size == 30)
  }

  test("deterministic in seed") {
    val a = EditBatch.uniform(g, 10, 10, seed = 5)
    val b = EditBatch.uniform(g, 10, 10, seed = 5)
    val c = EditBatch.uniform(g, 10, 10, seed = 6)
    assert(a == b)
    assert(a != c)
  }

  test("halfAndHalf splits the batch") {
    val b = EditBatch.halfAndHalf(g, 31, seed = 7)
    assert(b.insertions.size == 15 && b.deletions.size == 16)
  }

  test("applying a batch yields the expected edge count") {
    val b = EditBatch.halfAndHalf(g, 40, seed = 8)
    val g2 = g.edited(b.insertions, b.deletions)
    assert(g2.numEdges == g.numEdges + b.insertions.size - b.deletions.size)
  }

  test("cannot delete more edges than exist") {
    val tiny = LocalGraph.fromEdges(3, Seq((0, 1)))
    intercept[IllegalArgumentException](EditBatch.uniform(tiny, 0, 2, seed = 9))
  }

  test("fails cleanly when the graph is too dense to insert") {
    val k3 = LocalGraph.fromEdges(3, Seq((0, 1), (0, 2), (1, 2)))
    intercept[IllegalArgumentException](EditBatch.uniform(k3, 1, 0, seed = 10))
  }

  test("deletion sampling is roughly uniform over edges") {
    val tri = LocalGraph.fromEdges(4, Seq((0, 1), (0, 2), (1, 2), (2, 3)))
    val hits = scala.collection.mutable.Map.empty[(Int, Int), Int].withDefaultValue(0)
    (0 until 2000).foreach { s =>
      val b = EditBatch.uniform(tri, 0, 1, seed = s)
      hits(b.deletions.head) += 1
    }
    // 4 edges, 2000 draws: each should get ~500.
    hits.values.foreach(c => assert(math.abs(c - 500) < 120, s"count $c too far from 500"))
    assert(hits.size == 4)
  }
}
