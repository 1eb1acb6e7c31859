package repro.slpa

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.graph.{GraphGen, GraphOps, LocalGraph}

class SparkSLPASpec extends AnyFunSuite with SparkSpec {

  private def run(g: LocalGraph, T: Int, seed: Long): (Seq[Seq[Long]], Seq[Seq[Long]]) = {
    val local = LocalSLPA.propagate(g, T, seed).map(_.toSeq).toSeq
    val dist = SparkSLPA.propagate(GraphOps.adjacencyRDD(spark.sparkContext, g), T, seed)
      .collect().sortBy(_._1).map(_._2.toSeq).toSeq
    (local, dist)
  }

  test("spark SLPA is bit-identical to local SLPA on a small graph") {
    val g = LocalGraph.fromEdges(6, Seq((0, 1), (1, 2), (2, 0), (3, 4), (4, 5), (2, 3)))
    val (local, dist) = run(g, T = 8, seed = 42)
    assert(dist == local)
  }

  for (seed <- Seq(1L, 2L)) {
    test(s"spark SLPA matches local on a random power-law graph (seed=$seed)") {
      val g = GraphGen.webGraphLocal(7, 400, seed = seed)._2
      val (local, dist) = run(g, T = 6, seed = seed * 31)
      assert(dist == local)
    }
  }

  test("spark SLPA handles isolated vertices") {
    val g = LocalGraph.fromEdges(4, Seq((0, 1))) // vertices 2, 3 isolated
    val (local, dist) = run(g, T = 5, seed = 9)
    assert(dist == local)
    assert(dist(2).forall(_ == 2L) && dist(3).forall(_ == 3L))
  }

  test("spark SLPA memory length is T+1") {
    val g = LocalGraph.fromEdges(3, Seq((0, 1), (1, 2)))
    val dist = SparkSLPA.propagate(GraphOps.adjacencyRDD(spark.sparkContext, g), 12, 3)
      .collect()
    dist.foreach { case (_, mem) => assert(mem.length == 13) }
  }
}
