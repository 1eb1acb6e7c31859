package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.dynamic.EditBatch
import repro.graph.{GraphGen, GraphOps, LocalGraph}

class SparkCorrectionSpec extends AnyFunSuite with SparkSpec {

  private def runBoth(g0: LocalGraph, g1: LocalGraph, T: Int, seed: Long, epoch: Long) = {
    val localSt = LocalRSLPA.propagate(g0, T, seed)
    LocalIncremental.update(g0, g1, localSt, seed, epoch)

    val sc = spark.sparkContext
    val distSt0 = SparkRSLPA.propagate(GraphOps.adjacencyRDD(sc, g0), T, seed)
    val (distSt, stats) = SparkCorrection.update(
      distSt0, GraphOps.adjacencyRDD(sc, g1), T, seed, epoch)
    (localSt, distSt.collect().toMap, stats)
  }

  private def assertMatches(local: RslpaState, dist: Map[Long, SparkRSLPA.RVState]): Unit = {
    for (i <- 0 until local.n) {
      val d = dist(i.toLong)
      assert(d.labels.toSeq == local.labels(i).toSeq, s"labels differ at $i")
      assert(d.srcs.drop(1).map(_.toInt).toSeq == local.srcs(i).drop(1).toSeq, s"srcs differ at $i")
      assert(d.poss.drop(1).toSeq == local.poss(i).drop(1).toSeq, s"poss differ at $i")
      for (p <- 0 until d.recv.length) {
        val dr = d.recv(p).map { case (tar, k) => (tar.toInt, k) }.toSet
        assert(dr == local.recv(i)(p).toSet, s"recv differ at ($i,$p)")
      }
    }
  }

  test("spark correction matches local incremental on a hand-made edit") {
    val g0 = LocalGraph.fromEdges(5, Seq((0, 1), (1, 2), (2, 3), (3, 4), (0, 2)))
    val g1 = g0.edited(Seq((1, 4)), Seq((2, 3)))
    val (local, dist, stats) = runBoth(g0, g1, T = 8, seed = 31, epoch = 1)
    assertMatches(local, dist)
    assert(stats.repicked > 0)
  }

  for (seed <- Seq(3L, 4L)) {
    test(s"spark correction matches local on a random graph + batch (seed=$seed)") {
      val g0 = GraphGen.webGraphLocal(7, 300, seed = seed)._2
      val batch = EditBatch.halfAndHalf(g0, 30, seed = seed * 7)
      val g1 = g0.edited(batch.insertions, batch.deletions)
      val (local, dist, _) = runBoth(g0, g1, T = 10, seed = seed * 11, epoch = 2)
      assertMatches(local, dist)
    }
  }

  test("spark correction with an empty batch is a no-op") {
    val g0 = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3)))
    val (local, dist, stats) = runBoth(g0, g0, T = 6, seed = 32, epoch = 1)
    assert(stats.repicked == 0 && stats.corrected == 0)
    assertMatches(local, dist)
  }

  test("spark correction handles vertices becoming isolated") {
    val g0 = LocalGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3), (0, 2)))
    val g1 = g0.edited(Nil, Seq((0, 1), (0, 2)))
    val (local, dist, _) = runBoth(g0, g1, T = 7, seed = 33, epoch = 1)
    assertMatches(local, dist)
    assert(dist(0L).labels.forall(_ == 0L))
  }

  test("spark correction invariants hold on the new graph") {
    val g0 = GraphGen.webGraphLocal(6, 150, seed = 8)._2
    val batch = EditBatch.halfAndHalf(g0, 20, seed = 9)
    val g1 = g0.edited(batch.insertions, batch.deletions)
    val (_, dist, _) = runBoth(g0, g1, T = 8, seed = 35, epoch = 1)
    // Rebuild an RslpaState from the distributed result and check it.
    val st = new RslpaState(
      g1.n, 8,
      Array.tabulate(g1.n)(i => dist(i.toLong).labels),
      Array.tabulate(g1.n)(i => dist(i.toLong).srcs.map(_.toInt)),
      Array.tabulate(g1.n)(i => dist(i.toLong).poss),
      Array.tabulate(g1.n)(i => dist(i.toLong).recv.map(_.map { case (t, k) => (t.toInt, k) }))
    )
    val errs = st.checkInvariants(g1.adj)
    assert(errs.isEmpty, errs.take(5).mkString("; "))
  }
}
