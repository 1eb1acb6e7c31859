package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, GraphOps, LocalGraph}

class SparkPostProcessSpec extends AnyFunSuite with SparkSpec {

  private lazy val g = GraphGen.webGraphLocal(6, 150, seed = 70)._2
  private lazy val localSt = LocalRSLPA.propagate(g, T = 12, seed = 71)
  private def sc = spark.sparkContext

  private def labelsRDD = sc.parallelize(
    (0 until g.n).map(i => (i.toLong, localSt.labels(i))))

  test("spark edge weights match the local computation") {
    val dist = SparkPostProcess.edgeWeights(labelsRDD, GraphOps.edgesRDD(sc, g), memLen = 13)
      .collect().toMap
    val local = PostProcess.edgeWeights(g, localSt.labels)
    assert(dist.size == local.size)
    local.foreach { case ((u, v), w) =>
      assert(math.abs(dist((u.toLong, v.toLong)) - w) < 1e-12, s"weight differs at ($u,$v)")
    }
  }

  test("DataFrame edge weights agree with DuckDB (Oracle)") {
    import spark.implicits._
    val labelRows = for {
      i <- 0 until g.n; l <- localSt.labels(i)
    } yield (i.toLong, l)
    val labelsDF = labelRows.toDF("vid", "label")
    val edgesDF = g.edges.map { case (u, v) => (u.toLong, v.toLong) }.toDF("u", "v")
    val got = SparkPostProcess.edgeWeightsDF(labelsDF, edgesDF, memLen = 13)
    Oracle.assertEquivalent(
      got,
      """SELECT e.u AS u, e.v AS v,
        |       SUM(cu.cnt * cv.cnt) / (13.0 * 13.0) AS w
        |FROM edges e
        |JOIN (SELECT vid, label, COUNT(*) AS cnt FROM labels GROUP BY vid, label) cu
        |  ON cu.vid = e.u
        |JOIN (SELECT vid, label, COUNT(*) AS cnt FROM labels GROUP BY vid, label) cv
        |  ON cv.vid = e.v AND cv.label = cu.label
        |GROUP BY e.u, e.v""".stripMargin,
      "labels" -> labelsDF, "edges" -> edgesDF
    )
  }

  test("spark tau2 matches local tau2") {
    val w = SparkPostProcess.edgeWeights(labelsRDD, GraphOps.edgesRDD(sc, g), 13)
    val localW = PostProcess.edgeWeights(g, localSt.labels)
    assert(math.abs(SparkPostProcess.chooseTau2(w) - PostProcess.chooseTau2(g, localW)) < 1e-12)
  }

  test("spark community sizes at a threshold match local components") {
    val w = SparkPostProcess.edgeWeights(labelsRDD, GraphOps.edgesRDD(sc, g), 13)
    val localW = PostProcess.edgeWeights(g, localSt.labels)
    val tau = PostProcess.chooseTau2(g, localW).max(0.05)
    val distSizes = SparkPostProcess.communitySizesAt(w, tau).values.toSeq.sorted
    val localSizes = PostProcess.componentsAt(g, localW, tau).map(_.size).sorted
    assert(distSizes == localSizes)
  }

  test("spark extract yields a cover consistent with local extractAt") {
    val w = SparkPostProcess.edgeWeights(labelsRDD, GraphOps.edgesRDD(sc, g), 13)
    val cover = SparkPostProcess.extract(labelsRDD, GraphOps.edgesRDD(sc, g), 13, nCandidates = 6)
    val localW = PostProcess.edgeWeights(g, localSt.labels)
    val localCover = PostProcess.extractAt(g, localW, cover.tau1, cover.tau2)
    val distCover = cover.assignments.collect()
      .groupBy(_._2).values.map(_.map(_._1.toInt).toSet).toSet
    assert(distCover == localCover.toSet,
      s"covers differ: dist=${distCover.size} local=${localCover.size} communities")
  }

  test("extract on a graph with no edges returns an empty cover") {
    val iso = LocalGraph.fromEdges(3, Nil)
    val lbls = sc.parallelize(Seq((0L, Array(0L)), (1L, Array(1L)), (2L, Array(2L))))
    val cover = SparkPostProcess.extract(lbls, sc.emptyRDD[(Long, Long)], 1)
    assert(cover.assignments.isEmpty())
  }
}
