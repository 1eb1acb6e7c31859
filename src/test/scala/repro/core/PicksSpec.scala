package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the canonical random decisions, including empirical
  * verification of the paper's Theorems 2–5.
  */
class PicksSpec extends AnyFunSuite {

  test("pickIdx self-picks for degree 0") {
    assert(Picks.pickIdx(0, 5L, 3, seed = 1) == (-1, 0))
  }

  test("pickIdx stays within bounds") {
    for (s <- 0 until 200) {
      val (idx, pos) = Picks.pickIdx(deg = 7, vid = 3, t = 5, seed = s)
      assert(idx >= 0 && idx < 7 && pos >= 0 && pos < 5)
    }
  }

  test("pickIdx is deterministic") {
    assert(Picks.pickIdx(4, 2, 3, 99) == Picks.pickIdx(4, 2, 3, 99))
  }

  test("pickIdx index is uniform over neighbors") {
    val counts = new Array[Int](4)
    (0 until 8000).foreach { s => counts(Picks.pickIdx(4, 1, 2, s)._1) += 1 }
    counts.foreach(c => assert(math.abs(c - 2000) < 300, s"neighbor pick biased: ${counts.toSeq}"))
  }

  test("pickIdx position is uniform over [0, t)") {
    val counts = new Array[Int](5)
    (0 until 10000).foreach { s => counts(Picks.pickIdx(3, 1, 5, s)._2) += 1 }
    counts.foreach(c => assert(math.abs(c - 2000) < 300, s"position pick biased: ${counts.toSeq}"))
  }

  test("Theorem 3: (src,pos) sampling hits each label proportional to union frequency") {
    // Neighbor memories: L_1=(1,1), L_2=(1,2), L_3=(3,2). Union frequencies:
    // label 1: 3/6, label 2: 2/6, label 3: 1/6.
    val mems = Map(10L -> Array(1L, 1L), 11L -> Array(1L, 2L), 12L -> Array(3L, 2L))
    val nbrs = Array(10L, 11L, 12L)
    val counts = scala.collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    val trials = 30000
    (0 until trials).foreach { s =>
      val (idx, pos) = Picks.pickIdx(3, 7L, 2, seed = s)
      counts(mems(nbrs(idx))(pos)) += 1
    }
    assert(math.abs(counts(1L).toDouble / trials - 0.5) < 0.02)
    assert(math.abs(counts(2L).toDouble / trials - 1.0 / 3) < 0.02)
    assert(math.abs(counts(3L).toDouble / trials - 1.0 / 6) < 0.02)
  }

  test("repick: Category 1 (unchanged) keeps everything") {
    val adj = Array(1L, 2L, 3L)
    (0 until 50).foreach { s =>
      assert(Picks.repick(adj, adj, 0L, 4, curSrc = 2L, seed = s, epoch = 1).isEmpty)
    }
  }

  test("repick: Category 2 keeps picks whose source edge survives") {
    val oldAdj = Array(1L, 2L, 3L); val newAdj = Array(1L, 3L) // lost 2
    (0 until 50).foreach { s =>
      assert(Picks.repick(oldAdj, newAdj, 0L, 4, curSrc = 3L, seed = s, epoch = 1).isEmpty)
    }
  }

  test("repick: Category 2 re-picks when the source edge was deleted") {
    val oldAdj = Array(1L, 2L, 3L); val newAdj = Array(1L, 3L)
    (0 until 50).foreach { s =>
      val r = Picks.repick(oldAdj, newAdj, 0L, 4, curSrc = 2L, seed = s, epoch = 1)
      assert(r.isDefined)
      val (src, pos) = r.get
      assert(newAdj.contains(src) && pos >= 0 && pos < 4)
    }
  }

  test("repick: Category 2 re-pick source is uniform over the remaining neighbors (Theorem 4)") {
    val oldAdj = Array(1L, 2L, 3L, 4L); val newAdj = Array(1L, 3L, 4L)
    val counts = scala.collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    val trials = 9000
    (0 until trials).foreach { s =>
      val Some((src, _)) = Picks.repick(oldAdj, newAdj, 0L, 3, curSrc = 2L, seed = s, epoch = 1)
      counts(src) += 1
    }
    newAdj.foreach { v =>
      assert(math.abs(counts(v).toDouble / trials - 1.0 / 3) < 0.03, s"src $v biased: $counts")
    }
  }

  test("repick: Category 3 keeps a surviving source with probability n_u/(n_u+n_a) (Theorem 5)") {
    val oldAdj = Array(1L, 2L); val newAdj = Array(1L, 2L, 3L, 4L) // n_u=2, n_a=2
    val trials = 10000
    var kept = 0
    val srcCounts = scala.collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    (0 until trials).foreach { s =>
      Picks.repick(oldAdj, newAdj, 0L, 3, curSrc = 1L, seed = s, epoch = 1) match {
        case None           => kept += 1
        case Some((src, _)) => srcCounts(src) += 1
      }
    }
    assert(math.abs(kept.toDouble / trials - 0.5) < 0.03, s"keep rate ${kept.toDouble / trials}")
    // Re-picks must land on the *new* neighbors only, uniformly.
    assert(srcCounts.keySet.subsetOf(Set(3L, 4L)))
    assert(math.abs(srcCounts(3L).toDouble / (trials - kept) - 0.5) < 0.05)
  }

  test("repick: Category 3 with deleted source re-picks over all current neighbors") {
    val oldAdj = Array(1L, 2L); val newAdj = Array(2L, 3L, 4L) // 1 deleted, 3/4 added
    val counts = scala.collection.mutable.Map.empty[Long, Int].withDefaultValue(0)
    val trials = 9000
    (0 until trials).foreach { s =>
      val r = Picks.repick(oldAdj, newAdj, 0L, 3, curSrc = 1L, seed = s, epoch = 1)
      assert(r.isDefined)
      counts(r.get._1) += 1
    }
    newAdj.foreach { v =>
      assert(math.abs(counts(v).toDouble / trials - 1.0 / 3) < 0.03, s"src $v biased: $counts")
    }
  }

  test("repick: previously isolated vertex re-picks from its new neighbors") {
    val r = Picks.repick(Array.empty[Long], Array(5L, 6L), 0L, 2, curSrc = 0L, seed = 3, epoch = 1)
    assert(r.isDefined && Set(5L, 6L).contains(r.get._1))
  }

  test("repick: vertex that became isolated self-picks") {
    val r = Picks.repick(Array(5L), Array.empty[Long], 0L, 2, curSrc = 5L, seed = 3, epoch = 1)
    assert(r.contains((0L, 0)))
  }

  test("repick: still-isolated vertex keeps its self-pick") {
    assert(Picks.repick(Array.empty[Long], Array.empty[Long], 0L, 2, 0L, 3, 1).isEmpty)
  }

  test("repick decisions differ across epochs") {
    val oldAdj = Array(1L, 2L, 3L); val newAdj = Array(1L, 3L)
    val d1 = (0 until 100).map(s => Picks.repick(oldAdj, newAdj, 0L, 9, 2L, s, epoch = 1))
    val d2 = (0 until 100).map(s => Picks.repick(oldAdj, newAdj, 0L, 9, 2L, s, epoch = 2))
    assert(d1 != d2)
  }
}
