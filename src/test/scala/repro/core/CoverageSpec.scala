package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.{Oracle, SparkSpec}

class CoverageSpec extends AnyFunSuite with SparkSpec {

  private val sets: IndexedSeq[Array[Int]] = IndexedSeq(
    Array(0, 1, 2), Array(1, 2), Array(2, 3), Array(4), Array(2))

  test("counts tallies membership") {
    val c = Coverage.counts(5, sets)
    assert(c.toSeq == Seq(1, 2, 4, 1, 1))
  }

  test("counts on empty input is all zeros") {
    assert(Coverage.counts(3, Seq.empty).toSeq == Seq(0, 0, 0))
  }

  test("topNode returns the argmax") {
    val (v, c) = Coverage.topNode(Coverage.counts(5, sets))
    assert(v == 2 && c == 4)
  }

  test("topNode respects eligibility") {
    val eligible = Array(true, true, false, true, true)
    val (v, c) = Coverage.topNode(Coverage.counts(5, sets), eligible)
    assert(v == 1 && c == 2)
  }

  test("topNode requires an eligible node") {
    intercept[IllegalArgumentException](
      Coverage.topNode(Array(1, 2), Array(false, false)))
  }

  test("countsRDD matches driver counts") {
    assert(Coverage.countsRDD(spark, 5, sets).toSeq == Coverage.counts(5, sets).toSeq)
  }

  test("countsRDD on a larger random instance matches") {
    val rnd = new scala.util.Random(1)
    val big = IndexedSeq.fill(500)(Array.fill(rnd.nextInt(10) + 1)(rnd.nextInt(50)).distinct)
    assert(Coverage.countsRDD(spark, 50, big).toSeq == Coverage.counts(50, big).toSeq)
  }

  test("coverage counting agrees with the DuckDB oracle over the exploded relation") {
    val df = Coverage.setsDF(spark, sets)
    val sparkCounts = df.groupBy("node").count()
      .selectExpr("cast(node as int) as node", "cast(count as long) as cnt")
    Oracle.assertEquivalent(
      sparkCounts,
      "SELECT CAST(node AS INT) AS node, count(*) AS cnt FROM sets GROUP BY 1",
      "sets" -> df)
  }

  test("coveredBy counts sets intersecting the seed set") {
    assert(Coverage.coveredBy(sets, Array(2)) == 4)
    assert(Coverage.coveredBy(sets, Array(0, 4)) == 2)
    assert(Coverage.coveredBy(sets, Array.empty[Int]) == 0)
  }

  private def naiveGreedy(n: Int, ss: IndexedSeq[Array[Int]], b: Int): Seq[(Int, Int, Int)] = {
    val covered = scala.collection.mutable.Set.empty[Int]
    val picked = scala.collection.mutable.Set.empty[Int]
    val out = Seq.newBuilder[(Int, Int, Int)]
    var continue = true
    while (picked.size < b && continue) {
      val gains = (0 until n).filterNot(picked)
        .map(v => v -> ss.indices.count(i => !covered(i) && ss(i).contains(v)))
      val (v, g) = gains.maxBy { case (vv, gg) => (gg, -vv) }
      if (g == 0) continue = false
      else {
        picked += v
        ss.indices.foreach(i => if (ss(i).contains(v)) covered += i)
        out += ((v, g, covered.size))
      }
    }
    out.result()
  }

  test("greedySequence matches naive greedy on the fixture") {
    assert(Coverage.greedySequence(5, sets, 5) == naiveGreedy(5, sets, 5))
  }

  test("greedySequence matches naive greedy on random instances") {
    val rnd = new scala.util.Random(7)
    (0 until 5).foreach { trial =>
      val ss = IndexedSeq.fill(40)(Array.fill(rnd.nextInt(5) + 1)(rnd.nextInt(12)).distinct)
      val fast = Coverage.greedySequence(12, ss, 12)
      val slow = naiveGreedy(12, ss, 12)
      // Identical tie-breaking (gain desc, node id asc) → exact sequence match.
      assert(fast == slow, s"trial $trial: $fast vs $slow")
    }
  }

  test("greedySequence stops when everything is covered") {
    val ss = IndexedSeq(Array(0), Array(0, 1))
    val seq = Coverage.greedySequence(3, ss, 3)
    assert(seq.map(_._1) == Seq(0))
    assert(seq.head._3 == 2)
  }

  test("greedyCover respects the batch bound") {
    val (seeds, covered) = Coverage.greedyCover(5, sets, 2)
    assert(seeds.length == 2)
    assert(seeds.head == 2)
    assert(covered == Coverage.coveredBy(sets, seeds))
  }

  test("greedyCover achieves optimal coverage on a separable instance") {
    val ss = IndexedSeq(Array(0), Array(0), Array(1), Array(1), Array(2))
    val (seeds, covered) = Coverage.greedyCover(3, ss, 2)
    assert(seeds.toSet == Set(0, 1) && covered == 4)
  }

  test("greedy marginal gains are non-increasing") {
    val rnd = new scala.util.Random(11)
    val ss = IndexedSeq.fill(100)(Array.fill(rnd.nextInt(6) + 1)(rnd.nextInt(20)).distinct)
    val gains = Coverage.greedySequence(20, ss, 20).map(_._2)
    assert(gains.sliding(2).forall(p => p.length < 2 || p(0) >= p(1)), gains.mkString(","))
  }
}
