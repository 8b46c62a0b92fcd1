package repro.graph

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class CompactGraphSpec extends AnyFunSuite with SparkSpec {

  private val triangle = CompactGraph.fromEdges(3, Seq((0, 1, 0.5), (1, 2, 0.3), (2, 0, 0.9)))

  test("n and m are recorded") {
    assert(triangle.n == 3)
    assert(triangle.m == 3)
  }

  test("out-degrees match edge list") {
    assert((0 until 3).map(triangle.outDeg) == Seq(1, 1, 1))
  }

  test("in-degrees match edge list") {
    assert((0 until 3).map(triangle.inDeg) == Seq(1, 1, 1))
  }

  test("out adjacency iterates correct edges") {
    var seen = List.empty[(Int, Int)]
    triangle.foreachOutEdge(0)(e => seen ::= (triangle.srcs(e), triangle.dsts(e)))
    assert(seen == List((0, 1)))
  }

  test("in adjacency iterates correct edges") {
    var seen = List.empty[(Int, Int)]
    triangle.foreachInEdge(2)(e => seen ::= (triangle.srcs(e), triangle.dsts(e)))
    assert(seen == List((1, 2)))
  }

  test("probabilities preserved per edge") {
    assert(triangle.probs.toSeq == Seq(0.5, 0.3, 0.9))
  }

  test("multi-edge node adjacency is complete and id-ordered") {
    val g = CompactGraph.fromEdges(4, Seq((0, 3, 0.1), (1, 3, 0.2), (2, 3, 0.3), (3, 0, 0.4)))
    assert(g.inDeg(3) == 3)
    assert(g.inEdgesOf(3).toSeq == Seq(0, 1, 2)) // ascending edge ids
    assert(g.inEdgesOf(3).map(g.srcs).toSeq == Seq(0, 1, 2))
  }

  test("isolated nodes have zero degree") {
    val g = CompactGraph.fromEdges(5, Seq((0, 1, 1.0)))
    assert(g.outDeg(4) == 0 && g.inDeg(4) == 0)
    assert(g.outDeg(2) == 0 && g.inDeg(2) == 0)
  }

  test("fromEdges validates node range") {
    intercept[IllegalArgumentException](CompactGraph.fromEdges(2, Seq((0, 2, 0.5))))
    intercept[IllegalArgumentException](CompactGraph.fromEdges(2, Seq((-1, 0, 0.5))))
  }

  test("fromEdges validates probability range") {
    intercept[IllegalArgumentException](CompactGraph.fromEdges(2, Seq((0, 1, 1.5))))
    intercept[IllegalArgumentException](CompactGraph.fromEdges(2, Seq((0, 1, -0.1))))
  }

  test("weightedCascade assigns 1/indeg") {
    val g = CompactGraph.weightedCascade(3, Seq((0, 2), (1, 2), (2, 0)))
    val intoTwo = g.inEdgesOf(2).map(g.probs).toSeq
    assert(intoTwo == Seq(0.5, 0.5))
    assert(g.inEdgesOf(0).map(g.probs).toSeq == Seq(1.0))
  }

  test("weightedCascade probabilities into each node sum to 1") {
    val edges = Seq((0, 1), (2, 1), (3, 1), (1, 0), (3, 0))
    val g = CompactGraph.weightedCascade(4, edges)
    for (v <- Seq(0, 1)) {
      val sum = g.inEdgesOf(v).map(g.probs).sum
      assert(math.abs(sum - 1.0) < 1e-12, s"node $v sum=$sum")
    }
  }

  test("edgesDF round-trips the edge list") {
    val rows = triangle.edgesDF(spark).collect().map(r => (r.getInt(0), r.getInt(1), r.getDouble(2)))
    assert(rows.toSet == Set((0, 1, 0.5), (1, 2, 0.3), (2, 0, 0.9)))
  }

  test("fromDF compiles a DataFrame edge list with weighted cascade") {
    import spark.implicits._
    val df = Seq((0, 1), (2, 1)).toDF("src", "dst")
    val g = CompactGraph.fromDF(df, 3)
    assert(g.n == 3 && g.m == 2)
    assert(g.inEdgesOf(1).map(g.probs).toSeq == Seq(0.5, 0.5))
  }

  test("offsets are monotone and end at m") {
    val g = GraphGen.fig2
    assert(g.outOff.last == g.m && g.inOff.last == g.m)
    assert(g.outOff.sliding(2).forall(p => p(0) <= p(1)))
    assert(g.inOff.sliding(2).forall(p => p(0) <= p(1)))
  }

  test("graph is serializable (broadcastable)") {
    val out = new java.io.ObjectOutputStream(new java.io.ByteArrayOutputStream())
    out.writeObject(triangle) // throws if not serializable
    out.close()
  }
}
