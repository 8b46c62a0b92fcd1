package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}

/** A probabilistic directed social network in CSR form, broadcastable to tasks.
  *
  * Edges are indexed `0 until m`; `srcs(e) -> dsts(e)` carries propagation
  * probability `probs(e)`. Both an out-adjacency (forward propagation) and an
  * in-adjacency (reverse reachable sampling) view are materialized. For the LT
  * model the in-adjacency order of a node defines its live-edge choice order,
  * so it is kept deterministic (sorted by edge id).
  *
  * Node ids are dense `0 until n`. Graphs in this reproduction are at most a
  * few hundred thousand edges, so the CSR lives on the driver and is shipped
  * to executors via `SparkContext.broadcast`.
  */
final class CompactGraph(
    val n: Int,
    val srcs: Array[Int],
    val dsts: Array[Int],
    val probs: Array[Double],
    val outOff: Array[Int],
    val outEdge: Array[Int], // edge ids grouped by src
    val inOff: Array[Int],
    val inEdge: Array[Int] // edge ids grouped by dst
) extends Serializable {

  def m: Int = srcs.length

  def outDeg(v: Int): Int = outOff(v + 1) - outOff(v)
  def inDeg(v: Int): Int = inOff(v + 1) - inOff(v)

  /** Iterate edge ids leaving `v`. */
  @inline def foreachOutEdge(v: Int)(f: Int => Unit): Unit = {
    var i = outOff(v)
    while (i < outOff(v + 1)) { f(outEdge(i)); i += 1 }
  }

  /** Iterate edge ids entering `v`. */
  @inline def foreachInEdge(v: Int)(f: Int => Unit): Unit = {
    var i = inOff(v)
    while (i < inOff(v + 1)) { f(inEdge(i)); i += 1 }
  }

  /** In-edge ids of `v` in deterministic (edge-id) order — LT choice order. */
  def inEdgesOf(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(inEdge, inOff(v), inOff(v + 1))

  /** Edge list as a DataFrame (src, dst, p) for SQL-side checks and stats. */
  def edgesDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    (0 until m).map(e => (srcs(e), dsts(e), probs(e))).toDF("src", "dst", "p")
  }
}

object CompactGraph {

  /** Build from explicit weighted edges. Node ids must lie in [0, n). */
  def fromEdges(n: Int, edges: Seq[(Int, Int, Double)]): CompactGraph = {
    val m = edges.size
    val srcs = new Array[Int](m)
    val dsts = new Array[Int](m)
    val probs = new Array[Double](m)
    var e = 0
    edges.foreach { case (s, d, p) =>
      require(s >= 0 && s < n && d >= 0 && d < n, s"edge ($s,$d) out of range [0,$n)")
      require(p >= 0.0 && p <= 1.0, s"probability $p out of [0,1]")
      srcs(e) = s; dsts(e) = d; probs(e) = p; e += 1
    }
    val outOff = offsets(n, srcs)
    val outEdge = grouped(n, srcs, outOff)
    val inOff = offsets(n, dsts)
    val inEdge = grouped(n, dsts, inOff)
    new CompactGraph(n, srcs, dsts, probs, outOff, outEdge, inOff, inEdge)
  }

  /** Build with weighted-cascade probabilities `p(u,v) = 1/indeg(v)` (§6.1). */
  def weightedCascade(n: Int, rawEdges: Seq[(Int, Int)]): CompactGraph = {
    val indeg = new Array[Int](n)
    rawEdges.foreach { case (_, d) => indeg(d) += 1 }
    fromEdges(n, rawEdges.map { case (s, d) => (s, d, 1.0 / indeg(d)) })
  }

  /** Collect a (src, dst) DataFrame and compile to CSR with weighted-cascade
    * probabilities. Dedup/self-loop hygiene is the generator's job.
    */
  def fromDF(df: DataFrame, n: Int): CompactGraph = {
    val edges = df
      .selectExpr("cast(src as int) src", "cast(dst as int) dst")
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)))
      .toSeq
    weightedCascade(n, edges)
  }

  private def offsets(n: Int, keys: Array[Int]): Array[Int] = {
    val off = new Array[Int](n + 1)
    keys.foreach(k => off(k + 1) += 1)
    var i = 0
    while (i < n) { off(i + 1) += off(i); i += 1 }
    off
  }

  private def grouped(n: Int, keys: Array[Int], off: Array[Int]): Array[Int] = {
    val out = new Array[Int](keys.length)
    val cursor = java.util.Arrays.copyOf(off, n)
    // Edge ids ascend within each group because we scan edges in id order.
    var e = 0
    while (e < keys.length) {
      val k = keys(e)
      out(cursor(k)) = e
      cursor(k) += 1
      e += 1
    }
    out
  }
}
