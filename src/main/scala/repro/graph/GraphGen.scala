package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic social-network generators.
  *
  * The paper evaluates on four SNAP datasets (Table 2); the container is
  * offline, so we substitute Chung-Lu style power-law graphs matched on the
  * paper's shape parameters (directedness, average degree, heavy-tailed
  * degrees, large LWCC) at a reduced default scale — see DESIGN.md §5.
  *
  * Generation is a distributed DataFrame pipeline: candidate endpoints are
  * drawn via hash-based inverse-CDF zipf sampling (deterministic per row id,
  * independent of partitioning), self-loops dropped, duplicates removed.
  */
object GraphGen {

  /** Datasets mirroring Table 2 at bench scale. `targetEdges` counts directed
    * arcs (undirected edges count twice). `community` is the clique size of
    * the community layer: real social/collaboration networks owe their small
    * per-seed cascades under weighted cascade to exactly this local density
    * (cliques inflate in-degrees, which deflates p = 1/indeg), so the
    * community layer is what keeps seed counts at the paper's scale.
    */
  final case class DatasetSpec(name: String, n: Int, targetEdges: Int,
                               directed: Boolean, alpha: Double, community: Int)

  /** Default dataset grid (multiplied by REPRO_SCALE if set): NetHEPT at the
    * paper's full scale, the SNAP networks at 1/10–1/200 node counts with the
    * paper's edge density (arcs per node) preserved — see DESIGN.md §5.
    */
  val datasets: Seq[DatasetSpec] = Seq(
    DatasetSpec("nethept", 15200, 63500, directed = false, alpha = 2.5, community = 4),
    DatasetSpec("epinions", 13200, 88400, directed = true, alpha = 3.0, community = 5),
    DatasetSpec("youtube", 22600, 119500, directed = false, alpha = 2.8, community = 4),
    DatasetSpec("livejournal", 24250, 345000, directed = true, alpha = 3.5, community = 8),
  )

  def datasetSpec(name: String): DatasetSpec =
    datasets.find(_.name == name).getOrElse(
      throw new IllegalArgumentException(
        s"unknown dataset '$name'; known: ${datasets.map(_.name).mkString(", ")}"))

  /** Uniform [0,1) column deterministic in (`col` row value, salt). */
  private def hashU(col: org.apache.spark.sql.Column, salt: Long) =
    shiftrightunsigned(xxhash64(col, lit(salt)), 11).cast("double") / lit(9007199254740992.0)

  /** Node id drawn from Chung-Lu rank weights w_k ∝ (k+1)^(−β) with
    * β = 1/(alpha−1), which yields a degree-tail exponent ≈ alpha while
    * keeping the top hub's edge share bounded (unlike sampling ranks with
    * probability ∝ k^(−alpha) directly, which hands one node most edges).
    * Inverse CDF of the truncated power-law over ranks [0, n).
    */
  private def zipfNode(col: org.apache.spark.sql.Column, n: Int, alpha: Double, salt: Long) = {
    val beta = 1.0 / (alpha - 1.0)
    require(beta < 1.0, s"alpha=$alpha must exceed 2 for a normalizable rank weight")
    val e = 1.0 - beta
    val top = math.pow(n.toDouble + 1.0, e) - 1.0
    least(lit(n - 1),
      greatest(lit(0L),
        (pow(hashU(col, salt) * top + 1.0, lit(1.0 / e)) - 1.0).cast("long")))
  }

  /** Directed edge list (src, dst) with power-law in/out degrees; exactly the
    * first `targetEdges` distinct non-loop pairs from the candidate stream.
    */
  def powerLawEdges(spark: SparkSession, n: Int, targetEdges: Int, alpha: Double,
                    seed: Long, undirected: Boolean): DataFrame = {
    // Chung-Lu style: one zipf-ranked endpoint (heavy-tailed hubs) and one
    // uniform endpoint (keeps the giant weakly-connected component large, as
    // in the paper's datasets — pure zipf×zipf leaves most nodes isolated).
    val candidates = spark.range(math.max(8L, targetEdges * 4L)).select(
      zipfNode(col("id"), n, alpha, seed) as "a",
      (hashU(col("id"), seed + 1) * n).cast("long") as "b",
    ).where(col("a") =!= col("b"))
    val base =
      if (undirected)
        candidates
          .select(least(col("a"), col("b")) as "src", greatest(col("a"), col("b")) as "dst")
      else candidates.select(col("a") as "src", col("b") as "dst")
    val deduped = base.distinct().orderBy("src", "dst").limit(targetEdges)
    if (undirected) deduped.union(deduped.select(col("dst") as "src", col("src") as "dst"))
    else deduped
  }

  /** Community layer: nodes are grouped into consecutive cliques of size `s`
    * and fully wired inside each clique (both arc directions). Returns a
    * (src, dst) DataFrame of `≈ n·(s−1)` arcs built via a distributed
    * self-join on community id.
    */
  def communityEdges(spark: SparkSession, n: Int, s: Int): DataFrame = {
    val nodes = spark.range(n).select(
      col("id") as "node", (col("id") / s).cast("long") as "comm")
    val a = nodes.select(col("node") as "src", col("comm") as "c1")
    val b = nodes.select(col("node") as "dst", col("comm") as "c2")
    a.join(b, col("c1") === col("c2") && col("src") =!= col("dst"))
      .select("src", "dst")
  }

  /** Generate a dataset as a weighted-cascade CompactGraph: community cliques
    * plus power-law long-range edges up to the target arc count. `scale`
    * shrinks or grows both n and the arc target.
    */
  def dataset(spark: SparkSession, name: String, scale: Double = 1.0, seed: Long = 42): CompactGraph = {
    val spec = datasetSpec(name)
    val n = math.max(16, (spec.n * scale).toInt)
    val targetArcs = math.max(16, (spec.targetEdges * scale).toInt)
    val cliqueArcs = communityEdges(spark, n, spec.community)
    val cliqueArcCount = n.toLong * (spec.community - 1) // ≈, ignoring the tail clique
    val longRangeArcs = math.max(0L, targetArcs - cliqueArcCount)
    val longTarget = (if (spec.directed) longRangeArcs else longRangeArcs / 2).toInt
    val edges =
      if (longTarget == 0) cliqueArcs
      else cliqueArcs.union(
        powerLawEdges(spark, n, longTarget, spec.alpha, seed, undirected = !spec.directed))
    CompactGraph.fromDF(edges.distinct(), n)
  }

  // ---- deterministic fixture graphs for tests --------------------------------

  /** The Example 2.3 / Figure 2 graph: 4 nodes, 4 edges, 4 equiprobable
    * realizations. E[I(v1)] = 2.75; truncated spreads at η=2 are
    * (1.75, 2, 2, 1) for (v1..v4). Node vi maps to id i-1.
    */
  def fig2: CompactGraph = CompactGraph.fromEdges(4, Seq(
    (0, 1, 0.5), (0, 2, 0.5), (1, 3, 1.0), (2, 3, 1.0)))

  /** Directed path 0 -> 1 -> ... -> n-1, each edge probability p. */
  def line(n: Int, p: Double): CompactGraph =
    CompactGraph.fromEdges(n, (0 until n - 1).map(i => (i, i + 1, p)))

  /** Out-star: center 0 -> each leaf, probability p. */
  def star(n: Int, p: Double): CompactGraph =
    CompactGraph.fromEdges(n, (1 until n).map(i => (0, i, p)))

  /** Two disjoint directed cliques of size s each, probability p. */
  def twoCliques(s: Int, p: Double): CompactGraph = {
    val edges = for {
      block <- 0 to 1; i <- 0 until s; j <- 0 until s if i != j
    } yield (block * s + i, block * s + j, p)
    CompactGraph.fromEdges(2 * s, edges)
  }
}
