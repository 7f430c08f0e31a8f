package repro.dist

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.LocalGraph

/** Catalyst/DataFrame graph operations.
  *
  * Everything relational about the pipeline lives here: normalizing raw edge
  * lists, degree and triangle statistics (each verified against DuckDB via
  * `repro.Oracle` in the test suite), converting between `LocalGraph` and
  * edge DataFrames, and the SQL-style verification that an emitted clique
  * set is (a) made of cliques and (b) maximal.
  */
object GraphOps {

  /** Canonicalize a raw (src, dst) edge DataFrame: drop self-loops, orient
    * each edge as (least, greatest), dedupe.
    */
  def normalize(edges: DataFrame): DataFrame = {
    edges
      .where(col("src") =!= col("dst"))
      .select(
        least(col("src"), col("dst")).as("src"),
        greatest(col("src"), col("dst")).as("dst")
      )
      .distinct()
  }

  /** Per-vertex degree over a normalized edge DataFrame. */
  def degrees(normEdges: DataFrame): DataFrame = {
    normEdges
      .select(col("src").as("v"))
      .unionAll(normEdges.select(col("dst").as("v")))
      .groupBy("v")
      .agg(count(lit(1)).as("degree"))
  }

  /** Total triangle count via the oriented wedge join (src < dst in every
    * normalized edge, so each triangle is counted exactly once).
    */
  def triangleCount(normEdges: DataFrame): Long = {
    val e1 = normEdges.select(col("src").as("a"), col("dst").as("b"))
    val e2 = normEdges.select(col("src").as("b2"), col("dst").as("c"))
    val e3 = normEdges.select(col("src").as("a3"), col("dst").as("c3"))
    val wedges = e1.join(e2, col("b") === col("b2"))
    val tri = wedges.join(e3, col("a") === col("a3") && col("c") === col("c3"))
    tri.count()
  }

  /** LocalGraph → normalized edge DataFrame. */
  def toEdgesDf(spark: SparkSession, g: LocalGraph): DataFrame = {
    import spark.implicits._
    (0 until g.m).map(e => (g.eu(e), g.ev(e))).toDF("src", "dst")
  }

  /** Normalized edge DataFrame → LocalGraph (graphs at our scale fit the
    * driver; `n` = 1 + max vertex id unless given).
    */
  def toLocalGraph(normEdges: DataFrame, n: Int = -1): LocalGraph = {
    val rows = normEdges.select(col("src").cast("int"), col("dst").cast("int")).collect()
    val src = rows.map(_.getInt(0))
    val dst = rows.map(_.getInt(1))
    val nv =
      if (n >= 0) n
      else if (rows.isEmpty) 0
      else math.max(src.max, dst.max) + 1
    LocalGraph.fromEdgeArrays(nv, src, dst)
  }

  /** Clique membership table (clique_id, v) from a cliques DataFrame with an
    * array column `clique`.
    */
  def memberships(cliques: DataFrame): DataFrame =
    cliques
      .select(monotonically_increasing_id().as("cid"), col("clique"))
      .select(col("cid"), explode(col("clique")).as("v"))

  /** Number of member pairs of any clique that are NOT edges — must be 0. */
  def nonEdgePairCount(cliques: DataFrame, normEdges: DataFrame): Long = {
    val m = memberships(cliques)
    val pairs = m.as("l")
      .join(m.as("r"), col("l.cid") === col("r.cid") && col("l.v") < col("r.v"))
      .select(col("l.v").as("src"), col("r.v").as("dst"), col("l.cid").as("cid"))
    pairs
      .join(normEdges, Seq("src", "dst"), "left_anti")
      .count()
  }

  /** Number of (clique, vertex) pairs where the vertex is adjacent to every
    * member of the clique but not in it — must be 0 for maximal cliques.
    */
  def extenderCount(cliques: DataFrame, normEdges: DataFrame): Long = {
    val m = memberships(cliques)
    val sizes = m.groupBy("cid").agg(count(lit(1)).as("sz"))
    val und = normEdges.select(col("src").as("a"), col("dst").as("b"))
      .unionAll(normEdges.select(col("dst").as("a"), col("src").as("b")))
    // For each clique member v, candidate extenders are v's neighbors not in
    // the clique; an extender must cover ALL members.
    val cover = m.join(und, col("v") === col("a"))
      .select(col("cid"), col("b").as("w"))
      .join(m.select(col("cid").as("cid2"), col("v").as("w2")),
            col("cid") === col("cid2") && col("w") === col("w2"), "left_anti")
      .groupBy("cid", "w")
      .agg(count(lit(1)).as("covered"))
    cover
      .join(sizes, "cid")
      .where(col("covered") === col("sz"))
      .count()
  }

  /** Number of duplicated cliques in the result — must be 0. */
  def duplicateCount(cliques: DataFrame): Long = {
    val canon = cliques.select(array_sort(col("clique")).as("c"))
    canon.count() - canon.distinct().count()
  }
}
