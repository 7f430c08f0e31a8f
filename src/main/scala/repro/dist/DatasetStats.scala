package repro.dist

import org.apache.spark.sql.SparkSession
import repro.graph.{Degeneracy, GraphGen, LocalGraph, TrussOrder}

/** Table I statistics for one dataset: |V|, |E|, δ, τ, ρ and the paper's
  * complexity condition δ ≥ max{3, τ + 3·lnρ/ln3}.
  */
final case class DatasetStatsRow(
    name: String,
    fullName: String,
    n: Long,
    m: Long,
    delta: Int,
    tau: Int,
    rho: Double,
    conditionHolds: Boolean
)

object DatasetStats {

  def compute(name: String, fullName: String, g: LocalGraph,
              spark: Option[SparkSession] = None): DatasetStatsRow = {
    // n and m via the DataFrame pipeline when a session is supplied (the
    // bench does this so the relational path is exercised end-to-end);
    // δ and τ are inherently sequential peeling procedures on the driver.
    val (n, m) = spark match {
      case Some(s) =>
        val edges = GraphOps.normalize(GraphOps.toEdgesDf(s, g))
        val mm = edges.count()
        val nn = g.n.toLong // isolated vertices never appear in the edge list
        (nn, mm)
      case None => (g.n.toLong, g.m.toLong)
    }
    val delta = Degeneracy.compute(g).delta
    val tau = TrussOrder.compute(g).bound
    val rho = if (n == 0) 0.0 else m.toDouble / n.toDouble
    val cond = delta >= math.max(3.0, tau + 3.0 * math.log(rho) / math.log(3.0))
    DatasetStatsRow(name, fullName, n, m, delta, tau, rho, cond)
  }

  def computeSuite(spark: Option[SparkSession]): Seq[DatasetStatsRow] =
    GraphGen.paperSuite.map { cfg =>
      compute(cfg.name, cfg.fullName, GraphGen.generate(cfg), spark)
    }
}
