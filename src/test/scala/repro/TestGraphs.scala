package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.data.BipartiteGen

/** Shared small planted graphs for algorithm tests. */
object TestGraphs {

  /** A well-separated planted bipartite graph: k clear clusters, little
    * noise, a few hubs — every reasonable method should score well here.
    */
  def easy(spark: SparkSession, k: Int = 3, seed: Long = 5): BipartiteGen.Graph =
    BipartiteGen.planted(spark, BipartiteGen.Config(
      nU = 120, nV = 90, k = k, targetEdges = 2400,
      hubFrac = 0.05, hubEdgeFrac = 0.05, noise = 0.03, seed = seed))

  /** Harder instance: more hubs and noise (first-order signal blurred). */
  def hubHeavy(spark: SparkSession, k: Int = 3, seed: Long = 6): BipartiteGen.Graph =
    BipartiteGen.planted(spark, BipartiteGen.Config(
      nU = 150, nV = 100, k = k, targetEdges = 4000,
      hubFrac = 0.2, hubEdgeFrac = 0.35, noise = 0.1, seed = seed))

  /** Weighted variant of the easy instance. */
  def weighted(spark: SparkSession, k: Int = 3, seed: Long = 7): BipartiteGen.Graph =
    BipartiteGen.planted(spark, BipartiteGen.Config(
      nU = 120, nV = 90, k = k, targetEdges = 2400, weighted = true,
      hubFrac = 0.05, hubEdgeFrac = 0.05, noise = 0.03, seed = seed))

  /** Sanity check that an assignment DataFrame is a valid k-partition of U. */
  def assertValidAssignment(assign: DataFrame, nU: Long, k: Int): Unit = {
    val rows = assign.collect()
    assert(rows.length == nU, s"expected $nU assignments, got ${rows.length}")
    val ids = rows.map(_.getLong(0)).toSet
    assert(ids.size == nU.toInt, "duplicate ids in assignment")
    rows.foreach { r =>
      val c = r.getInt(1)
      assert(c >= 0 && c < k, s"cluster $c out of range [0,$k)")
    }
  }
}
