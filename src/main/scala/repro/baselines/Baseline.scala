package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Common contract for every k-BGC competitor evaluated in the paper.
  *
  * `cluster` partitions the U side of the bipartite edge list `(u, v, w)`
  * into k groups and returns assignments `(id, cluster)`. `feasible` gates
  * which (dataset, method) cells benches populate — mirroring the paper's
  * "-" entries where a competitor cannot finish within 2 days.
  */
trait Baseline extends Serializable {
  def name: String

  /** Whether this method is run for a dataset whose PAPER-SCALE size is
    * `paperEdges` with `k` clusters. Benches evaluate on scaled-down analogs,
    * so feasibility is judged on the original sizes to mirror exactly which
    * cells the paper leaves as "-" (methods that could not finish in 2 days).
    */
  def feasible(paperEdges: Long, k: Int): Boolean = true

  def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame
}

/** Driver-side compact graph used by the inherently sequential baselines
  * (LE, Girvan–Newman, BiSBM-*) — the ones the paper itself cannot scale.
  */
final case class LocalBipartite(nU: Int, nV: Int,
                                us: Array[Int], vs: Array[Int], ws: Array[Double]) {
  val nEdges: Int = us.length

  /** adjacency of U side: per u, (v indices, weights) */
  lazy val (uAdj, uAdjW) = LocalBipartite.buildAdj(nU, us, vs, ws)
  /** adjacency of V side: per v, (u indices, weights) */
  lazy val (vAdj, vAdjW) = LocalBipartite.buildAdj(nV, vs, us, ws)
}

object LocalBipartite {

  def collect(edges: DataFrame): LocalBipartite = {
    val rows = edges.select("u", "v", "w").collect()
    val us = new Array[Int](rows.length)
    val vs = new Array[Int](rows.length)
    val ws = new Array[Double](rows.length)
    var i = 0
    var maxU = -1; var maxV = -1
    rows.foreach { r =>
      us(i) = r.getLong(0).toInt; vs(i) = r.getLong(1).toInt; ws(i) = r.getDouble(2)
      if (us(i) > maxU) maxU = us(i)
      if (vs(i) > maxV) maxV = vs(i)
      i += 1
    }
    LocalBipartite(maxU + 1, maxV + 1, us, vs, ws)
  }

  private[baselines] def buildAdj(n: Int, from: Array[Int], to: Array[Int],
                                  w: Array[Double]): (Array[Array[Int]], Array[Array[Double]]) = {
    val deg = new Array[Int](n)
    from.foreach(f => deg(f) += 1)
    val adj = Array.tabulate(n)(i => new Array[Int](deg(i)))
    val adjW = Array.tabulate(n)(i => new Array[Double](deg(i)))
    val pos = new Array[Int](n)
    var e = 0
    while (e < from.length) {
      val f = from(e)
      adj(f)(pos(f)) = to(e); adjW(f)(pos(f)) = w(e); pos(f) += 1
      e += 1
    }
    (adj, adjW)
  }

  /** Turn a local label array for U into an assignment DataFrame. */
  def toAssignDf(spark: SparkSession, labels: Array[Int]): DataFrame = {
    import spark.implicits._
    labels.zipWithIndex.map { case (c, i) => (i.toLong, c) }.toSeq.toDF("id", "cluster")
  }
}
