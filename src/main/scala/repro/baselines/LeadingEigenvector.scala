package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.linalg.Local

/** Newman's leading-eigenvector method [39] applied to the bipartite graph
  * viewed as unipartite (the paper's "canonical graph clustering" treatment).
  *
  * Recursive bisection: for the current community, power-iterate the
  * generalised modularity operator `B y = A y - (d·y/2m) d` restricted to the
  * community, split by sign of the leading eigenvector, stop when no split
  * improves modularity or k communities exist. If fewer than k communities
  * result, the largest are split by size; U-side memberships are returned.
  * Driver-side like the original — the paper only runs LE on datasets up to
  * CORA-F and it is the weakest method there.
  */
object LeadingEigenvectorBaseline extends Baseline {
  val name = "LE"
  // paper: populated up to CORA-F only
  override def feasible(paperEdges: Long, k: Int): Boolean = paperEdges <= 2000000L

  def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame = {
    val g = LocalBipartite.collect(edges)
    val n = g.nU + g.nV
    // Unipartite adjacency: U ids 0..nU-1, V ids nU..nU+nV-1.
    val adjIdx = new Array[Array[Int]](n)
    val adjW = new Array[Array[Double]](n)
    for (u <- 0 until g.nU) {
      adjIdx(u) = g.uAdj(u).map(_ + g.nU); adjW(u) = g.uAdjW(u)
    }
    for (v <- 0 until g.nV) {
      adjIdx(g.nU + v) = g.vAdj(v); adjW(g.nU + v) = g.vAdjW(v)
    }
    val deg = Array.tabulate(n)(i => adjW(i).sum)
    val m2 = deg.sum // 2m
    val rng = new java.util.Random(Local.mix(seed))

    var communities = List((0 until n).toArray)
    var done = List.empty[Array[Int]]
    while (communities.nonEmpty && communities.size + done.size < k) {
      val (comm, rest) = (communities.head, communities.tail)
      communities = rest
      splitBySign(comm, adjIdx, adjW, deg, m2, rng) match {
        case Some((a, b)) => communities = a :: b :: communities
        case None         => done = comm :: done
      }
      // Keep the largest community at the head so splits chase size.
      communities = communities.sortBy(-_.length)
    }
    var all = (communities ++ done).sortBy(-_.length)
    // Force exactly k groups: split largest evenly while short.
    while (all.size < k) {
      val big = all.head
      val (a, b) = big.splitAt(big.length / 2)
      all = (List(a, b) ++ all.tail).sortBy(-_.length)
    }
    val labels = new Array[Int](n)
    all.take(k).zipWithIndex.foreach { case (c, i) => c.foreach(labels(_) = i) }
    if (all.size > k) all.drop(k).foreach(_.foreach(labels(_) = k - 1))
    LocalBipartite.toAssignDf(spark, labels.take(g.nU))
  }

  /** Leading eigenvector of the modularity matrix restricted to `comm`;
    * returns the sign split if it has positive eigenvalue and is non-trivial.
    */
  private def splitBySign(comm: Array[Int], adjIdx: Array[Array[Int]],
                          adjW: Array[Array[Double]], deg: Array[Double],
                          m2: Double, rng: java.util.Random): Option[(Array[Int], Array[Int])] = {
    if (comm.length < 4) return None
    val pos = new java.util.HashMap[Int, Int]()
    comm.zipWithIndex.foreach { case (v, i) => pos.put(v, i) }
    val nc = comm.length
    var x = Array.fill(nc)(rng.nextGaussian())
    val dSub = comm.map(deg)
    val dTot = dSub.sum
    // Shifted power iteration on B_comm (shift by sum|row| bound to keep PSD).
    val shift = comm.map(v => deg(v) + deg(v) * dTot / m2).max
    var lambda = 0.0
    for (_ <- 0 until 60) {
      val y = new Array[Double](nc)
      val dx = comm.indices.iterator.map(i => dSub(i) * x(i)).sum / m2
      var i = 0
      while (i < nc) {
        val v = comm(i)
        val nb = adjIdx(v); val wv = adjW(v)
        var acc = 0.0
        var e = 0
        while (e < nb.length) {
          val p = pos.getOrDefault(nb(e), -1)
          if (p >= 0) acc += wv(e) * x(p)
          e += 1
        }
        y(i) = acc - dSub(i) * dx + shift * x(i)
        i += 1
      }
      val norm = Local.l2(y)
      if (norm == 0) return None
      lambda = comm.indices.iterator.map(i => y(i) * x(i)).sum
      x = y.map(_ / norm)
    }
    if (lambda - shift <= 1e-9) return None
    val a = comm.indices.filter(x(_) >= 0).map(comm).toArray
    val b = comm.indices.filter(x(_) < 0).map(comm).toArray
    if (a.isEmpty || b.isEmpty) None else Some((a, b))
  }
}
