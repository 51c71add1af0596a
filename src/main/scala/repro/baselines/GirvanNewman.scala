package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.linalg.Local
import scala.collection.mutable

/** Girvan–Newman [20] on the bipartite graph viewed as unipartite.
  *
  * Exact GN recomputes all-pairs edge betweenness after every single edge
  * removal — O(|U|·|E|²), infeasible beyond toy graphs (the paper reports it
  * on CORA/CiteSeer only, with weak quality). We use the standard practical
  * approximation: Brandes betweenness from a sample of sources, removing the
  * top 0.5% of edges per round, until the U side splits into ≥ k connected
  * components; components then map to clusters (largest k kept, remainder
  * merged into the last cluster).
  */
object GirvanNewmanBaseline extends Baseline {
  val name = "Girvan-Newman"
  // paper populates only CORA and CiteSeer
  override def feasible(paperEdges: Long, k: Int): Boolean = paperEdges <= 150000L

  private val SampleSources = 48

  private final case class GnEdge(a: Int, b: Int, var alive: Boolean)

  def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame = {
    val g = LocalBipartite.collect(edges)
    val n = g.nU + g.nV
    val rng = new java.util.Random(Local.mix(seed))

    // Mutable unipartite adjacency with edge ids for removal.
    val es = new mutable.ArrayBuffer[GnEdge](g.nEdges)
    for (i <- 0 until g.nEdges) es += GnEdge(g.us(i), g.nU + g.vs(i), alive = true)
    val adj = Array.fill(n)(new mutable.ArrayBuffer[Int]())
    for ((e, idx) <- es.zipWithIndex) { adj(e.a) += idx; adj(e.b) += idx }

    def componentCount(): (Int, Array[Int]) = {
      val comp = Array.fill(n)(-1)
      var c = 0
      val stack = new mutable.ArrayDeque[Int]()
      for (s <- 0 until n if comp(s) < 0) {
        comp(s) = c; stack.append(s)
        while (stack.nonEmpty) {
          val x = stack.removeLast()
          adj(x).foreach { ei =>
            val e = es(ei)
            if (e.alive) {
              val y = if (e.a == x) e.b else e.a
              if (comp(y) < 0) { comp(y) = c; stack.append(y) }
            }
          }
        }
        c += 1
      }
      (c, comp)
    }

    var (nComp, comp) = componentCount()
    var rounds = 0
    val maxRounds = 60
    while (nComp < k && rounds < maxRounds && es.exists(_.alive)) {
      val bet = new Array[Double](es.length)
      val sources = Array.fill(SampleSources)(rng.nextInt(n))
      sources.foreach(s => brandesAccumulate(s, n, adj, es, bet))
      val alive = es.indices.filter(es(_).alive)
      val toDrop = math.max(1, alive.size / 200)
      alive.sortBy(-bet(_)).take(toDrop).foreach(es(_).alive = false)
      val r = componentCount(); nComp = r._1; comp = r._2
      rounds += 1
    }

    // Map components to k clusters by size (U-side counts).
    val uComp = (0 until g.nU).map(comp)
    val bySize = uComp.groupBy(identity).view.mapValues(_.size).toSeq.sortBy(-_._2)
    val compToCluster = bySize.take(k).map(_._1).zipWithIndex.toMap
    val labels = uComp.map(c => compToCluster.getOrElse(c, k - 1)).toArray
    LocalBipartite.toAssignDf(spark, labels)
  }

  /** Brandes single-source betweenness accumulation onto edge scores. */
  private def brandesAccumulate(s: Int, n: Int,
                                adj: Array[mutable.ArrayBuffer[Int]],
                                es: mutable.ArrayBuffer[GnEdge],
                                bet: Array[Double]): Unit = {
    val dist = Array.fill(n)(-1)
    val sigma = new Array[Double](n)
    val order = new mutable.ArrayBuffer[Int]()
    val preds = Array.fill(n)(new mutable.ArrayBuffer[Int]()) // incoming edge ids
    val queue = new mutable.ArrayDeque[Int]()
    dist(s) = 0; sigma(s) = 1.0; queue.append(s)
    while (queue.nonEmpty) {
      val x = queue.removeHead()
      order += x
      adj(x).foreach { ei =>
        val e = es(ei)
        if (e.alive) {
          val y = if (e.a == x) e.b else e.a
          if (dist(y) < 0) { dist(y) = dist(x) + 1; queue.append(y) }
          if (dist(y) == dist(x) + 1) { sigma(y) += sigma(x); preds(y) += ei }
        }
      }
    }
    val delta = new Array[Double](n)
    order.reverseIterator.foreach { y =>
      preds(y).foreach { ei =>
        val e = es(ei)
        val x = if (dist(e.a) == dist(y) - 1) e.a else e.b
        val c = sigma(x) / sigma(y) * (1.0 + delta(y))
        bet(ei) += c
        delta(x) += c
      }
    }
  }
}
