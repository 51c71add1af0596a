package repro.core

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._
import repro.linalg.{BRow, Block, Local}

/** HOPE+ (paper §4, Algorithms 2 and 3).
  *
  * Stage 1: the k-largest eigenvectors L of `H Hᵀ` are approximated by the
  * top-k left singular vectors of the low-rank X from HOPE (Lemma 4.3),
  * computed from the local β×β Gram of X — no |U|×|U| matrix is ever formed.
  *
  * Stage 2: greedy seeding of the cluster indicator C (argmax per row of L),
  * then alternating rounding between the k×k alignment T and C:
  *  - FNEM: `T = Φ Ψᵀ` where `Φ Σ Ψᵀ = SVD(Lᵀ C)` (Lemma 4.4, Procrustes);
  *  - SNEM: `T = Lᵀ C`                                  (Lemma 4.5).
  * C's column normalisation (1/√|C_j|) is folded into the local `Lᵀ C`
  * computation; the returned result is the assignment `(id, cluster)`.
  */
object HopePlus {

  sealed trait Urt { def name: String }
  case object Fnem extends Urt { val name = "FNEM" }
  case object Snem extends Urt { val name = "SNEM" }

  final case class Params(alpha: Double = 0.3,
                          beta: Int = 0,
                          powerIters: Int = 12,
                          maxRounds: Int = 100,
                          seed: Long = 7L)

  /** Top-k left singular vectors of the dense row-block X (|U|×β, β ≥ k):
    * eigen-decompose the β×β Gram `XᵀX` locally, keep the top-k right
    * singular directions W_k with singular values s, and rotate:
    * `L = X W_k diag(1/s)` — orthonormal columns by construction.
    *
    * Columns are sign-fixed (max-|·| entry positive): the greedy seeding of
    * Algorithm 2 argmaxes over L's raw entries, which is only meaningful
    * under a deterministic sign convention — otherwise the all-positive
    * leading vector plus arbitrarily-signed contrasts collapse the seed
    * into one cluster.
    */
  def leftSingular(x: Dataset[BRow], k: Int): Dataset[BRow] = {
    val g = Block.gram(x)
    val (w, lam) = Local.symEigDesc(g)
    val rot = Local.zeros(g.length, k)
    var j = 0
    while (j < k) {
      val s = math.sqrt(math.max(lam(j), 1e-300))
      var i = 0
      while (i < g.length) { rot(i)(j) = w(i)(j) / s; i += 1 }
      j += 1
    }
    Block.signFixColumns(Block.timesLocal(x, rot))
  }

  /** `Lᵀ C` as a local k×k matrix, with C's 1/√|C_j| normalisation applied.
    * Column j of the result is (Σ_{i ∈ C_j} L_i) / √|C_j|.
    */
  private def ltC(l: Dataset[BRow], assign: DataFrame, k: Int): Local.Mat = {
    val spark = l.sparkSession
    import spark.implicits._
    val sums = l.toDF("id", "vec").join(assign, "id")
      .select($"cluster".cast("int"), $"vec").as[(Int, Array[Double])]
      .groupByKey(_._1)
      .mapValues { case (_, v) => (v, 1L) }
      .reduceGroups { (a, b) => (Local.addInPlace(a._1, b._1), a._2 + b._2) }
      .collect()
    val m = Local.zeros(k, k)
    sums.foreach { case (c, (s, n)) =>
      val inv = 1.0 / math.sqrt(n.toDouble)
      var a = 0
      while (a < k) { m(a)(c) = s(a) * inv; a += 1 }
    }
    m
  }

  /** Assign each row of L to `argmax_j (L T)_{i,j}` (Lines 8–11, Alg. 3). */
  private def assignArgmax(l: Dataset[BRow], t: Local.Mat): DataFrame = {
    val spark = l.sparkSession
    import spark.implicits._
    val bc = spark.sparkContext.broadcast(t)
    l.map(r => (r.id, Local.argmax(Local.vecMat(r.vec, bc.value))))
      .toDF("id", "cluster")
  }

  /** Rounding (Algorithm 3): alternate T and C updates until C is unchanged
    * or `maxRounds` iterations. Returns assignments `(id, cluster)`.
    */
  def round(l: Dataset[BRow], k: Int, urt: Urt, maxRounds: Int): DataFrame = {
    // Greedy seeding (Lines 6–10, Alg. 2): argmax over L itself, i.e. T = I.
    var assign = assignArgmax(l, Local.eye(k)).transform(repro.linalg.Block.localize)
    var t = 0
    var converged = false
    while (t < maxRounds && !converged) {
      val m = ltC(l, assign, k)
      val tMat = urt match {
        case Fnem =>
          val (phi, _, v) = Local.svdSmall(m)
          Local.matmul(phi, Local.transpose(v))
        case Snem => m
      }
      val next = assignArgmax(l, tMat).transform(repro.linalg.Block.localize)
      val changed = next.as("n").join(assign.as("o"), "id")
        .where(col("n.cluster") =!= col("o.cluster")).count()
      assign = next
      converged = changed == 0L
      t += 1
    }
    assign
  }

  /** Full HOPE+ for one rounding scheme. */
  def run(edges: DataFrame, k: Int, urt: Urt, params: Params = Params()): DataFrame = {
    val x = Hope.embed(edges, k,
      Hope.Params(alpha = params.alpha, beta = params.beta,
                  powerIters = params.powerIters, seed = params.seed))
    val l = leftSingular(x, k).transform(repro.linalg.Block.localize)
    round(l, k, urt, params.maxRounds)
  }

  /** Run both variants sharing one embedding/eigen stage (bench helper). */
  def runBoth(edges: DataFrame, k: Int, params: Params = Params()): (DataFrame, DataFrame) = {
    val x = Hope.embed(edges, k,
      Hope.Params(alpha = params.alpha, beta = params.beta,
                  powerIters = params.powerIters, seed = params.seed))
    val l = leftSingular(x, k).transform(repro.linalg.Block.localize)
    (round(l, k, Fnem, params.maxRounds), round(l, k, Snem, params.maxRounds))
  }
}
