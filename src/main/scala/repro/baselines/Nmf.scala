package repro.baselines

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.linalg.{BRow, Block, Local}

/** NMF baseline [61]: rank-k non-negative factorisation `A ≈ W Hᵀ` by
  * distributed multiplicative updates; cluster(u) = argmax_j W[u,j].
  *
  *   W ← W ∘ (A H) / (W (HᵀH) + ε)
  *   H ← H ∘ (Aᵀ W) / (H (WᵀW) + ε)
  *
  * `A H` and `Aᵀ W` are sparse×dense multiplies (`Block.spmm`); the k×k
  * Grams are local. This is fully distributed — NMF is one of the few
  * competitors that survives the large datasets in the paper.
  */
object NmfBaseline extends Baseline {
  val name = "NMF"
  val iterations = 30

  def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame = {
    val spark2 = spark
    import spark2.implicits._
    val e = edges.cache()
    val uIds = e.select(col("u").as("id")).distinct()
    val vIds = e.select(col("v").as("id")).distinct()

    def positiveBlock(ids: DataFrame, s: Long) =
      Block.gaussianBlock(ids, k, s).map(r => BRow(r.id, r.vec.map(x => math.abs(x) + 0.1)))

    var w = positiveBlock(uIds, seed).transform(repro.linalg.Block.localize)
    var h = positiveBlock(vIds, seed + 1).transform(repro.linalg.Block.localize)
    val eps = 1e-9

    var t = 0
    while (t < iterations) {
      val hGram = Block.gram(h) // HᵀH, k×k
      val ah = Block.spmm(e, h, srcCol = "v", dstCol = "u", wCol = "w") // A H
      w = w.toDF("id", "wv").join(ah.toDF("id", "num"), Seq("id"), "left")
        .as[(Long, Array[Double], Array[Double])]
        .map { case (id, wv, num) => BRow(id, muUpdate(wv, num, hGram, eps)) }
        .transform(repro.linalg.Block.localize)
      val wGram = Block.gram(w)
      val atw = Block.spmm(e, w, srcCol = "u", dstCol = "v", wCol = "w") // Aᵀ W
      h = h.toDF("id", "hv").join(atw.toDF("id", "num"), Seq("id"), "left")
        .as[(Long, Array[Double], Array[Double])]
        .map { case (id, hv, num) => BRow(id, muUpdate(hv, num, wGram, eps)) }
        .transform(repro.linalg.Block.localize)
      t += 1
    }
    e.unpersist()
    w.map(r => (r.id, Local.argmax(r.vec))).toDF("id", "cluster")
  }

  /** One multiplicative update of a factor row: `x ∘ num / (x·G + ε)`. */
  private def muUpdate(x: Array[Double], num: Array[Double],
                       gram: Local.Mat, eps: Double): Array[Double] = {
    val den = Local.vecMat(x, gram)
    val out = new Array[Double](x.length)
    var i = 0
    while (i < x.length) {
      val n = if (num == null) 0.0 else num(i)
      out(i) = math.max(x(i) * n / (den(i) + eps), 1e-12)
      i += 1
    }
    out
  }
}
