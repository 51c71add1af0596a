package repro.linalg

import org.apache.spark.sql.{DataFrame, Dataset}

/** Block power iteration with Rayleigh–Ritz extraction for the top-β
  * eigenpairs of a symmetric positive semi-definite operator.
  *
  * The operator is supplied as `apply: y ↦ A y` on dense row-blocks, so the
  * |V|×|V| matrix (e.g. `Q Qᵀ`) is never materialised — exactly the trick
  * HOPE relies on (paper §3, "without materializing H explicitly"). This is
  * also the engine behind every spectral baseline's truncated SVD.
  */
object SubspaceIteration {

  /** Top-β eigenpairs of the PSD operator.
    *
    * @param apply      the operator `y ↦ A y` on dense row-blocks
    * @param ids        DataFrame with a single `id` column enumerating the
    *                   operator's coordinate space
    * @param beta       subspace dimension (number of eigenpairs)
    * @param powerIters number of power-iteration steps (each = 1 operator
    *                   application + re-orthonormalisation)
    * @return (eigenvector block V with β columns, eigenvalues descending)
    */
  /** Guard vectors beyond β — standard randomized-method oversampling so the
    * trailing requested eigenpairs converge too.
    */
  private val Oversample = 4

  def topEig(apply: Dataset[BRow] => Dataset[BRow],
             ids: DataFrame,
             beta: Int,
             powerIters: Int,
             seed: Long): (Dataset[BRow], Array[Double]) = {
    val width = beta + Oversample
    var v = Block.orthonormalize(Block.gaussianBlock(ids, width, seed))
      .transform(repro.linalg.Block.localize)
    var t = 0
    while (t < powerIters) {
      v = Block.orthonormalize(apply(v)).transform(repro.linalg.Block.localize)
      t += 1
    }
    // Rayleigh–Ritz: rotate the converged subspace onto eigenvector axes and
    // drop the guard columns.
    val av = apply(v).transform(repro.linalg.Block.localize)
    val m = Block.pairGram(v, av)
    val (w, lambda) = Local.symEigDesc(m)
    val wTrunc = w.map(_.take(beta))
    val vecs = Block.timesLocal(v, wTrunc).transform(repro.linalg.Block.localize)
    (vecs, lambda.take(beta))
  }

  /** Truncated SVD of a sparse matrix given as edges `(row, col, w)`.
    *
    * Returns the top-β LEFT singular vectors (block over row ids) and the
    * singular values, via eigenpairs of the operator `y ↦ M (Mᵀ y)`.
    */
  def topLeftSingular(edges: DataFrame,
                      rowCol: String, colCol: String, wCol: String,
                      rowIds: DataFrame,
                      beta: Int,
                      powerIters: Int,
                      seed: Long): (Dataset[BRow], Array[Double]) = {
    val op: Dataset[BRow] => Dataset[BRow] = { y =>
      val t = Block.spmm(edges, y, srcCol = rowCol, dstCol = colCol, wCol = wCol)
      Block.spmm(edges, t, srcCol = colCol, dstCol = rowCol, wCol = wCol)
    }
    val (vecs, lambda) = topEig(op, rowIds, beta, powerIters, seed)
    (vecs, lambda.map(x => math.sqrt(math.max(x, 0.0))))
  }
}
