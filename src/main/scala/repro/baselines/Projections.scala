package repro.baselines

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.functions._
import repro.linalg.{BRow, Block}

/** Johnson–Lindenstrauss sketches of biadjacency rows.
  *
  * Several data-clustering baselines (K-Means, K-Medoids, Birch) operate on
  * the raw |U|×|V| data matrix. We sketch each row with a signed random
  * projection (`X_u = Σ_v a(u,v) R_v`, `R_v` Rademacher) so distances are
  * preserved while centers stay β-dimensional — the standard substitution
  * when |V| is large (DESIGN.md).
  */
object Projections {

  /** Project U-side rows of the (optionally row-normalised) biadjacency. */
  def uRows(edges: DataFrame, dim: Int, seed: Long,
            rowNormalize: Boolean = true): Dataset[BRow] = {
    val vIds = edges.select(col("v").as("id")).distinct()
    val r = Block.rademacherBlock(vIds, dim, seed)
    val proj = Block.spmm(edges, r, srcCol = "v", dstCol = "u", wCol = "w")
    if (rowNormalize) Block.normalizeRows(proj) else proj
  }
}
