package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Construction of the paper's matrices from a weighted bipartite edge list.
  *
  * Edge DataFrames have columns `u: Long`, `v: Long`, `w: Double` with
  * non-negative weights and (by generator contract) min-degree ≥ 1 on both
  * sides. All derived matrices stay sparse edge lists:
  *
  *  - `P[i,j] = p(u_i, v_j) = w(u_i,v_j) / Σ_l w(u_i,v_l)`      (Eq. 1)
  *  - `Q[j,i] = sqrt(p(v_j,u_i)·p(u_i,v_j)) = w / sqrt(du·dv)`  (Table 1)
  *
  * and the WPG weight matrix is `W_V = Q Qᵀ` (Eq. 4) — only ever used in
  * operator form, never materialised.
  */
object BipartiteGraph {

  /** Weighted out-degrees of the U side: `(u, du)`. */
  def uDegrees(edges: DataFrame): DataFrame =
    edges.groupBy("u").agg(sum("w").as("du"))

  /** Weighted degrees of the V side: `(v, dv)`. */
  def vDegrees(edges: DataFrame): DataFrame =
    edges.groupBy("v").agg(sum("w").as("dv"))

  /** Distinct U ids as a single-column `id` DataFrame. */
  def uIds(edges: DataFrame): DataFrame = edges.select(col("u").as("id")).distinct()

  /** Distinct V ids as a single-column `id` DataFrame. */
  def vIds(edges: DataFrame): DataFrame = edges.select(col("v").as("id")).distinct()

  /** Transition matrix P as edges `(u, v, p)` — Eq. (1). */
  def pEdges(edges: DataFrame): DataFrame =
    edges.join(uDegrees(edges), "u")
      .select(col("u"), col("v"), (col("w") / col("du")).as("p"))

  /** Matrix Q as edges `(v, u, q)` with `q = w / sqrt(du · dv)`. */
  def qEdges(edges: DataFrame): DataFrame =
    edges.join(uDegrees(edges), "u").join(vDegrees(edges), "v")
      .select(col("v"), col("u"),
              (col("w") / sqrt(col("du") * col("dv"))).as("q"))

  /** Materialised WPG edge weights `w_V(v_j, v_l)` (Eq. 2/4) for tests and
    * the Oracle — quadratic in the worst case, never used by the algorithms.
    */
  def wpgEdges(edges: DataFrame): DataFrame = {
    val q  = qEdges(edges)
    val q1 = q.select(col("v").as("vj"), col("u"), col("q").as("q1"))
    val q2 = q.select(col("v").as("vl"), col("u"), col("q").as("q2"))
    q1.join(q2, "u")
      .groupBy("vj", "vl")
      .agg(sum(col("q1") * col("q2")).as("wv"))
  }
}
