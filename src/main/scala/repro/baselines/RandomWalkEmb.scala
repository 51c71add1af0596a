package repro.baselines

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.KMeansD
import repro.linalg.{BRow, Block}

/** Random-walk proximity baselines: PPR [56] and NRP [64].
  *
  * Both cluster per-node personalised-PageRank-style proximity vectors. The
  * full Π matrix is |U∪V|² — we sketch it with a signed random projection R:
  * `Z = Σ_t (1-α) α^t P_full^t R` computed by the power recurrence
  * `Z_{t+1} = (1-α)R + α P Z_t`, exactly the PPR geometry each method's
  * k-means sees (DESIGN.md §2). NRP additionally reweights by √degree, the
  * spirit of its PPR reweighting.
  */
object RandomWalkEmb {

  private val SketchDim = 64
  // Decay 0.5 keeps the PPR mass local (FORA-style restart probabilities);
  // larger decay blurs cluster structure into the stationary distribution.
  private val Alpha = 0.5
  private val Steps = 8

  /** Symmetric random-walk transition edges over U ∪ V (V offset). */
  private def transitionEdges(edges: DataFrame): (DataFrame, Long) = {
    val offset = edges.agg(max("u")).head.getLong(0) + 1L
    val du = edges.groupBy("u").agg(sum("w").as("du"))
    val dv = edges.groupBy("v").agg(sum("w").as("dv"))
    val j = edges.join(du, "u").join(dv, "v")
    val uv = j.select(col("u").as("dst"), (col("v") + offset).as("src"),
                      (col("w") / col("du")).as("w")) // p(u,v) = w/du
    val vu = j.select((col("v") + offset).as("dst"), col("u").as("src"),
                      (col("w") / col("dv")).as("w")) // p(v,u) = w/dv
    // Row i of P holds p(i, ·); our spmm computes out[dst] = Σ_src w·y[src],
    // i.e. (P y) when edges are stored as (src = j, dst = i, p(i,j)).
    (uv.unionByName(vu), offset)
  }

  private def pprSketch(edges: DataFrame, seed: Long): (Dataset[BRow], Long) = {
    val (p, offset) = transitionEdges(edges)
    val pc = p.cache()
    val ids = pc.select(col("dst").as("id")).distinct()
    val r0 = Block.rademacherBlock(ids, SketchDim, seed).transform(repro.linalg.Block.localize)
    val spark = edges.sparkSession
    import spark.implicits._
    var z = r0
    var t = 0
    while (t < Steps) {
      val pz = Block.spmm(pc, z, srcCol = "src", dstCol = "dst")
      z = r0.toDF("id", "rv").join(pz.toDF("id", "pv"), Seq("id"), "left")
        .as[(Long, Array[Double], Array[Double])]
        .map { case (id, rv, pv) =>
          val out = new Array[Double](rv.length)
          var i = 0
          while (i < rv.length) {
            out(i) = (1 - Alpha) * rv(i) + Alpha * (if (pv == null) 0.0 else pv(i))
            i += 1
          }
          BRow(id, out)
        }.transform(repro.linalg.Block.localize)
      t += 1
    }
    // Drop the self-restart term (1-α)·R_i: its i.i.d. random vectors would
    // dominate pairwise distances and drown the neighbourhood signal — the
    // sketch then approximates the OFF-diagonal PPR mass, which is what the
    // clustering actually compares.
    val noSelf = z.toDF("id", "zv").join(r0.toDF("id", "rv"), "id")
      .as[(Long, Array[Double], Array[Double])]
      .map { case (id, zv, rv) =>
        val out = new Array[Double](zv.length)
        var i = 0
        while (i < zv.length) { out(i) = zv(i) - (1 - Alpha) * rv(i); i += 1 }
        BRow(id, out)
      }.transform(repro.linalg.Block.localize)
    pc.unpersist()
    (noSelf, offset)
  }

  /** PPR: k-means over sketched PPR vectors of the U side. */
  object PPR extends Baseline {
    val name = "PPR"
    override def feasible(paperEdges: Long, k: Int): Boolean = paperEdges <= 4000000L // paper: "-" on MIND and larger

    def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame = {
      val (z, offset) = pprSketch(edges, seed)
      val spark2 = spark
      import spark2.implicits._
      val uRows = z.filter(_.id < offset)
      KMeansD.run(Block.normalizeRows(uRows), k, seed = seed)
    }
  }

  /** NRP: degree-reweighted PPR embedding (survives all datasets in paper). */
  object NRP extends Baseline {
    val name = "NRP"

    def cluster(spark: SparkSession, edges: DataFrame, k: Int, seed: Long): DataFrame = {
      val (z, offset) = pprSketch(edges, seed)
      val spark2 = spark
      import spark2.implicits._
      val du = edges.groupBy("u").agg(sum("w").as("du"))
        .select(col("u").as("id"), col("du"))
      val uRows = z.filter(_.id < offset).toDF("id", "vec")
        .join(du, "id")
        .select(col("id"), col("vec"), col("du"))
        .as[(Long, Array[Double], Double)]
        .map { case (id, v, d) =>
          val s = math.sqrt(d)
          BRow(id, v.map(_ * s))
        }
      // No row normalisation: NRP's reweighting keeps the degree magnitude.
      KMeansD.run(uRows, k, seed = seed)
    }
  }
}
