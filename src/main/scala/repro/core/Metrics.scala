package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Clustering quality metrics (paper §5.1): Accuracy (optimal cluster-to-class
  * matching via the Hungarian algorithm), matched macro F1, NMI with geometric
  * normalisation (Strehl–Ghosh [50]), and the Adjusted Rand Index [27].
  *
  * All four are computed from one contingency table collected to the driver
  * (k_pred × k_true counts — tiny even when |U| is millions).
  */
object Metrics {

  final case class Scores(acc: Double, f1: Double, nmi: Double, ari: Double) {
    override def toString: String = f"Acc=$acc%.3f F1=$f1%.3f NMI=$nmi%.3f ARI=$ari%.3f"
  }

  /** Contingency counts: rows = predicted clusters, cols = true labels. */
  def contingency(pred: DataFrame, truth: DataFrame): Array[Array[Long]] = {
    val cells = pred.select(col("id"), col("cluster").cast("long"))
      .join(truth.select(col("id"), col("label").cast("long")), "id")
      .groupBy("cluster", "label").count()
      .collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    val preds  = cells.map(_._1).distinct.sorted
    val labels = cells.map(_._2).distinct.sorted
    val pIdx = preds.zipWithIndex.toMap
    val lIdx = labels.zipWithIndex.toMap
    val m = Array.fill(preds.length)(new Array[Long](labels.length))
    cells.foreach { case (p, l, c) => m(pIdx(p))(lIdx(l)) += c }
    m
  }

  def evaluate(pred: DataFrame, truth: DataFrame): Scores = {
    val m = contingency(pred, truth)
    Scores(accuracy(m), f1Macro(m), nmi(m), ari(m))
  }

  /** Clustering accuracy under the optimal one-to-one cluster↔class matching. */
  def accuracy(m: Array[Array[Long]]): Double = {
    val n = m.iterator.map(_.sum).sum.toDouble
    if (n == 0) return 0.0
    val matchIdx = hungarianMax(m.map(_.map(_.toDouble)))
    val matched = matchIdx.zipWithIndex.collect {
      case (j, i) if j >= 0 => m(i)(j)
    }.sum
    matched / n
  }

  /** Macro-averaged F1 over true classes, using the same optimal matching as
    * accuracy; classes left unmatched contribute F1 = 0.
    */
  def f1Macro(m: Array[Array[Long]]): Double = {
    val nLab = if (m.isEmpty) 0 else m(0).length
    if (nLab == 0) return 0.0
    val rowSum = m.map(_.sum.toDouble)
    val colSum = Array.tabulate(nLab)(j => m.map(_(j)).sum.toDouble)
    val matchIdx = hungarianMax(m.map(_.map(_.toDouble)))
    val f1ByLabel = new Array[Double](nLab)
    matchIdx.zipWithIndex.foreach { case (j, i) =>
      if (j >= 0) {
        val tp = m(i)(j).toDouble
        val prec = if (rowSum(i) > 0) tp / rowSum(i) else 0.0
        val rec  = if (colSum(j) > 0) tp / colSum(j) else 0.0
        f1ByLabel(j) = if (prec + rec > 0) 2 * prec * rec / (prec + rec) else 0.0
      }
    }
    f1ByLabel.sum / nLab
  }

  /** Normalised mutual information, geometric normalisation I/√(Hp·Ht). */
  def nmi(m: Array[Array[Long]]): Double = {
    val n = m.iterator.map(_.sum).sum.toDouble
    if (n == 0) return 0.0
    val rowP = m.map(_.sum / n)
    val colP = Array.tabulate(m(0).length)(j => m.map(_(j)).sum / n)
    var i0 = 0.0
    for (i <- m.indices; j <- m(i).indices if m(i)(j) > 0) {
      val p = m(i)(j) / n
      i0 += p * math.log(p / (rowP(i) * colP(j)))
    }
    val hR = -rowP.filter(_ > 0).map(p => p * math.log(p)).sum
    val hC = -colP.filter(_ > 0).map(p => p * math.log(p)).sum
    if (hR <= 0 || hC <= 0) { if (i0 > 0) 1.0 else 0.0 }
    else i0 / math.sqrt(hR * hC)
  }

  /** Adjusted Rand Index (Hubert & Arabie). */
  def ari(m: Array[Array[Long]]): Double = {
    def choose2(x: Double): Double = x * (x - 1) / 2.0
    val n = m.iterator.map(_.sum).sum.toDouble
    if (n < 2) return 0.0
    val sumCells = m.iterator.flatMap(_.iterator).map(c => choose2(c.toDouble)).sum
    val sumRows  = m.iterator.map(r => choose2(r.sum.toDouble)).sum
    val sumCols  = m(0).indices.map(j => choose2(m.map(_(j)).sum.toDouble)).sum
    val expected = sumRows * sumCols / choose2(n)
    val maxIdx   = (sumRows + sumCols) / 2.0
    if (maxIdx == expected) 0.0 else (sumCells - expected) / (maxIdx - expected)
  }

  /** Maximum-weight one-to-one assignment (rectangular, padded internally).
    * Returns for each row the assigned column, or -1 if matched to padding.
    * O(n³) Hungarian algorithm with potentials.
    */
  def hungarianMax(weights: Array[Array[Double]]): Array[Int] = {
    val rows = weights.length
    if (rows == 0) return Array.empty
    val cols = weights(0).length
    val n = math.max(rows, cols)
    // Minimisation form on a padded square matrix of costs = maxW - w.
    val maxW = weights.iterator.flatMap(_.iterator).foldLeft(0.0)(math.max)
    val cost = Array.tabulate(n, n) { (i, j) =>
      if (i < rows && j < cols) maxW - weights(i)(j) else maxW
    }
    // Standard O(n³) algorithm (1-indexed potentials formulation).
    val u = new Array[Double](n + 1)
    val v = new Array[Double](n + 1)
    val p = new Array[Int](n + 1) // p(j) = row matched to column j
    val way = new Array[Int](n + 1)
    for (i <- 1 to n) {
      p(0) = i
      var j0 = 0
      val minv = Array.fill(n + 1)(Double.MaxValue)
      val used = new Array[Boolean](n + 1)
      var done = false
      while (!done) {
        used(j0) = true
        val i0 = p(j0)
        var delta = Double.MaxValue
        var j1 = -1
        for (j <- 1 to n if !used(j)) {
          val cur = cost(i0 - 1)(j - 1) - u(i0) - v(j)
          if (cur < minv(j)) { minv(j) = cur; way(j) = j0 }
          if (minv(j) < delta) { delta = minv(j); j1 = j }
        }
        for (j <- 0 to n) {
          if (used(j)) { u(p(j)) += delta; v(j) -= delta }
          else minv(j) -= delta
        }
        j0 = j1
        if (p(j0) == 0) done = true
      }
      while (j0 != 0) {
        val j1 = way(j0)
        p(j0) = p(j1)
        j0 = j1
      }
    }
    val assignment = Array.fill(rows)(-1)
    for (j <- 1 to n) {
      val i = p(j)
      if (i >= 1 && i <= rows && j <= cols) assignment(i - 1) = j - 1
    }
    assignment
  }
}
