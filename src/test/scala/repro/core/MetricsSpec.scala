package repro.core

import repro.SparkSpec

/** Clustering metrics: known-value cases, invariances, Hungarian matching. */
class MetricsSpec extends SparkSpec {

  private lazy val sp = spark

  private def df(pairs: Seq[(Long, Int)], col2: String) = {
    import sp.implicits._
    pairs.toDF("id", col2)
  }

  private def scores(pred: Seq[(Long, Int)], truth: Seq[(Long, Int)]) =
    Metrics.evaluate(df(pred, "cluster"), df(truth, "label"))

  test("perfect clustering scores 1.0 on all metrics") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 2, 5L -> 2)
    val s = scores(truth, truth)
    assert(s.acc == 1.0 && s.f1 == 1.0)
    assert(math.abs(s.nmi - 1.0) < 1e-12 && math.abs(s.ari - 1.0) < 1e-12)
  }

  test("perfect clustering under label permutation still scores 1.0") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 2, 5L -> 2)
    val pred  = truth.map { case (id, l) => id -> ((l + 1) % 3) }
    val s = scores(pred, truth)
    assert(s.acc == 1.0 && s.f1 == 1.0)
    assert(math.abs(s.nmi - 1.0) < 1e-12 && math.abs(s.ari - 1.0) < 1e-12)
  }

  test("single-cluster prediction has zero NMI and ARI") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1)
    val pred  = truth.map { case (id, _) => id -> 0 }
    val s = scores(pred, truth)
    assert(s.nmi == 0.0)
    assert(math.abs(s.ari) < 1e-12)
    assert(math.abs(s.acc - 0.5) < 1e-12) // best match covers one class
  }

  test("accuracy of a known 3/4 correct assignment") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1)
    val pred  = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 0)
    val s = scores(pred, truth)
    assert(math.abs(s.acc - 0.75) < 1e-12)
  }

  test("ARI matches the published example value") {
    // Classic example: truth [1,1,1,2,2,2], pred [1,1,2,2,3,3] → ARI = 0.2424...
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 0, 3L -> 1, 4L -> 1, 5L -> 1)
    val pred  = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 2, 5L -> 2)
    val s = scores(pred, truth)
    assert(math.abs(s.ari - 0.24242424242424243) < 1e-9)
  }

  test("NMI is symmetric in pred/truth") {
    val a = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 2, 5L -> 0)
    val b = Seq(0L -> 1, 1L -> 0, 2L -> 1, 3L -> 2, 4L -> 2, 5L -> 0)
    val m1 = Metrics.contingency(df(a, "cluster"), df(b, "label"))
    val m2 = Metrics.contingency(df(b, "cluster"), df(a, "label"))
    assert(math.abs(Metrics.nmi(m1) - Metrics.nmi(m2)) < 1e-12)
  }

  test("random labels give near-zero ARI on a larger instance") {
    val rnd = new scala.util.Random(8)
    val n = 2000
    val truth = (0L until n.toLong).map(i => i -> rnd.nextInt(4))
    val pred  = (0L until n.toLong).map(i => i -> rnd.nextInt(4))
    val s = scores(pred, truth)
    assert(math.abs(s.ari) < 0.05)
    assert(s.nmi < 0.05)
  }

  test("metrics handle k_pred != k_true (rectangular contingency)") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 1)
    val pred  = Seq(0L -> 0, 1L -> 1, 2L -> 2, 3L -> 2, 4L -> 3)
    val s = scores(pred, truth)
    assert(s.acc > 0 && s.acc <= 1.0)
    assert(s.f1 >= 0 && s.f1 <= 1.0)
  }

  test("hungarianMax picks the optimal assignment, not the greedy one") {
    // Greedy on rows would take (0,0)=5 then (1,1)=1 → 6; optimal is 4+3=7.
    val w = Array(Array(5.0, 4.0), Array(3.0, 1.0))
    val a = Metrics.hungarianMax(w)
    assert(a.sameElements(Array(1, 0)))
  }

  test("hungarianMax on identity-dominant matrix is the identity") {
    val w = Array(
      Array(10.0, 1.0, 0.0),
      Array(0.0, 9.0, 2.0),
      Array(1.0, 0.0, 8.0))
    assert(Metrics.hungarianMax(w).sameElements(Array(0, 1, 2)))
  }

  test("hungarianMax handles rectangular matrices (more rows than cols)") {
    val w = Array(Array(1.0), Array(5.0), Array(2.0))
    val a = Metrics.hungarianMax(w)
    assert(a.count(_ >= 0) == 1)
    assert(a(1) == 0) // row 1 takes the single column
  }

  test("hungarianMax handles rectangular matrices (more cols than rows)") {
    val w = Array(Array(1.0, 9.0, 2.0))
    assert(Metrics.hungarianMax(w).sameElements(Array(1)))
  }

  test("hungarianMax total weight beats 200 random assignments") {
    val rnd = new scala.util.Random(11)
    val n = 6
    val w = Array.fill(n)(Array.fill(n)(rnd.nextDouble() * 10))
    val a = Metrics.hungarianMax(w)
    val best = a.zipWithIndex.map { case (j, i) => w(i)(j) }.sum
    for (_ <- 0 until 200) {
      val perm = rnd.shuffle((0 until n).toList)
      val v = perm.zipWithIndex.map { case (j, i) => w(i)(j) }.sum
      assert(v <= best + 1e-9)
    }
  }

  test("accuracy is invariant to cluster id remapping") {
    val truth = Seq(0L -> 0, 1L -> 1, 2L -> 2, 3L -> 0, 4L -> 1, 5L -> 2, 6L -> 0)
    val pred  = Seq(0L -> 2, 1L -> 0, 2L -> 1, 3L -> 2, 4L -> 0, 5L -> 1, 6L -> 1)
    val remap = Map(0 -> 7, 1 -> 3, 2 -> 5)
    val pred2 = pred.map { case (id, c) => id -> remap(c) }
    assert(scores(pred, truth).acc == scores(pred2, truth).acc)
  }

  test("F1 is in [0,1] and equals 1 only for perfect clustering") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1)
    val bad   = Seq(0L -> 0, 1L -> 1, 2L -> 0, 3L -> 1)
    val s = scores(bad, truth)
    assert(s.f1 >= 0 && s.f1 < 1.0)
  }

  test("contingency counts are exact") {
    val truth = Seq(0L -> 0, 1L -> 0, 2L -> 1, 3L -> 1, 4L -> 1)
    val pred  = Seq(0L -> 0, 1L -> 0, 2L -> 0, 3L -> 1, 4L -> 1)
    val m = Metrics.contingency(df(pred, "cluster"), df(truth, "label"))
    assert(m.map(_.sum).sum == 5)
    assert(m(0)(0) == 2 && m(0)(1) == 1 && m(1)(0) == 0 && m(1)(1) == 2)
  }
}
