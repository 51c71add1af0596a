package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.linalg.Local

/** Numerical checks of the paper's lemmas/theorems on small dense instances
  * computed exactly (driver-side) — the ground truth the distributed code is
  * built on.
  */
class LemmaSpec extends AnyFunSuite {

  private val alpha = 0.3

  /** A small random bipartite graph as dense W (nU×nV), min-degree ≥ 1. */
  private def denseGraph(nU: Int, nV: Int, seed: Int): Local.Mat = {
    val rnd = new scala.util.Random(seed)
    val w = Local.zeros(nU, nV)
    for (i <- 0 until nU; j <- 0 until nV if rnd.nextDouble() < 0.35)
      w(i)(j) = 1.0 + rnd.nextInt(4)
    for (i <- 0 until nU if w(i).forall(_ == 0)) w(i)(i % nV) = 1.0
    for (j <- 0 until nV if (0 until nU).forall(w(_)(j) == 0.0)) w(j % nU)(j) = 1.0
    w
  }

  private def pOf(w: Local.Mat): Local.Mat = {
    val du = w.map(_.sum)
    w.zipWithIndex.map { case (row, i) => row.map(_ / du(i)) }
  }

  /** Q (nV×nU): q(j,i) = w(i,j)/sqrt(du_i·dv_j). */
  private def qOf(w: Local.Mat): Local.Mat = {
    val nU = w.length; val nV = w(0).length
    val du = w.map(_.sum)
    val dv = Array.tabulate(nV)(j => (0 until nU).map(i => w(i)(j)).sum)
    Array.tabulate(nV, nU)((j, i) =>
      if (w(i)(j) == 0) 0.0 else w(i)(j) / math.sqrt(du(i) * dv(j)))
  }

  /** F = Σ_λ (1-α) α^λ P (QQᵀ)^λ by direct series summation. */
  private def fOf(p: Local.Mat, q: Local.Mat, terms: Int = 300): Local.Mat = {
    val qqt = Local.matmul(q, Local.transpose(q))
    var cur = p.map(_.clone()) // P (QQᵀ)^0
    var f = Local.scale(cur, 1 - alpha)
    var lam = 1
    while (lam < terms) {
      cur = Local.matmul(cur, qqt)
      f = Local.add(f, Local.scale(cur, (1 - alpha) * math.pow(alpha, lam)))
      lam += 1
    }
    f
  }

  private val w = denseGraph(10, 8, 11)
  private val p = pOf(w)
  private val q = qOf(w)
  private val f = fOf(p, q)

  test("Lemma 2.2: F entries are bounded, 0 ≤ F_ij ≤ 1") {
    // The paper states F_ij ≤ P_ij element-wise; that can only hold on the
    // support of P (for λ ≥ 1 random walks reach non-neighbours, so F_ij > 0
    // where P_ij = 0 — verified here). The load-bearing part of the lemma is
    // boundedness/convergence, which we assert.
    for (i <- f.indices; j <- f(i).indices) {
      assert(f(i)(j) >= -1e-12)
      assert(f(i)(j) <= 1.0 + 1e-9)
    }
    val offSupport = (for (i <- f.indices; j <- f(i).indices
                           if p(i)(j) == 0.0 && f(i)(j) > 1e-9) yield 1).size
    assert(offSupport > 0, "expected positive F mass off the support of P")
  }

  test("Lemma 2.2 proof machinery: QQᵀ = Δ^{1/2} Ω Δ^{-1/2} with Ω row-stochastic") {
    // The lemma's stated bound F_ij ≤ P_ij does not hold element-wise (the
    // similarity transform scales entries above 1), but the structural facts
    // its proof rests on do: Ω_jl = Σ_i p(v_j,u_i)p(u_i,v_l) is row-stochastic
    // and QQᵀ is similar to it via the degree scaling Δ.
    val nU = w.length; val nV = w(0).length
    val du = w.map(_.sum)
    val dv = Array.tabulate(nV)(j => (0 until nU).map(i => w(i)(j)).sum)
    val omega = Array.tabulate(nV, nV) { (j, l) =>
      (0 until nU).map(i => (w(i)(j) / dv(j)) * (w(i)(l) / du(i))).sum
    }
    omega.foreach(row => assert(math.abs(row.sum - 1.0) < 1e-9))
    val qqt = Local.matmul(q, Local.transpose(q))
    for (j <- 0 until nV; l <- 0 until nV) {
      val expected = math.sqrt(dv(j)) * omega(j)(l) / math.sqrt(dv(l))
      assert(math.abs(qqt(j)(l) - expected) < 1e-9)
    }
  }

  test("largest singular value of Q is at most 1 (Lemma 3.1 proof)") {
    val (_, s, _) = Local.svdSmall(q)
    assert(s(0) <= 1.0 + 1e-9, s"σ1 = ${s(0)}")
  }

  test("Lemma 3.1: the series equals U diag((1-α)/(1-ασ²)) Uᵀ") {
    val (u, s, _) = Local.svdSmall(q)
    val d = s.map(sv => (1 - alpha) / (1 - alpha * sv * sv))
    val diag = Local.zeros(d.length, d.length)
    d.indices.foreach(i => diag(i)(i) = d(i))
    val viaEig = Local.matmul(Local.matmul(u, diag), Local.transpose(u))
    // series Σ (1-α)α^λ (QQᵀ)^λ computed directly
    val qqt = Local.matmul(q, Local.transpose(q))
    var cur = Local.eye(q.length)
    var series = Local.scale(cur, 1 - alpha)
    for (lam <- 1 until 300) {
      cur = Local.matmul(cur, qqt)
      series = Local.add(series, Local.scale(cur, (1 - alpha) * math.pow(alpha, lam)))
    }
    assert(Local.maxAbsDiff(viaEig, series) < 1e-10)
  }

  test("F = P · U diag((1-α)/(1-ασ²)) Uᵀ (the HOPE computation path)") {
    val (u, s, _) = Local.svdSmall(q)
    val d = s.map(sv => (1 - alpha) / (1 - alpha * sv * sv))
    val diag = Local.zeros(d.length, d.length)
    d.indices.foreach(i => diag(i)(i) = d(i))
    val viaHope = Local.matmul(p, Local.matmul(Local.matmul(u, diag), Local.transpose(u)))
    assert(Local.maxAbsDiff(viaHope, f) < 1e-10)
  }

  test("X̂X̂ᵀ = FFᵀ and ‖X̂_i‖ = ‖F_i‖ for β = |V| (Section 3 identities)") {
    val (u, s, _) = Local.svdSmall(q)
    val d = s.map(sv => (1 - alpha) / (1 - alpha * sv * sv))
    val ud = Local.matmul(u, { val m = Local.zeros(d.length, d.length); d.indices.foreach(i => m(i)(i) = d(i)); m })
    val xHat = Local.matmul(p, ud) // |U|×|V|
    val lhs = Local.matmul(xHat, Local.transpose(xHat))
    val rhs = Local.matmul(f, Local.transpose(f))
    assert(Local.maxAbsDiff(lhs, rhs) < 1e-10)
    for (i <- xHat.indices)
      assert(math.abs(Local.l2(xHat(i)) - Local.l2(f(i))) < 1e-10)
  }

  test("Theorem 3.2 machinery: truncation error bounded by σ (empirically)") {
    val beta = 4
    val (u, s, _) = Local.svdSmall(q)
    val d = s.map(sv => (1 - alpha) / (1 - alpha * sv * sv))
    val udTrunc = Local.zeros(q.length, beta)
    for (i <- 0 until q.length; j <- 0 until beta) udTrunc(i)(j) = u(i)(j) * d(j)
    val xHat = Local.matmul(p, udTrunc)
    val err = Local.maxAbsDiff(
      Local.matmul(xHat, Local.transpose(xHat)),
      Local.matmul(f, Local.transpose(f)))
    val sigma = math.pow((1 - alpha) / (1 - alpha * s(beta) * s(beta)), 2)
    assert(err <= sigma + 1e-9, s"err=$err sigma=$sigma")
  }

  test("normalised truncation: X pairwise distances approximate H distances") {
    val beta = 6
    val (u, s, _) = Local.svdSmall(q)
    val d = s.map(sv => (1 - alpha) / (1 - alpha * sv * sv))
    val udTrunc = Local.zeros(q.length, beta)
    for (i <- 0 until q.length; j <- 0 until beta) udTrunc(i)(j) = u(i)(j) * d(j)
    val x = Local.matmul(p, udTrunc).map(r => Local.axpy(1.0 / Local.l2(r), r))
    val h = f.map(r => Local.axpy(1.0 / Local.l2(r), r))
    var maxErr = 0.0
    for (i <- x.indices; j <- x.indices) {
      val dx = Local.sqDist(x(i), x(j))
      val dh = Local.sqDist(h(i), h(j))
      maxErr = math.max(maxErr, math.abs(dx - dh))
    }
    assert(maxErr < 0.25, s"max |‖X_i-X_j‖² - ‖H_i-H_j‖²| = $maxErr")
  }

  test("Lemma 4.4: Procrustes optimum beats random orthogonal T (Frobenius)") {
    val rnd = new scala.util.Random(3)
    val k = 4
    val l = Array.fill(12)(Array.fill(k)(rnd.nextGaussian()))
    val c = Array.fill(12)(Array.fill(k)(rnd.nextGaussian()))
    val ltc = Local.matmul(Local.transpose(l), c)
    val (phi, _, psi) = Local.svdSmall(ltc)
    val tStar = Local.matmul(phi, Local.transpose(psi))
    def fro(t: Local.Mat) = {
      val diff = Local.add(Local.matmul(l, t), Local.scale(c, -1.0))
      Local.frobenius(diff)
    }
    val best = fro(tStar)
    for (_ <- 0 until 100) {
      val g = Array.fill(k)(Array.fill(k)(rnd.nextGaussian()))
      val (qOrth, _, _) = Local.svdSmall(g) // random orthogonal via SVD
      assert(fro(qOrth) >= best - 1e-9)
    }
  }

  test("Lemma 4.5: T* = LᵀC minimises the spectral-norm error") {
    val rnd = new scala.util.Random(9)
    val k = 3
    // L with orthonormal columns (QR via our orthonormal helper path).
    val raw = Array.fill(20)(Array.fill(k)(rnd.nextGaussian()))
    val gram = Local.matmul(Local.transpose(raw), raw)
    val rInv = Local.invUpper(Local.choleskyUpper(gram))
    val l = Local.matmul(raw, rInv)
    val c = Array.fill(20)(Array.fill(k)(rnd.nextGaussian()))
    val tStar = Local.matmul(Local.transpose(l), c)
    def spec(t: Local.Mat): Double = {
      val diff = Local.add(Local.matmul(l, t), Local.scale(c, -1.0))
      val (_, s, _) = Local.svdSmall(diff)
      s(0)
    }
    val best = spec(tStar)
    for (_ <- 0 until 100) {
      val g = Array.fill(k)(Array.fill(k)(rnd.nextGaussian()))
      assert(spec(g) >= best - 1e-9)
    }
  }
}
