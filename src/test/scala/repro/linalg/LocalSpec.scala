package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

/** Pure local linear algebra — no Spark needed. */
class LocalSpec extends AnyFunSuite {

  private val rng = new scala.util.Random(17)
  private def randMat(n: Int, m: Int): Local.Mat =
    Array.fill(n)(Array.fill(m)(rng.nextGaussian()))
  private def randSym(n: Int): Local.Mat = {
    val a = randMat(n, n)
    Local.scale(Local.add(a, Local.transpose(a)), 0.5)
  }
  private def randSpd(n: Int): Local.Mat = {
    val a = randMat(n, n)
    val m = Local.matmul(a, Local.transpose(a))
    var i = 0
    while (i < n) { m(i)(i) += 0.5; i += 1 }
    m
  }

  test("matmul matches hand example") {
    val a = Array(Array(1.0, 2.0), Array(3.0, 4.0))
    val b = Array(Array(5.0, 6.0), Array(7.0, 8.0))
    val c = Local.matmul(a, b)
    assert(c(0).sameElements(Array(19.0, 22.0)))
    assert(c(1).sameElements(Array(43.0, 50.0)))
  }

  test("matmul with identity is identity op") {
    val a = randMat(5, 5)
    assert(Local.maxAbsDiff(Local.matmul(a, Local.eye(5)), a) < 1e-12)
    assert(Local.maxAbsDiff(Local.matmul(Local.eye(5), a), a) < 1e-12)
  }

  test("transpose is an involution") {
    val a = randMat(4, 7)
    assert(Local.maxAbsDiff(Local.transpose(Local.transpose(a)), a) == 0.0)
  }

  test("vecMat agrees with matmul on a single row") {
    val a = randMat(1, 6); val b = randMat(6, 3)
    val viaMat = Local.matmul(a, b)(0)
    val viaVec = Local.vecMat(a(0), b)
    assert(viaMat.zip(viaVec).forall { case (x, y) => math.abs(x - y) < 1e-12 })
  }

  test("symEigDesc reconstructs the matrix") {
    val a = randSym(8)
    val (v, lam) = Local.symEigDesc(a)
    val recon = Local.matmul(Local.matmul(v, diag(lam)), Local.transpose(v))
    assert(Local.maxAbsDiff(recon, a) < 1e-8)
  }

  test("symEigDesc eigenvalues descend") {
    val (_, lam) = Local.symEigDesc(randSym(9))
    assert(lam.sliding(2).forall(p => p(0) >= p(1) - 1e-12))
  }

  test("symEigDesc eigenvectors are orthonormal") {
    val (v, _) = Local.symEigDesc(randSym(7))
    val vtv = Local.matmul(Local.transpose(v), v)
    assert(Local.maxAbsDiff(vtv, Local.eye(7)) < 1e-8)
  }

  test("symEigDesc on diagonal matrix returns the diagonal sorted") {
    val d = Local.zeros(4, 4)
    d(0)(0) = 2; d(1)(1) = 5; d(2)(2) = -1; d(3)(3) = 3
    val (_, lam) = Local.symEigDesc(d)
    assert(lam.sameElements(Array(5.0, 3.0, 2.0, -1.0)))
  }

  test("choleskyUpper satisfies A = RᵀR") {
    val a = randSpd(6)
    val r = Local.choleskyUpper(a)
    assert(Local.maxAbsDiff(Local.matmul(Local.transpose(r), r), a) < 1e-8)
  }

  test("choleskyUpper output is upper triangular") {
    val r = Local.choleskyUpper(randSpd(5))
    for (i <- 1 until 5; j <- 0 until i) assert(r(i)(j) == 0.0)
  }

  test("invUpper inverts upper triangular matrices") {
    val r = Local.choleskyUpper(randSpd(6))
    val prod = Local.matmul(r, Local.invUpper(r))
    assert(Local.maxAbsDiff(prod, Local.eye(6)) < 1e-8)
  }

  test("svdSmall reconstructs the matrix") {
    val a = randMat(5, 5)
    val (u, s, v) = Local.svdSmall(a)
    val recon = Local.matmul(Local.matmul(u, diag(s)), Local.transpose(v))
    assert(Local.maxAbsDiff(recon, a) < 1e-8)
  }

  test("svdSmall singular values are nonnegative and descending") {
    val (_, s, _) = Local.svdSmall(randMat(6, 6))
    assert(s.forall(_ >= 0))
    assert(s.sliding(2).forall(p => p(0) >= p(1) - 1e-12))
  }

  test("svdSmall factors are orthogonal") {
    val (u, _, v) = Local.svdSmall(randMat(4, 4))
    assert(Local.maxAbsDiff(Local.matmul(Local.transpose(u), u), Local.eye(4)) < 1e-8)
    assert(Local.maxAbsDiff(Local.matmul(Local.transpose(v), v), Local.eye(4)) < 1e-8)
  }

  test("mix is deterministic and spreads inputs") {
    assert(Local.mix(42L) == Local.mix(42L))
    val vals = (0L until 1000L).map(Local.mix).toSet
    assert(vals.size == 1000)
  }

  test("gaussianVec deterministic per (seed,id), differs across ids") {
    val a = Local.gaussianVec(1, 2, 8)
    assert(a.sameElements(Local.gaussianVec(1, 2, 8)))
    assert(!a.sameElements(Local.gaussianVec(1, 3, 8)))
    assert(!a.sameElements(Local.gaussianVec(2, 2, 8)))
  }

  test("rademacherVec entries are ±1/√dim") {
    val v = Local.rademacherVec(5, 9, 16)
    val mag = 1.0 / math.sqrt(16.0)
    assert(v.forall(x => math.abs(math.abs(x) - mag) < 1e-15))
  }

  test("l2 and sqDist agree") {
    val a = Array(3.0, 4.0)
    assert(math.abs(Local.l2(a) - 5.0) < 1e-12)
    assert(math.abs(Local.sqDist(a, Array(0.0, 0.0)) - 25.0) < 1e-12)
  }

  test("argmax returns first maximal index") {
    assert(Local.argmax(Array(1.0, 3.0, 3.0, 2.0)) == 1)
    assert(Local.argmax(Array(-5.0)) == 0)
  }

  test("addInPlace accumulates into the first argument") {
    val a = Array(1.0, 2.0)
    val r = Local.addInPlace(a, Array(10.0, 20.0))
    assert(r eq a)
    assert(a.sameElements(Array(11.0, 22.0)))
  }

  test("axpy scales into a fresh array") {
    val x = Array(1.0, -2.0)
    val y = Local.axpy(3.0, x)
    assert(y.sameElements(Array(3.0, -6.0)))
    assert(x.sameElements(Array(1.0, -2.0)))
  }

  test("property: matmul is associative across random shapes") {
    for (_ <- 0 until 25) {
      val n = 1 + rng.nextInt(5); val m = 1 + rng.nextInt(5)
      val p = 1 + rng.nextInt(5); val q = 1 + rng.nextInt(5)
      val a = randMat(n, m); val b = randMat(m, p); val c = randMat(p, q)
      val l = Local.matmul(Local.matmul(a, b), c)
      val r = Local.matmul(a, Local.matmul(b, c))
      assert(Local.maxAbsDiff(l, r) < 1e-9)
    }
  }

  test("property: eigenvalue sum equals trace across random sizes") {
    for (_ <- 0 until 25) {
      val n = 2 + rng.nextInt(8)
      val a = randSym(n)
      val (_, lam) = Local.symEigDesc(a)
      val tr = (0 until n).map(i => a(i)(i)).sum
      assert(math.abs(lam.sum - tr) < 1e-8)
    }
  }

  private def diag(d: Array[Double]): Local.Mat = {
    val m = Local.zeros(d.length, d.length)
    d.indices.foreach(i => m(i)(i) = d(i))
    m
  }
}
