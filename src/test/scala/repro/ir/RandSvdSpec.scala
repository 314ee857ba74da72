package repro.ir

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.{Mat, Rng}

class RandSvdSpec extends AnyFunSuite {

  test("orthonormalize yields orthonormal columns") {
    val m = Mat.randn(20, 5, new Rng(1))
    val q = RandSvd.orthonormalize(m)
    for (i <- 0 until 5; j <- 0 until 5) {
      var dot = 0.0
      (0 until 20).foreach(r => dot += q(r, i) * q(r, j))
      val expected = if (i == j) 1.0 else 0.0
      assert(math.abs(dot - expected) < 1e-9, s"col $i . col $j = $dot")
    }
  }

  test("jacobiEigen recovers a known spectrum") {
    // A = V diag(5,2,1) V^T for an orthonormal V
    val v0 = RandSvd.orthonormalize(Mat.randn(3, 3, new Rng(2)))
    val d  = Mat.zeros(3, 3); d(0, 0) = 5; d(1, 1) = 2; d(2, 2) = 1
    val a  = v0 * d * v0.t
    val (vals, vecs) = RandSvd.jacobiEigen(a)
    assert(vals.sorted.zip(Array(1.0, 2.0, 5.0)).forall { case (x, y) => math.abs(x - y) < 1e-8 })
    // eigenvectors satisfy A v = lambda v
    (0 until 3).foreach { c =>
      val vec = Mat.fromRows(Seq(Array(vecs(0, c), vecs(1, c), vecs(2, c)))).t
      val av  = a * vec
      (0 until 3).foreach { r =>
        assert(math.abs(av(r, 0) - vals(c) * vec(r, 0)) < 1e-7)
      }
    }
  }

  test("jacobiEigen requires a square matrix") {
    intercept[IllegalArgumentException](RandSvd.jacobiEigen(Mat.zeros(2, 3)))
  }

  test("docEmbeddings separates two disjoint topics") {
    // Docs 0-4 use terms 0-4; docs 5-9 use terms 5-9.
    val rows = IndexedSeq.tabulate(10) { d =>
      val base = if (d < 5) 0 else 5
      Seq((base + d % 5, 1.0), (base + (d + 1) % 5, 0.5))
    }
    val emb = RandSvd.docEmbeddings(rows, 10, 4, new Rng(3))
    assert(emb.rows == 10 && emb.cols == 4)
    def cos(i: Int, j: Int): Double = HashEmb.cosine(emb.row(i), emb.row(j))
    // same-topic docs more similar than cross-topic on average
    val same  = (for (i <- 0 until 4; j <- i + 1 until 5) yield cos(i, j)).sum / 10
    val cross = (for (i <- 0 until 5; j <- 5 until 10) yield cos(i, j)).sum / 25
    assert(same > cross + 0.2, s"same=$same cross=$cross")
  }

  test("docEmbeddings approximates an exactly low-rank matrix well") {
    // Rank-2 matrix: docs are combinations of two term blocks.
    val rng  = new Rng(4)
    val rows = IndexedSeq.tabulate(30) { d =>
      val w1 = rng.nextDouble(); val w2 = rng.nextDouble()
      (0 until 6).map(t => (t, w1 * 2)) ++ (6 until 12).map(t => (t, w2 * 3))
    }
    val emb = RandSvd.docEmbeddings(rows, 12, 2, new Rng(5))
    // Frobenius energy of the embeddings should capture almost all of A's
    // (rank 2 means 2 singular values carry everything).
    val aNormSq = rows.flatMap(_.map { case (_, w) => w * w }).sum
    val eNormSq = emb.data.map(x => x * x).sum
    assert(eNormSq > 0.98 * aNormSq, s"captured ${eNormSq / aNormSq}")
  }

  test("requested rank above matrix rank pads with zero columns") {
    val rows = IndexedSeq(Seq((0, 1.0)), Seq((0, 2.0)))
    val emb  = RandSvd.docEmbeddings(rows, 1, 4, new Rng(6))
    assert(emb.cols == 4)
  }

  test("deterministic in the seed") {
    val rows = IndexedSeq.tabulate(8)(d => Seq((d % 3, 1.0), ((d + 1) % 3, 2.0)))
    val a = RandSvd.docEmbeddings(rows, 3, 2, new Rng(7))
    val b = RandSvd.docEmbeddings(rows, 3, 2, new Rng(7))
    assert(a.data.toSeq == b.data.toSeq)
  }

  test("empty corpus is rejected") {
    intercept[IllegalArgumentException](
      RandSvd.docEmbeddings(IndexedSeq.empty, 5, 2, new Rng(8)))
  }
}
