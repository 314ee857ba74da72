package repro.er

import org.scalatest.funsuite.AnyFunSuite
import repro.nn.Rng

class KnnSpec extends AnyFunSuite {

  private def naiveTopK(q: Array[Double], index: IndexedSeq[(Long, Array[Double])], k: Int) =
    index.map { case (id, v) => (id, Knn.sqDist(q, v)) }
      .sortBy(p => (p._2, p._1)).take(k)

  test("sqDist is the squared euclidean distance") {
    assert(Knn.sqDist(Array(0.0, 0.0), Array(3.0, 4.0)) == 25.0)
    assert(Knn.sqDist(Array(1.0), Array(1.0)) == 0.0)
  }

  test("topK matches naive sort for random data") {
    val rng = new Rng(1)
    val index = IndexedSeq.tabulate(100)(i => (i.toLong, Array.fill(5)(rng.nextGaussian())))
    val queries = IndexedSeq.tabulate(10)(i => (1000L + i, Array.fill(5)(rng.nextGaussian())))
    val got = Knn.topK(queries, index, 7)
    queries.foreach { case (qid, qv) =>
      val expect = naiveTopK(qv, index, 7)
      assert(got(qid).map(_._1) == expect.map(_._1), s"query $qid")
      got(qid).zip(expect).foreach { case ((_, d1), (_, d2)) => assert(math.abs(d1 - d2) < 1e-12) }
    }
  }

  test("k larger than index returns everything sorted") {
    val index = IndexedSeq((1L, Array(1.0)), (2L, Array(5.0)), (3L, Array(2.0)))
    val got = Knn.topK(IndexedSeq((9L, Array(0.0))), index, 10)
    assert(got(9L).map(_._1) == Seq(1L, 3L, 2L))
  }

  test("ties broken deterministically by id") {
    val index = IndexedSeq((5L, Array(1.0)), (2L, Array(1.0)), (9L, Array(1.0)))
    val got = Knn.topK(IndexedSeq((0L, Array(0.0))), index, 2)
    assert(got(0L).map(_._1) == Seq(2L, 5L))
  }
}
