package repro.er

import org.scalatest.funsuite.AnyFunSuite
import repro.core.TupleRepr

class TopKEvalSpec extends AnyFunSuite {

  private def repr(v: Double*): TupleRepr =
    TupleRepr(Array(v.toArray), Array(v.toArray.map(_ => 0.1)))

  private val reprs: Map[(String, Long), TupleRepr] = Map(
    ("A", 1L) -> repr(0.0, 0.0),
    ("A", 2L) -> repr(10.0, 10.0),
    ("B", 1L) -> repr(0.1, 0.0),   // near A1
    ("B", 2L) -> repr(10.0, 10.1), // near A2
    ("B", 3L) -> repr(6.0, 6.0),   // far from both, nearer to A2
  )

  test("neighbours returns both directions with k entries") {
    val (ab, ba) = TopKEval.neighbours(reprs, k = 2, rerankW2 = false)
    assert(ab.keySet == Set(1L, 2L) && ba.keySet == Set(1L, 2L, 3L))
    assert(ab(1L).head == 1L, "A1's nearest B must be B1")
    assert(ab(2L).head == 2L, "A2's nearest B must be B2")
    assert(ab.values.forall(_.size == 2))
  }

  test("prfAtK counts membership in either direction") {
    val test = Seq(
      LabeledPair(1, 1, 1), // true dup, found
      LabeledPair(2, 2, 1), // true dup, found
      LabeledPair(1, 3, 0), // non-dup
    )
    val prf = TopKEval.evaluate(reprs, test, k = 1, rerankW2 = false)
    assert(prf.r == 1.0, s"recall ${prf.r}")
    assert(prf.p == 1.0, s"precision ${prf.p}")
  }

  test("k=1 misses a dup that is not the closest neighbour") {
    // make B3 the true match of A1 even though B1 is closer
    val test = Seq(LabeledPair(1, 3, 1))
    val prf = TopKEval.evaluate(reprs, test, k = 1, rerankW2 = false)
    assert(prf.r == 0.0)
  }

  test("larger k recovers more dup pairs (recall monotone in k)") {
    val test = Seq(LabeledPair(1, 3, 1), LabeledPair(1, 1, 1))
    val r1 = TopKEval.evaluate(reprs, test, k = 1, rerankW2 = false).r
    val r3 = TopKEval.evaluate(reprs, test, k = 3, rerankW2 = false).r
    assert(r3 >= r1)
    assert(r3 == 1.0)
  }

  test("W2 re-ranking can reorder candidates with differing sigmas") {
    // two B candidates equidistant in mu; sigma breaks the tie
    val rs: Map[(String, Long), TupleRepr] = Map(
      ("A", 1L) -> TupleRepr(Array(Array(0.0)), Array(Array(0.5))),
      ("B", 1L) -> TupleRepr(Array(Array(1.0)), Array(Array(5.0))),  // far sigma
      ("B", 2L) -> TupleRepr(Array(Array(-1.0)), Array(Array(0.5))), // same sigma
    )
    val (ab, _) = TopKEval.neighbours(rs, k = 1, rerankW2 = true)
    assert(ab(1L) == Seq(2L), s"expected sigma-aware rerank, got ${ab(1L)}")
    val (abNo, _) = TopKEval.neighbours(rs, k = 1, rerankW2 = false)
    // without rerank the tie resolves by id
    assert(abNo(1L) == Seq(1L))
  }

  test("false positives lower precision") {
    val test = Seq(LabeledPair(1, 1, 0), LabeledPair(2, 2, 1))
    val prf = TopKEval.evaluate(reprs, test, k = 1, rerankW2 = false)
    assert(prf.p == 0.5 && prf.r == 1.0)
  }
}
