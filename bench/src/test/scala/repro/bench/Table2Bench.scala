package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Table II analogue: generated dataset statistics vs the paper's datasets.
  * Cardinalities are scaled (see DESIGN.md); arity and split character match.
  */
class Table2Bench extends SparkSpec {
  test("table 2: dataset statistics (paper vs generated)") {
    val rows = Experiments.table2(spark, Experiments.AllDomains)
    rows.foreach { r =>
      val (pa, pb, parity, ptr, pte) = PaperNumbers.table2(r.domain)
      println(f"[table2] ${r.domain}%-7s paper card=$pa/$pb arity=$parity train=$ptr test=$pte" +
        f"  ||  ours card=${r.cardA}/${r.cardB} arity=${r.arity} train=${r.train} test=${r.test} " +
        (if (r.clean) "clean" else "noisy"))
      assert(r.arity == parity, s"${r.domain}: arity mismatch")
      // scaled cardinalities keep the A-vs-B size ordering of the paper
      assert((r.cardA >= r.cardB) == (pa >= pb) || math.abs(r.cardA - r.cardB) < 200,
        s"${r.domain}: table size ordering flipped")
    }
    assert(rows.size == 9)
  }
}
