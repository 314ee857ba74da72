package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import scala.collection.parallel.CollectionConverters._

/** Table VII: recall@10 and matching F1 with the representation model trained
  * locally vs transferred from Citations 2 (arity-4 pad/truncate rule).
  */
class Table7Bench extends SparkSpec {
  test("table 7: local vs transferred representation models") {
    val rows = Experiments.table7(spark, Experiments.AllDomains)
    rows.foreach { r =>
      val (plr, ptr_, plf, ptf) = PaperNumbers.table7(r.domain)
      println(f"[table7] ${r.domain}%-7s paper recall $plr%.2f->$ptr_%.2f F1 $plf%.2f->$ptf%.2f" +
        f"  ||  ours recall ${r.localRecall}%.2f->${r.transfRecall}%.2f " +
        f"(Δ=${r.transfRecall - r.localRecall}%+.2f) F1 ${r.localF1}%.2f->${r.transfF1}%.2f " +
        f"(Δ=${r.transfF1 - r.localF1}%+.2f)")
    }
    // The transferability claim: swapping in a foreign representation model
    // moves recall and matching F1 only marginally.
    val recallDeltas = rows.map(r => math.abs(r.transfRecall - r.localRecall))
    val f1Deltas     = rows.map(r => math.abs(r.transfF1 - r.localF1))
    println(f"[table7] mean |Δrecall|=${recallDeltas.sum / rows.size}%.3f " +
      f"mean |ΔF1|=${f1Deltas.sum / rows.size}%.3f (paper: 0.010 / 0.014)")
    assert(recallDeltas.sum / rows.size < 0.15, s"transfer degraded recall: $recallDeltas")
    assert(f1Deltas.sum / rows.size < 0.15, s"transfer degraded matching: $f1Deltas")
  }
}
