package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import scala.collection.parallel.CollectionConverters._

/** Table IV: representation learning P/R/F1 @ K=10 — raw-IR nearest-neighbour
  * search vs VAE-encoded search, for all four IR families on all nine domains.
  */
class Table4Bench extends SparkSpec {
  test("table 4: IR vs VAER representation search") {
    val rows = Experiments.AllDomains.par
      .map(d => Experiments.table4(spark, Seq(d), Experiments.AllProviders))
      .seq.flatten
    val ordered = rows.sortBy(r =>
      (Experiments.AllDomains.indexOf(r.domain), Experiments.AllProviders.indexOf(r.ir)))
    ordered.foreach { r =>
      val (pIr, pVaer) = PaperNumbers.table4F1((r.domain, r.ir))
      println(f"[table4] ${r.domain}%-7s ${r.ir}%-6s " +
        f"paper F1 ir=$pIr%.2f vaer=$pVaer%.2f  ||  ours " +
        f"ir P=${r.irPrf.p}%.2f R=${r.irPrf.r}%.2f F1=${r.irPrf.f1}%.2f  " +
        f"vaer P=${r.vaerPrf.p}%.2f R=${r.vaerPrf.r}%.2f F1=${r.vaerPrf.f1}%.2f")
    }
    // The paper's claim is that VAE encodings are similarity-preserving
    // across IR types (its IRs were weak enough that encoding *improved*
    // them, +0.064 mean F1; our synthetic IRs sit near the ceiling, so the
    // realistic shape check is preservation, not improvement).
    val deltas = ordered.map(r => r.vaerPrf.f1 - r.irPrf.f1)
    val meanDelta = deltas.sum / deltas.size
    println(f"[table4] mean F1 delta (VAER - IR) = $meanDelta%+.3f (paper: +0.064)")
    assert(meanDelta > -0.15, f"VAE encoding destroyed IR search quality: $meanDelta%+.3f")
    // recall matters most (blocking role, §VI-B): VAER recall must stay high
    // on the clean domains and nonzero everywhere (no posterior collapse)
    val cleanRecall = ordered.filter(r => Seq("Rest.", "Cit. 1", "Cit. 2").contains(r.domain))
      .map(_.vaerPrf.r)
    assert(cleanRecall.forall(_ > 0.5), s"low clean-domain recall: $cleanRecall")
    assert(ordered.forall(_.vaerPrf.r > 0.0), "collapsed representation (zero recall) detected")
  }
}
