package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Tables V + VI: supervised matching effectiveness (VAER^LSA vs DeepER, DM,
  * DITTO) and the training-time comparison. Runs sequentially so wall-clock
  * timings are not distorted by co-scheduling.
  */
class Table56Bench extends SparkSpec {
  test("tables 5+6: matching effectiveness and training times") {
    val rows = Experiments.table56(spark, Experiments.AllDomains)
    rows.foreach { r =>
      val (pv, pder, pdm, pditto) = PaperNumbers.table5F1(r.domain)
      val (ptr, ptm, ptder, ptdm, ptditto) = PaperNumbers.table6(r.domain)
      println(f"[table5] ${r.domain}%-7s paper F1 vaer=$pv%.2f der=$pder%.2f dm=$pdm%.2f ditto=$pditto%.2f" +
        f"  ||  ours vaer=${r.vaer.f1}%.2f der=${r.der.f1}%.2f dm=${r.dm.f1}%.2f ditto=${r.ditto.f1}%.2f" +
        f"  (ours P/R: vaer ${r.vaer.p}%.2f/${r.vaer.r}%.2f der ${r.der.p}%.2f/${r.der.r}%.2f" +
        f" dm ${r.dm.p}%.2f/${r.dm.r}%.2f ditto ${r.ditto.p}%.2f/${r.ditto.r}%.2f)")
      println(f"[table6] ${r.domain}%-7s paper(s) repr=$ptr%.1f match=$ptm%.1f der=$ptder%.1f dm=$ptdm%.1f ditto=$ptditto%.1f" +
        f"  ||  ours(s) repr=${r.tRepr}%.1f match=${r.tMatch}%.1f der=${r.tDer}%.1f dm=${r.tDm}%.1f ditto=${r.tDitto}%.1f")
    }

    // Effectiveness shape: VAER is competitive with the baselines everywhere.
    rows.foreach { r =>
      val best = Seq(r.der.f1, r.dm.f1, r.ditto.f1).max
      assert(r.vaer.f1 > best - 0.25, s"${r.domain}: VAER F1 ${r.vaer.f1} far below best baseline $best")
    }
    // Cost shape (the paper's central Table VI claim): VAER's matcher trains
    // far faster than the end-to-end baselines. Asserted in aggregate and on
    // a domain majority — single-domain wall-clock is noisy on a shared JVM.
    val sumMatch = rows.map(_.tMatch).sum
    assert(sumMatch < rows.map(_.tDm).sum,
      s"total match time ${sumMatch}s not below total DM time")
    assert(sumMatch < rows.map(_.tDer).sum,
      s"total match time ${sumMatch}s not below total DeepER time")
    assert(rows.count(r => r.tMatch < r.tDm) >= 7,
      "match slower than DM on 3+ domains")
    val speedups = rows.map(r => r.tDm / (r.tRepr + r.tMatch))
    println(f"[table6] DM total-time speedup range: ${speedups.min}%.1fx .. ${speedups.max}%.1fx " +
      "(paper: ~1.2x (Cosm.) .. ~44x (Cit. 1))")
  }
}
