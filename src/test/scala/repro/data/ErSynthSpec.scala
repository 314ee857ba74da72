package repro.data

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.nn.Rng

class ErSynthSpec extends SparkSpec {

  test("nine domains with the paper's arities are defined") {
    assert(ErSynth.domains.map(_.name) ==
      Seq("Rest.", "Cit. 1", "Cit. 2", "Cosm.", "Soft.", "Music", "Beer", "Stocks", "CRM"))
    assert(ErSynth.domains.map(_.arity) == Seq(6, 4, 4, 3, 3, 8, 4, 8, 12))
    // clean/noisy flags follow Table II daggers
    assert(ErSynth.domains.filter(_.clean).map(_.name) == Seq("Rest.", "Cit. 1", "Cit. 2", "CRM"))
  }

  test("spec lookup rejects unknown domains") {
    intercept[IllegalArgumentException](ErSynth.spec("Nope"))
  }

  test("generated tables have declared cardinality, arity, and schema") {
    val sp = ErSynth.spec("Rest.")
    val ds = ErSynth.generate(spark, sp)
    assert(ds.a.count() == sp.cardA)
    assert(ds.b.count() == sp.cardB)
    assert(ds.a.columns.toSeq == "id" +: (0 until sp.arity).map(i => s"a$i"))
    assert(ds.b.columns.toSeq == ds.a.columns.toSeq)
  }

  test("ids are unique within each table") {
    val ds = ErSynth.generateTiny(spark, "Beer")
    assert(ds.a.select("id").distinct().count() == ds.a.count())
    assert(ds.b.select("id").distinct().count() == ds.b.count())
  }

  test("matches reference valid ids and are unique") {
    val ds = ErSynth.generateTiny(spark, "Cit. 1")
    val m  = ds.matches
    assert(m.count() == m.distinct().count())
    val aIds = ds.a.select("id").collect().map(_.getLong(0)).toSet
    val bIds = ds.b.select("id").collect().map(_.getLong(0)).toSet
    m.collect().foreach { r =>
      assert(aIds.contains(r.getLong(0)) && bIds.contains(r.getLong(1)))
    }
  }

  test("train/test labels agree with ground-truth matches") {
    val ds = ErSynth.generateTiny(spark, "Cit. 2")
    val matchSet = ds.matches.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    (ds.train.collect() ++ ds.test.collect()).foreach { r =>
      val pair = (r.getLong(0), r.getLong(1))
      val label = r.getInt(2)
      assert((label == 1) == matchSet.contains(pair), s"pair $pair label $label")
    }
  }

  test("train and test pair sets are disjoint") {
    val ds = ErSynth.generateTiny(spark, "Soft.")
    val tr = ds.train.select("idA", "idB").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    val te = ds.test.select("idA", "idB").collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(tr.intersect(te).isEmpty)
  }

  test("positives are roughly a quarter of the labeled pairs") {
    val ds = ErSynth.generateTiny(spark, "Stocks")
    val all = ds.train.union(ds.test)
    val n   = all.count().toDouble
    val pos = all.where(col("label") === 1).count().toDouble
    assert(pos / n > 0.15 && pos / n < 0.35, s"pos ratio ${pos / n}")
  }

  test("generation is deterministic in the seed") {
    val a = ErSynth.generateTiny(spark, "Music", seed = 7)
    val b = ErSynth.generateTiny(spark, "Music", seed = 7)
    assert(a.a.collect().map(_.toString).sorted.toSeq == b.a.collect().map(_.toString).sorted.toSeq)
    assert(a.train.collect().map(_.toString).sorted.toSeq == b.train.collect().map(_.toString).sorted.toSeq)
  }

  test("different seeds change the data") {
    val a = ErSynth.generateTiny(spark, "Music", seed = 7)
    val b = ErSynth.generateTiny(spark, "Music", seed = 8)
    assert(a.b.collect().map(_.toString).sorted.toSeq != b.b.collect().map(_.toString).sorted.toSeq)
  }

  test("noisy domains have more missing values than clean ones") {
    def missingRate(name: String): Double = {
      val ds = ErSynth.generateTiny(spark, name)
      val attrCols = ds.attrCols
      val total = ds.b.count().toDouble * attrCols.length
      val missing = attrCols.map(c =>
        ds.b.where(col(c).isNull || col(c) === "").count()).sum.toDouble
      missing / total
    }
    val clean = missingRate("Cit. 1")
    val noisy = missingRate("Cosm.")
    assert(noisy > clean, s"noisy=$noisy clean=$clean")
    assert(noisy > 0.1, s"noisy missing rate $noisy")
  }

  test("duplicates share tokens with their source entity") {
    val ds = ErSynth.generateTiny(spark, "Rest.")
    val aMap = ds.a.collect().map(r => r.getLong(0) -> (1 until 7).map(i => Option(r.getString(i)).getOrElse(""))).toMap
    val bMap = ds.b.collect().map(r => r.getLong(0) -> (1 until 7).map(i => Option(r.getString(i)).getOrElse(""))).toMap
    val overlaps = ds.matches.collect().toSeq.map { r =>
      val at = repro.ir.Tokenize.tokens(aMap(r.getLong(0)).mkString(" ")).toSet
      val bt = repro.ir.Tokenize.tokens(bMap(r.getLong(1)).mkString(" ")).toSet
      if (at.isEmpty || bt.isEmpty) 0.0
      else at.intersect(bt).size.toDouble / math.max(at.size, bt.size)
    }
    val mean = overlaps.sum / overlaps.length
    assert(mean > 0.5, s"mean duplicate token overlap $mean")
  }

  test("typo perturbation preserves length within 1 and changes the word") {
    val rng = new Rng(1)
    (0 until 200).foreach { _ =>
      val w = "restaurant"
      val t = ErSynth.typo(w, rng)
      assert(math.abs(t.length - w.length) <= 1)
    }
    // at least some must differ
    val r2 = new Rng(2)
    assert((0 until 50).exists(_ => ErSynth.typo("restaurant", r2) != "restaurant"))
  }

  test("perturbValue: missing probability 1 empties the value") {
    val rng = new Rng(3)
    val n = ErSynth.Noise(0, 0, 1.0, 0)
    assert(ErSynth.perturbValue("hello world", n, rng) == "")
  }

  test("perturbValue: zero noise is identity") {
    val rng = new Rng(4)
    val n = ErSynth.Noise(0, 0, 0, 0)
    assert(ErSynth.perturbValue("hello world", n, rng) == "hello world")
  }

  test("tiny generator keeps splits usable") {
    val ds = ErSynth.generateTiny(spark, "CRM")
    assert(ds.train.count() >= 40)
    assert(ds.test.count() >= 16)
    assert(ds.train.where(col("label") === 1).count() > 0)
    assert(ds.test.where(col("label") === 1).count() > 0)
  }
}
