package repro.nn

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("same seed gives identical streams") {
    val a = new Rng(42); val b = new Rng(42)
    assert((1 to 100).map(_ => a.nextLong()) == (1 to 100).map(_ => b.nextLong()))
  }

  test("different seeds give different streams") {
    val a = new Rng(1); val b = new Rng(2)
    assert((1 to 10).map(_ => a.nextLong()) != (1 to 10).map(_ => b.nextLong()))
  }

  test("nextDouble lies in [0, 1)") {
    val r = new Rng(7)
    (1 to 10000).foreach { _ =>
      val d = r.nextDouble()
      assert(d >= 0.0 && d < 1.0)
    }
  }

  test("nextInt respects the bound") {
    val r = new Rng(11)
    (1 to 10000).foreach { _ =>
      val i = r.nextInt(13)
      assert(i >= 0 && i < 13)
    }
  }

  test("nextInt rejects non-positive bounds") {
    intercept[IllegalArgumentException](new Rng(1).nextInt(0))
  }

  test("nextInt covers all buckets") {
    val r = new Rng(3)
    val seen = (1 to 1000).map(_ => r.nextInt(5)).toSet
    assert(seen == Set(0, 1, 2, 3, 4))
  }

  test("gaussian has ~0 mean and ~1 sd") {
    val r  = new Rng(5)
    val xs = Array.fill(50000)(r.nextGaussian())
    val mean = xs.sum / xs.length
    val sd   = math.sqrt(xs.map(x => (x - mean) * (x - mean)).sum / xs.length)
    assert(math.abs(mean) < 0.02, s"mean=$mean")
    assert(math.abs(sd - 1.0) < 0.02, s"sd=$sd")
  }

  test("shuffle is a permutation") {
    val r  = new Rng(9)
    val xs = Array.tabulate(100)(identity)
    r.shuffle(xs)
    assert(xs.sorted.toSeq == (0 until 100))
    assert(xs.toSeq != (0 until 100))
  }

  test("split produces an independent deterministic child") {
    val a = new Rng(21).split()
    val b = new Rng(21).split()
    assert((1 to 20).map(_ => a.nextDouble()) == (1 to 20).map(_ => b.nextDouble()))
  }
}
