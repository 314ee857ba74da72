package repro.core

import repro.ir.IrSet
import repro.nn.Mat

/** Bulk encoding of tuples into latent representations (§III outputs).
  *
  * Applies the trained variational encoder to every attribute IR of every
  * tuple and returns per-tuple [[TupleRepr]]s. Encoding is batched per
  * attribute column for cache-friendliness.
  */
object Represent {

  /** Encode one IR set with a VAE; arityOverride pads/truncates to the
    * arity a *transferred* model expects (§VI-D: "use the first a columns
    * and pad with empty columns").
    */
  def encodeAll(vae: VaeModel, irs: IrSet, arityOverride: Int = -1): Map[(String, Long), TupleRepr] = {
    val arity = if (arityOverride > 0) arityOverride else irs.arity
    val keys  = irs.irs.keys.toIndexedSeq
    val dim   = irs.dim
    val zero  = new Array[Double](dim)

    // attribute i of every tuple as one batch
    val perAttr = (0 until arity).map { ai =>
      val x = Mat.fromRows(keys.map { k =>
        val attrs = irs.irs(k)
        if (ai < attrs.length) attrs(ai) else zero
      })
      vae.encodeBatch(x)
    }

    keys.zipWithIndex.map { case (k, row) =>
      val mu  = Array.tabulate(arity)(ai => perAttr(ai)._1.row(row))
      val sig = Array.tabulate(arity)(ai => perAttr(ai)._2.row(row))
      k -> TupleRepr(mu, sig)
    }.toMap
  }

  /** IRs themselves as degenerate representations (μ = IR, σ = 0) — the
    * left-hand-side baselines of Table IV search raw IRs.
    */
  def irAsRepr(irs: IrSet, arityOverride: Int = -1): Map[(String, Long), TupleRepr] = {
    val arity = if (arityOverride > 0) arityOverride else irs.arity
    val dim   = irs.dim
    val zero  = new Array[Double](dim)
    irs.irs.map { case (k, attrs) =>
      val mu = Array.tabulate(arity)(ai => if (ai < attrs.length) attrs(ai).clone() else zero.clone())
      k -> TupleRepr(mu, mu.map(v => new Array[Double](v.length)))
    }
  }
}
