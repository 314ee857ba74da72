package repro.er

import repro.core.{TupleRepr, Wasserstein}

/** Representation-learning evaluation (§VI-B, Table IV).
  *
  * For each labeled test pair, the pair is predicted a duplicate iff either
  * tuple appears in the other's top-K nearest neighbours (footnote 5 of the
  * paper). Search runs on concatenated μ vectors; for VAE representations
  * the top-2K Euclidean candidates are re-ranked by W2² to include the σ
  * vectors, as §VI-B describes.
  */
object TopKEval {

  /** Neighbour lists in both directions from tuple representations. */
  def neighbours(reprs: Map[(String, Long), TupleRepr], k: Int,
                 rerankW2: Boolean): (Map[Long, Seq[Long]], Map[Long, Seq[Long]]) = {
    val aVecs = reprs.collect { case (("A", id), r) => (id, r.muFlat) }.toIndexedSeq.sortBy(_._1)
    val bVecs = reprs.collect { case (("B", id), r) => (id, r.muFlat) }.toIndexedSeq.sortBy(_._1)

    def search(qs: IndexedSeq[(Long, Array[Double])], idx: IndexedSeq[(Long, Array[Double])],
               qSide: String, iSide: String): Map[Long, Seq[Long]] = {
      val fetch = if (rerankW2) 2 * k else k
      val raw   = Knn.topK(qs, idx, fetch)
      raw.map { case (qid, nbrs) =>
        val ranked =
          if (!rerankW2) nbrs.map(_._1)
          else nbrs.map { case (iid, _) =>
            iid -> Wasserstein.tupleW2sq(reprs((qSide, qid)), reprs((iSide, iid)))
          }.sortBy(p => (p._2, p._1)).map(_._1)
        qid -> ranked.take(k)
      }
    }
    (search(aVecs, bVecs, "A", "B"), search(bVecs, aVecs, "B", "A"))
  }

  /** P/R/F1 over the labeled test pairs given both-direction neighbour lists. */
  def prfAtK(test: Seq[LabeledPair],
             nbrsAtoB: Map[Long, Seq[Long]], nbrsBtoA: Map[Long, Seq[Long]]): Prf = {
    val predicted = test.iterator.filter { p =>
      nbrsAtoB.get(p.idA).exists(_.contains(p.idB)) ||
        nbrsBtoA.get(p.idB).exists(_.contains(p.idA))
    }.map(p => (p.idA, p.idB)).toSet
    Metrics.prfLocal(test, predicted)
  }

  def evaluate(reprs: Map[(String, Long), TupleRepr], test: Seq[LabeledPair],
               k: Int, rerankW2: Boolean): Prf = {
    val (ab, ba) = neighbours(reprs, k, rerankW2)
    prfAtK(test, ab, ba)
  }
}
