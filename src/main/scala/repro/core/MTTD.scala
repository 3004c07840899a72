package repro.core

import scala.collection.mutable

/** MULTI-TOPIC THRESHOLDDESCEND (Algorithm 3): a single candidate built over
  * rounds of geometrically descending threshold τ. Elements are retrieved
  * from the ranked lists once their upper bound reaches τ and parked in a
  * buffer E' (a max-heap on cached marginal gains, which are upper bounds by
  * submodularity), from which they may be evaluated again in later rounds.
  *
  * Returns a (1 − 1/e − ε)-approximation (Theorem 3).
  */
object MTTD {

  def query(engine: KSirEngine, q: QueryVector, k: Int, epsilon: Double): KSirResult = {
    require(k >= 1, "k must be at least 1")
    require(epsilon > 0 && epsilon < 1, "ε must lie in (0,1)")

    val cursor = new RankedListCursor(engine, q)
    val s = new CandidateState(engine, q)
    // Buffer E': (cached Δ_e upper bound, id); lazily refreshed on pop.
    val buffer = mutable.PriorityQueue.empty[(Double, Long)](Ordering.by(_._1))
    val evaluatedIds = mutable.HashSet.empty[Long]

    var tau = cursor.upperBound
    var tauTerm = 0.0

    // retrieve(τ): pull every element whose upper bound still reaches τ.
    def retrieve(t: Double): Unit = {
      while (!cursor.exhausted && cursor.upperBound >= t) {
        val ae = cursor.popMax()
        if (ae != null) {
          val d = engine.deltaScore(ae, q)
          evaluatedIds.add(ae.elem.id)
          buffer.enqueue((d, ae.elem.id))
        }
      }
    }

    def result: KSirResult = KSirResult(s.members, s.score, evaluatedIds.size, cursor.retrievedCount)

    if (tau <= 0.0) return result

    while (tau >= tauTerm) {
      retrieve(tau)
      // Lazy-greedy pass: admit while some buffered gain may reach τ.
      var go = buffer.nonEmpty && buffer.head._1 >= tau
      while (go) {
        val (_, id) = buffer.dequeue()
        engine.activeElement(id) match {
          case Some(ae) =>
            val g = s.gain(ae)
            evaluatedIds.add(id)
            if (g >= tau) {
              s.add(ae)
              if (s.size == k) return result
            } else if (g > 0.0) {
              buffer.enqueue((g, id))
            }
          case None => // expired between retrieval and evaluation: drop
        }
        go = buffer.nonEmpty && buffer.head._1 >= tau
      }
      tauTerm = s.score * epsilon / k
      tau = (1.0 - epsilon) * tau
      // Nothing left that could ever be admitted at any remaining threshold.
      if (cursor.exhausted && (buffer.isEmpty || buffer.head._1 <= tauTerm)) return result
    }
    result
  }
}
