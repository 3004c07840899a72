package repro.core

import scala.collection.mutable

/** MULTI-TOPIC THRESHOLDSTREAM (Algorithm 2): threshold-bucket candidates fed
  * from the ranked lists in decreasing order of x-weighted topic score, with
  * early termination once the upper bound UB(x) on unretrieved elements falls
  * below the minimum admission threshold TH of any unfilled candidate.
  *
  * Returns a (1/2 − ε)-approximation (Theorem 2) and evaluates each active
  * element at most once.
  */
object MTTS {

  def query(engine: KSirEngine, q: QueryVector, k: Int, epsilon: Double): KSirResult = {
    require(k >= 1, "k must be at least 1")
    require(epsilon > 0 && epsilon < 1, "ε must lie in (0,1)")

    val cursor = new RankedListCursor(engine, q)
    val logBase = math.log1p(epsilon)
    // Candidates keyed by exponent j, φ = (1+ε)^j.
    val candidates = mutable.SortedMap.empty[Int, CandidateState]
    var deltaMax = 0.0
    var evaluated = 0

    def phi(j: Int): Double = math.pow(1.0 + epsilon, j)

    def threshold: Double = {
      // TH: min φ/2k over unfilled candidates; +∞ when every candidate is
      // full (no further element can be admitted anywhere).
      val open = candidates.iterator.filter(_._2.size < k)
      if (candidates.isEmpty) 0.0
      else open.map { case (j, _) => phi(j) / (2.0 * k) }.minOption.getOrElse(Double.PositiveInfinity)
    }

    var ub = cursor.upperBound
    var th = 0.0
    while (ub >= th && !cursor.exhausted && ub > 0.0) {
      val ae = cursor.popMax()
      if (ae != null) {
        evaluated += 1
        val deltaE = engine.deltaScore(ae, q)
        if (deltaE > deltaMax) {
          deltaMax = deltaE
          // Maintain Φ = { (1+ε)^j : δmax ≤ (1+ε)^j ≤ 2·k·δmax }.
          val jLo = math.ceil(math.log(deltaMax) / logBase - 1e-9).toInt
          val jHi = math.floor(math.log(2.0 * k * deltaMax) / logBase + 1e-9).toInt
          candidates.keys.filter(j => j < jLo || j > jHi).toSeq.foreach(candidates.remove)
          (jLo to jHi).foreach { j =>
            if (!candidates.contains(j)) candidates(j) = new CandidateState(engine, q)
          }
        }
        candidates.foreach { case (j, s) =>
          val tau = phi(j) / (2.0 * k)
          if (deltaE >= tau && s.size < k && s.gain(ae) >= tau) s.add(ae)
        }
      }
      th = threshold
      ub = cursor.upperBound
    }

    val best = candidates.valuesIterator.maxByOption(_.score)
    best match {
      case Some(c) => KSirResult(c.members, c.score, evaluated, cursor.retrievedCount)
      case None    => KSirResult(Seq.empty, 0.0, evaluated, cursor.retrievedCount)
    }
  }
}
