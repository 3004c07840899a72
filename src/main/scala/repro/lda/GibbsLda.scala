package repro.lda

import repro.core.TopicModel
import scala.util.Random

/** Collapsed-Gibbs LDA trainer — the topic-model *training* substrate. The
  * paper trains LDA (PLDA) / BTM offline with priors α = 50/z, β = 0.01 and
  * loads the result as a black-box oracle; this class plays that role for the
  * synthetic corpora so the end-to-end pipeline (train → infer → query) can
  * be exercised without the authors' pre-trained models.
  *
  * Single-node by design: the paper also trains offline, outside the query
  * path. Corpus sizes in this repo (≤ 10⁴ short docs) train in seconds.
  */
final class GibbsLda(
    val z: Int,
    val vocabSize: Int,
    val alpha: Double,
    val beta: Double,
    seed: Long = 1234L,
) {
  require(z > 0 && vocabSize > 0, "topics and vocabulary must be positive")

  private val rnd = new Random(seed)

  /** Train on a corpus of bag-of-words documents; returns the topic model
    * (topic-word distributions) and per-document topic distributions.
    */
  def train(docs: IndexedSeq[Array[Int]], iterations: Int = 50): (TopicModel, Array[Array[Double]]) = {
    val nDocs = docs.length
    val topicWord = Array.fill(z, vocabSize)(0)
    val topicTotal = new Array[Int](z)
    val docTopic = Array.fill(nDocs, z)(0)
    val assign = docs.map(d => new Array[Int](d.length)).toArray

    // Random initialization.
    var d = 0
    while (d < nDocs) {
      val doc = docs(d)
      var i = 0
      while (i < doc.length) {
        val t = rnd.nextInt(z)
        assign(d)(i) = t
        topicWord(t)(doc(i)) += 1
        topicTotal(t) += 1
        docTopic(d)(t) += 1
        i += 1
      }
      d += 1
    }

    val p = new Array[Double](z)
    var it = 0
    while (it < iterations) {
      d = 0
      while (d < nDocs) {
        val doc = docs(d)
        var i = 0
        while (i < doc.length) {
          val w = doc(i)
          val old = assign(d)(i)
          topicWord(old)(w) -= 1; topicTotal(old) -= 1; docTopic(d)(old) -= 1
          var acc = 0.0
          var t = 0
          while (t < z) {
            acc += (docTopic(d)(t) + alpha) * (topicWord(t)(w) + beta) / (topicTotal(t) + beta * vocabSize)
            p(t) = acc
            t += 1
          }
          val u = rnd.nextDouble() * acc
          var nt = 0
          while (p(nt) < u && nt < z - 1) nt += 1
          assign(d)(i) = nt
          topicWord(nt)(w) += 1; topicTotal(nt) += 1; docTopic(d)(nt) += 1
          i += 1
        }
        d += 1
      }
      it += 1
    }

    val phi = Array.tabulate(z) { t =>
      Array.tabulate(vocabSize)(w => (topicWord(t)(w) + beta) / (topicTotal(t) + beta * vocabSize))
    }
    val theta = Array.tabulate(nDocs) { dd =>
      val len = docs(dd).length
      Array.tabulate(z)(t => (docTopic(dd)(t) + alpha) / (len + alpha * z))
    }
    (new TopicModel(z, vocabSize, phi), theta)
  }
}

object GibbsLda {
  /** Paper priors: α = 50/z, β = 0.01 (§5.1). */
  def paperPriors(z: Int, vocabSize: Int, seed: Long = 1234L): GibbsLda =
    new GibbsLda(z, vocabSize, alpha = 50.0 / z, beta = 0.01, seed)
}
