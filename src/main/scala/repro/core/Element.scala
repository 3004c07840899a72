package repro.core

/** A social element: the paper's triple ⟨ts, doc, ref⟩ plus a stable id and
  * its (sparse) topic distribution inferred from the topic model.
  *
  * @param id     unique element id (stream position works; must be unique)
  * @param ts     integer timestamp (seconds in the benches)
  * @param words  bag of words as vocabulary indices, repetitions allowed
  * @param refs   ids of the elements this element refers to (retweet / cite /
  *               comment targets); empty for original posts
  * @param topics sparse topic distribution `p_i(e)`: (topicId, probability)
  *               pairs with probability > 0, summing to 1, sorted by topicId
  * @param author author id — used only by the author-reputation-based
  *               baseline (Sumblr); the k-SIR model itself is author-free
  */
final case class Element(
    id: Long,
    ts: Long,
    words: Array[Int],
    refs: Array[Long],
    topics: Array[(Int, Double)],
    author: Long = 0L,
) {

  /** Distinct words with frequencies γ(w,e). */
  lazy val wordFreqs: Array[(Int, Int)] = {
    val m = scala.collection.mutable.LongMap.empty[Int]
    var i = 0
    while (i < words.length) { m(words(i).toLong) = m.getOrElse(words(i).toLong, 0) + 1; i += 1 }
    m.iterator.map { case (w, c) => (w.toInt, c) }.toArray.sortBy(_._1)
  }

  /** p_i(e), 0 when the element has no mass on topic i. */
  def pTopic(i: Int): Double = {
    var j = 0
    while (j < topics.length) {
      if (topics(j)._1 == i) return topics(j)._2
      j += 1
    }
    0.0
  }
}

/** A bucket B_t: the elements with `ts ∈ [t-L+1, t]`, delivered when the
  * window slides to time t (the paper processes the stream in buckets of
  * equal time length L).
  */
final case class Bucket(endTs: Long, elements: Seq[Element])

object Bucket {

  /** Partition a stream (sorted by ts) into buckets of length L, from the
    * first bucket end that covers the earliest element through `endTs`.
    */
  def bucketize(elements: Seq[Element], bucketLength: Long, endTs: Long): Seq[Bucket] = {
    require(bucketLength > 0, s"bucket length must be positive, got $bucketLength")
    val sorted = elements.sortBy(_.ts)
    if (sorted.isEmpty) return Seq.empty
    val first = sorted.head.ts
    // Bucket ends are multiples of L (t = L, 2L, ... per Algorithm 1).
    val firstEnd = ((first + bucketLength - 1) / bucketLength) * bucketLength
    val ends = firstEnd.to(math.max(firstEnd, ((endTs + bucketLength - 1) / bucketLength) * bucketLength), bucketLength)
    val grouped = sorted.groupBy(e => ((e.ts + bucketLength - 1) / bucketLength) * bucketLength)
    ends.map(t => Bucket(t, grouped.getOrElse(t, Seq.empty))).toSeq
  }
}
