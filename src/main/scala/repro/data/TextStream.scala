package repro.data

import repro.core.{Item, Rng}

/** Synthetic stand-in for the Usenet2 dataset of §6.4.
  *
  * The real dataset (mlkd.csd.auth.gr/concept_drift.html) is a stream of
  * 1,500 20-Newsgroups messages labeled "interesting"/"not interesting" by a
  * simulated user whose interest flips every 300 messages. It is unavailable
  * offline, so we generate an equivalent stream (substitution documented in
  * DESIGN.md): 1,500 messages over a 3-topic vocabulary; the user's interest
  * alternates between topic 0 and topic 1 every 300 messages (topic 2 is
  * never interesting — background noise, mirroring off-topic newsgroups).
  * Same stream length, batch structure (30 × 50) and recurring-context drift.
  */
object TextStream {

  /** A bag-of-words message: sparse word counts over the vocabulary, plus the
    * drifting binary label ("interesting" to the user at arrival time).
    */
  final case class Message(counts: Map[Int, Int], interesting: Boolean)

  /** Words per topic block and shared vocabulary layout. */
  val TopicWords = 25
  val CommonWords = 50
  val NTopics = 3
  val VocabSize: Int = NTopics * TopicWords + CommonWords

  /** Which topic the user finds interesting in message-index segment `idx/300`. */
  def interestingTopic(messageIndex: Int): Int = (messageIndex / 300) % 2

  /** Generate the full 1,500-message stream, batched into `batchSize` chunks. */
  def stream(seed: Long, nMessages: Int = 1500, batchSize: Int = 50,
             wordsPerMessage: Int = 30): IndexedSeq[IndexedSeq[Item[Message]]] = {
    val rng = new Rng(seed)
    val msgs = (0 until nMessages).map { i =>
      val topic = rng.nextInt(NTopics)
      val counts = scala.collection.mutable.Map.empty[Int, Int].withDefaultValue(0)
      (0 until wordsPerMessage).foreach { _ =>
        // 60% topic-specific words, 40% common words: overlapping vocabularies
        // make the task non-trivial, like real newsgroup text.
        val w =
          if (rng.uniform() < 0.6) topic * TopicWords + rng.nextInt(TopicWords)
          else NTopics * TopicWords + rng.nextInt(CommonWords)
        counts(w) += 1
      }
      val label = topic == interestingTopic(i)
      Item(i.toLong, i / batchSize + 1, Message(counts.toMap, label))
    }
    msgs.grouped(batchSize).map(_.toVector).toVector
  }
}
