package repro.system

import scala.util.Random

/** Synthetic voice-request logs replacing the (unavailable) Google-Assistant
  * deployment logs analyzed in Table III. Requests are generated from
  * per-category templates over the deployment's actual vocabulary; the
  * classifier under test never sees the generating label.
  */
object QueryLogGen {

  private val helpTemplates = Seq(
    "help", "can you help me", "what can I ask you", "how do I use this",
    "give me instructions")
  private val repeatTemplates = Seq(
    "repeat that please", "say that again", "once more please")
  private val otherTemplates = Seq(
    "hello there", "play some music", "thank you", "goodbye", "stop",
    "tell me a joke", "how are you today")

  /** Generate a labeled request log.
    *
    * @param counts requests per category (the paper's observed mixture)
    */
  def generate(vocab: Vocabulary, counts: Map[RequestType, Int],
               seed: Long): Seq[(String, RequestType)] = {
    val rnd = new Random(seed)
    def pick[A](xs: Seq[A]): A = xs(rnd.nextInt(xs.length))
    def targetPhrase(): String = pick(vocab.targetSynonyms.values.flatten.toSeq)
    def dimValue(): (String, String) = {
      val (d, vs) = pick(vocab.dimValues.toSeq.sortBy(_._1))
      (d, pick(vs))
    }
    def sQuery(): String = {
      val t = targetPhrase()
      rnd.nextInt(3) match {
        case 0 => s"what is the $t"
        case 1 => s"what is the $t for ${dimValue()._2}"
        case _ =>
          val (d1, v1) = dimValue(); val (_, v2) = dimValue()
          if (v1 == v2) s"$t in $v1" else s"what is the $t for $v1 and $v2"
      }
    }
    def uQuery(): String = {
      val t = targetPhrase()
      rnd.nextInt(3) match {
        case 0 => s"which ${pick(vocab.dimValues.keys.toSeq.sorted)} has the highest $t"
        case 1 =>
          val v1 = dimValue()._2; val v2 = dimValue()._2
          s"make a comparison of $t between $v1 and $v2"
        case _ => s"what is the $t of flight number DL1234"
      }
    }
    val entries = counts.toSeq.sortBy(_._1.label).flatMap { case (cat, cnt) =>
      (0 until cnt).map { _ =>
        val text = cat match {
          case RequestType.Help => pick(helpTemplates)
          case RequestType.Repeat => pick(repeatTemplates)
          case RequestType.SQuery => sQuery()
          case RequestType.UQuery => uQuery()
          case RequestType.Other => pick(otherTemplates)
        }
        (text, cat: RequestType)
      }
    }
    rnd.shuffle(entries)
  }
}
