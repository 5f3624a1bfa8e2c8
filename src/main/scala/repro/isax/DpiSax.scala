package repro.isax

import org.apache.spark.sql.{DataFrame, SparkSession}

/** DPiSAX baseline [65]: massively distributed *partitioned* iSAX.
  *
  * DPiSAX samples the data, builds a balanced partitioning table over the
  * iSAX word space by repeatedly splitting overfull regions on the next bit
  * of a single segment (choosing the segment whose bit split is the most
  * balanced — the partitioning is load-driven, not similarity-driven), and
  * routes both records and queries through that binary split tree to
  * exactly one partition. The balance-first, one-bit-at-a-time splitting is
  * what the paper blames for its very low recall (§I, §III-B).
  */
object DpiSax {

  sealed trait Node extends Serializable
  final case class Leaf(part: Int, size: Long) extends Node
  /** Test bit `bit` (0 = MSB) of segment `segment`'s full-precision symbol. */
  final case class Split(segment: Int, bit: Int, zero: Node, one: Node) extends Node

  final case class Router(root: Node, bits: Int, numPartitions: Int) extends WordRouter {
    def route(word: Array[Int]): Int = {
      var n = root
      while (true) {
        n match {
          case Leaf(p, _) => return p
          case Split(s, b, z, o) =>
            n = if (((word(s) >>> (bits - 1 - b)) & 1) == 0) z else o
        }
      }
      -1 // unreachable
    }
  }

  /** Build the split tree from sampled (word, estimated-count) pairs. */
  def mkRouter(bits: Int, capacity: Long)(words: Seq[(Array[Int], Long)]): Router = {
    var nextPart = 0
    def bitOf(sym: Int, b: Int): Int = (sym >>> (bits - 1 - b)) & 1

    def build(members: Seq[(Array[Int], Long)], bitsUsed: Array[Int]): Node = {
      val size = members.map(_._2).sum
      val splittable = bitsUsed.indices.filter(bitsUsed(_) < bits)
      if (size <= capacity || members.size <= 1 || splittable.isEmpty) {
        val p = nextPart; nextPart += 1
        Leaf(p, size)
      } else {
        // Pick the segment whose next bit splits this region most evenly.
        val best = splittable.minBy { s =>
          val ones = members.collect { case (w, f) if bitOf(w(s), bitsUsed(s)) == 1 => f }.sum
          (math.abs(size - 2 * ones), s)
        }
        val b = bitsUsed(best)
        val (zeros, ones) = members.partition { case (w, _) => bitOf(w(best), b) == 0 }
        if (zeros.isEmpty || ones.isEmpty) {
          // Degenerate split: mark the bit consumed and retry deeper.
          val used = bitsUsed.clone(); used(best) = b + 1
          build(members, used)
        } else {
          val used = bitsUsed.clone(); used(best) = b + 1
          Split(best, b, build(zeros, used), build(ones, used))
        }
      }
    }
    val root = build(words, new Array[Int](words.headOption.map(_._1.length).getOrElse(0)))
    Router(root, bits, nextPart)
  }

  /** Default configuration: word length 8, cardinality 256 (§III-B: iSAX
    * trees keep the word length small).
    */
  def index(spark: SparkSession, df: DataFrame, capacity: Long, paaW: Int = 8,
            bits: Int = 8, alpha: Double = 0.1, seed: Long = 11): BaselineIndex =
    BaselineCommon.index(spark, df, "DPiSAX", paaW, bits, alpha, seed,
      mkRouter(bits, capacity))
}
