package repro.sketch

import org.apache.spark.sql.{Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator

/** Buffer for [[KMinAggregator]]: a bounded bag of candidate sketch rows. */
final case class KMinBuf(rows: Seq[SketchRow])

/** Typed Aggregator that keeps the n tuples with the minimum (hu, hkey) —
  * the distributed one-pass sketch builder (the "UDAF" layering from the
  * repro plan). Partial buffers are compacted to the n smallest whenever they
  * exceed 2n, which is lossless for a top-n selection, so per-partition state
  * is O(n) and merges across partitions are exact.
  */
final class KMinAggregator(n: Int) extends Aggregator[SketchRow, KMinBuf, KMinBuf] {
  require(n > 0, "sketch size must be positive")

  private def ordering: Ordering[SketchRow] = Ordering.by(r => (r.hu, r.hkey))

  private def compact(rows: Seq[SketchRow]): Seq[SketchRow] =
    if (rows.size <= n) rows else rows.sorted(ordering).take(n)

  override def zero: KMinBuf = KMinBuf(Vector.empty)

  override def reduce(b: KMinBuf, a: SketchRow): KMinBuf = {
    val appended = b.rows :+ a
    KMinBuf(if (appended.size > 2 * n) compact(appended) else appended)
  }

  override def merge(b1: KMinBuf, b2: KMinBuf): KMinBuf =
    KMinBuf(compact(b1.rows ++ b2.rows))

  override def finish(b: KMinBuf): KMinBuf =
    KMinBuf(compact(b.rows).sorted(ordering))

  override def bufferEncoder: Encoder[KMinBuf] = Encoders.product[KMinBuf]
  override def outputEncoder: Encoder[KMinBuf] = Encoders.product[KMinBuf]
}
