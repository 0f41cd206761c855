package repro.batch

import org.apache.spark.sql.{Encoder, Encoders}
import org.apache.spark.sql.expressions.Aggregator

/** Input row of the pooled aggregate: one edge message plus its weight. */
final case class MsgIn(m: Seq[Double], w: Double)

/** Partial-gather buffer / result: element-wise message sum + weight sum. */
final case class PooledBuf(sum: Seq[Double], wsum: Double)

/** Typed Aggregator implementing the paper's partial-gather on the batch
  * backend: Spark runs `reduce`/`merge` map-side before the shuffle, so the
  * per-destination traffic drops to one partial sum per upstream partition —
  * the same combiner the paper plugs into MapReduce/Pregel.
  */
final class PooledUdaf extends Aggregator[MsgIn, PooledBuf, PooledBuf] {
  def zero: PooledBuf = PooledBuf(null, 0.0)

  def reduce(b: PooledBuf, a: MsgIn): PooledBuf = {
    if (b.sum == null) PooledBuf(a.m.map(_.toDouble), b.wsum + a.w)
    else {
      val s = b.sum.toArray
      var i = 0
      while (i < s.length) { s(i) += a.m(i); i += 1 }
      PooledBuf(s.toSeq, b.wsum + a.w)
    }
  }

  def merge(b1: PooledBuf, b2: PooledBuf): PooledBuf = {
    if (b1.sum == null) b2
    else if (b2.sum == null) b1
    else {
      val s = b1.sum.toArray
      var i = 0
      while (i < s.length) { s(i) += b2.sum(i); i += 1 }
      PooledBuf(s.toSeq, b1.wsum + b2.wsum)
    }
  }

  def finish(r: PooledBuf): PooledBuf = r
  def bufferEncoder: Encoder[PooledBuf] = Encoders.product[PooledBuf]
  def outputEncoder: Encoder[PooledBuf] = Encoders.product[PooledBuf]
}
