package repro.baseline

import scala.collection.mutable

import repro.core.SpaceMeter

/** SpaceSaving top-k counters [40] — second witness-free baseline.
  *
  * Keeps k (item, count, error) triples; on overflow the minimum-count
  * item is replaced and inherits its count as error. Overestimates by at
  * most the inherited error; any item with true count > N/k survives.
  * Like Misra–Gries it cannot report witnesses (Table 5).
  */
final class SpaceSaving(val k: Int) extends SpaceMeter {
  require(k >= 1)
  private val counts = mutable.HashMap.empty[Long, (Long, Long)] // item -> (count, err)
  private var n = 0L

  def process(item: Long): Unit = {
    n += 1
    counts.get(item) match {
      case Some((c, e)) => counts.update(item, (c + 1, e))
      case None if counts.size < k => counts.update(item, (1L, 0L))
      case None =>
        val (victim, (vc, _)) = counts.minBy(_._2._1)
        counts.remove(victim)
        counts.update(item, (vc + 1, vc))
    }
    touch()
  }

  def processAll(items: IterableOnce[Long]): this.type = {
    items.iterator.foreach(process); this
  }

  /** Estimated count (upper bound; true count >= estimate - error). */
  def estimate(item: Long): Long = counts.get(item).map(_._1).getOrElse(0L)

  def error(item: Long): Long = counts.get(item).map(_._2).getOrElse(0L)

  /** Surviving candidates, most-counted first. */
  def candidates: Vector[(Long, Long)] = counts.toVector.map { case (i, (c, _)) => (i, c) }.sortBy(-_._2)

  def streamLength: Long = n

  /** Three words (item, count, error) per live counter. */
  override def currentWords: Long = 3L * counts.size
}
