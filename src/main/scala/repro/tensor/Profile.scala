package repro.tensor

import scala.collection.mutable.ArrayBuffer

/** Kernel classes used by the device cost models.
  *
  * Classes map to the breakdown categories of the paper's §6.5: element-wise
  * streaming ops, reductions, scatter/gather, sort, unique, and
  * materialization (masked/index select, concat).
  */
object OpClass extends Enumeration {
  val ElementWise, Reduction, Scatter, Gather, Sort, Unique, Materialize, Search = Value
}

/** One executed kernel: name, class, elements touched, bytes moved. */
final case class OpRecord(name: String, cls: OpClass.Value, elems: Long, bytes: Long)

/** Accumulates the op trace of a tensor program execution.
  *
  * This is the substrate for the simulated accelerators: the kernels run on
  * the host CPU (for correctness), and the recorded trace is re-timed under
  * an analytical device model (see [[CostModel]]).
  */
final class Profile {
  private val buf = new ArrayBuffer[OpRecord]()

  def record(name: String, cls: OpClass.Value, elems: Long, bytes: Long): Unit =
    buf.synchronized { buf += OpRecord(name, cls, elems, bytes) }

  def records: Seq[OpRecord] = buf.synchronized { buf.toVector }

  def totalOps: Int    = buf.synchronized { buf.size }
  def totalBytes: Long = buf.synchronized { buf.iterator.map(_.bytes).sum }

  /** Bytes grouped by kernel class — the §6.5-style breakdown. */
  def byClass: Map[OpClass.Value, Long] =
    records.groupBy(_.cls).view.mapValues(_.map(_.bytes).sum).toMap

  /** Time grouped by op name under a given device model (per-op model time). */
  def timeByOpMs(model: DeviceModel): Seq[(String, Double)] =
    records.groupBy(_.name).view
      .mapValues(rs => rs.map(model.opTimeUs).sum / 1000.0)
      .toSeq.sortBy(-_._2)

  def clear(): Unit = buf.synchronized { buf.clear() }
}

object Profile {
  /** Record an op into the current thread's profile, if profiling is on. */
  def rec(name: String, cls: OpClass.Value, elems: Long, bytes: Long): Unit = {
    val ctx = ExecCtx.current
    ctx.profile.foreach(_.record(name, cls, elems, bytes))
  }
}
