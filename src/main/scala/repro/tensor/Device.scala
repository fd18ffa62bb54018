package repro.tensor

import java.util.concurrent.{Callable, Executors, ExecutorService}
import scala.jdk.CollectionConverters._

/** Execution device for tensor kernels.
  *
  * Mirrors the role of PyTorch's device + intra-op thread pool: element-wise
  * and reduction kernels are chunk-parallelized over `threads` workers, while
  * `sort` / `uniqueConsecutive` intentionally stay single-threaded — the same
  * scaling bottleneck the paper observes for PyTorch CPU execution (§6.3).
  */
final class CpuDevice(val threads: Int) extends AutoCloseable {
  require(threads >= 1, s"threads must be >= 1, got $threads")

  private val pool: Option[ExecutorService] =
    if (threads == 1) None else Some(Executors.newFixedThreadPool(threads))

  /** Minimum work per task; below this, parallel dispatch costs more than it saves. */
  private val minChunk = 16 * 1024

  /** Chunked parallel loop over [0, n): `body(start, end)` per chunk. */
  def parallelRanges(n: Int)(body: (Int, Int) => Unit): Unit = {
    if (n <= 0) return
    pool match {
      case None => body(0, n)
      case Some(p) =>
        val nChunks = math.max(1, math.min(threads, n / minChunk))
        if (nChunks == 1) { body(0, n); return }
        val step  = (n + nChunks - 1) / nChunks
        val tasks = (0 until nChunks).map { c =>
          val s = c * step; val e = math.min(n, s + step)
          new Callable[Unit] { def call(): Unit = body(s, e) }
        }
        p.invokeAll(tasks.asJava).asScala.foreach(_.get())
    }
  }

  override def close(): Unit = pool.foreach(_.shutdown())
}

object CpuDevice {
  /** Default single-core device (the paper's CPU(1 core) configuration). */
  lazy val single: CpuDevice = new CpuDevice(1)
}

/** Thread-local execution context: which device runs kernels and where op
  * profiles are recorded. Tensor ops read this implicitly so operator code
  * stays device-agnostic — the paper's portability argument (G2).
  */
final case class ExecCtx(device: CpuDevice, profile: Option[Profile])

object ExecCtx {
  private val tl = new ThreadLocal[ExecCtx] {
    override def initialValue(): ExecCtx = ExecCtx(CpuDevice.single, None)
  }

  def current: ExecCtx = tl.get()

  /** Run `body` with the given context installed on this thread. */
  def withCtx[A](ctx: ExecCtx)(body: => A): A = {
    val prev = tl.get()
    tl.set(ctx)
    try body finally tl.set(prev)
  }

  def withDevice[A](device: CpuDevice)(body: => A): A =
    withCtx(current.copy(device = device))(body)

  def withProfile[A](profile: Profile)(body: => A): A =
    withCtx(current.copy(profile = Some(profile)))(body)
}
