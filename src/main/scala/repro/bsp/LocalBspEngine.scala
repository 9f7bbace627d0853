package repro.bsp

import java.util.concurrent.{CountDownLatch, Executors, TimeUnit}
import java.util.concurrent.atomic.LongAdder

import repro.tag.LocalTagGraph

import scala.reflect.ClassTag

/** Shared-memory vertex-centric BSP engine.
  *
  * This is our substitute for TigerGraph's single-server mode (§8.1.2): each
  * "vertex processor" of the abstract model (§2) is simulated by a pool of
  * hardware threads; the synchronization barrier between supersteps is a
  * thread-pool barrier; message delivery is an in-memory inbox per vertex
  * with lock-striped combining.
  *
  * The engine counts every sent message (the paper's §2 communication-cost
  * measure) and supports direct-to-id messaging plus the global aggregator
  * vertex used by §6.3 and the §7 global-aggregation scheme.
  */
final class LocalBspEngine(val graph: LocalTagGraph,
    threads: Int = Runtime.getRuntime.availableProcessors()) extends BspEngine {

  override def run[S, M](program: VertexProgram[S, M])(implicit
      st: ClassTag[S], mt: ClassTag[M]): BspRun[S, M] = {
    val n = graph.numVertices
    val infos = new Array[VertexInfo](n)
    val states = new Array[Any](n)
    var v = 0
    while (v < n) { infos(v) = graph.info(v); states(v) = program.initialState(infos(v)); v += 1 }

    // inbox(v) == null means "no message" (vertex inactive next step).
    var inbox = new Array[Any](n)
    var next = new Array[Any](n)
    val locks = Array.fill(256)(new Object)
    val msgCount = new LongAdder

    var aggInbox: Option[M] = None // merged messages to the aggregator, this step
    var aggAll: Option[M] = None   // cumulative over the whole run
    val aggLock = new Object

    def deliver(target: Long, m: M, nextArr: Array[Any]): Unit = {
      msgCount.increment()
      if (target == VertexProgram.AggregatorId) aggLock.synchronized {
        aggInbox = Some(aggInbox.fold(m)(program.merge(_, m)))
      } else {
        val t = target.toInt
        locks(t & 255).synchronized {
          val prev = nextArr(t)
          nextArr(t) = if (prev == null) m else program.merge(prev.asInstanceOf[M], m)
        }
      }
    }

    val pool = Executors.newFixedThreadPool(threads)
    val perStep = Vector.newBuilder[Long]
    var step = 0
    var halted = false
    try {
      var initial = true
      while (!halted && step < program.maxSteps) {
        val latch = new CountDownLatch(threads)
        val nextArr = next
        val inArr = inbox
        val isInitial = initial
        val curStep = step
        val chunk = math.max(1, (n + threads - 1) / threads)
        var t = 0
        while (t < threads) {
          val lo = t * chunk
          val hi = math.min(n, lo + chunk)
          pool.execute { () =>
            try {
              val ctx = new SendCtx[M] {
                def send(target: Long, m: M): Unit = deliver(target, m, nextArr)
              }
              var i = lo
              while (i < hi) {
                val m = inArr(i)
                val edges = graph.outEdges(i)
                val active =
                  if (isInitial) program.initiallyActive(infos(i), states(i).asInstanceOf[S], edges)
                  else m != null
                if (active) {
                  val msgOpt = if (m == null) None else Some(m.asInstanceOf[M])
                  states(i) = program.compute(curStep, infos(i), states(i).asInstanceOf[S],
                    msgOpt, edges, ctx)
                }
                i += 1
              }
            } finally latch.countDown()
          }
          t += 1
        }
        latch.await()

        // Aggregator vertex computes and may answer with direct messages.
        aggInbox.foreach { merged =>
          aggAll = Some(aggAll.fold(merged)(program.merge(_, merged)))
          val it = program.aggregatorCompute(step, merged)
          while (it.hasNext) { val (d, mm) = it.next(); deliver(d, mm, nextArr) }
        }
        aggInbox = None

        val sent = msgCount.sumThenReset()
        perStep += sent
        java.util.Arrays.fill(inbox, null)
        val tmp = inbox; inbox = next; next = tmp
        initial = false
        step += 1
        if (sent == 0) halted = true
      }
    } finally {
      pool.shutdown()
      pool.awaitTermination(1, TimeUnit.MINUTES)
    }

    val finalStats = BspStats(step, perStep.result())
    val aggregateResult = aggAll
    new BspRun[S, M] {
      def mapStates[O: ClassTag](f: (VertexInfo, S) => IterableOnce[O]): Vector[O] = {
        val b = Vector.newBuilder[O]
        var i = 0
        while (i < n) { b ++= f(infos(i), states(i).asInstanceOf[S]); i += 1 }
        b.result()
      }
      def aggregate: Option[M] = aggregateResult
      def stats: BspStats = finalStats
    }
  }
}
