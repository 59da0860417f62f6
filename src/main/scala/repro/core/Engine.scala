package repro.core

import repro.core.Rows.R
import repro.ft._
import repro.sim.{Serial, Sim, Slots}
import scala.collection.mutable

/** Execution mode: pipelined (Quokka) vs stagewise/blocking (SparkSQL-like,
  * used for the Fig 7 ablation and as the Spark baseline).
  */
sealed trait ExecMode
case object Pipelined extends ExecMode
case object Stagewise extends ExecMode

/** Task-dependency policy: dynamic (consume as many committed outputs as are
  * available — the paper's scheduling strategy) vs static batches of k
  * (the Fig 8 static-lineage strategies).
  */
sealed trait Batching
case object Dynamic extends Batching
final case class StaticBatch(k: Int) extends Batching { require(k > 0) }

/** One engine run's configuration ("system"). */
final case class EngineConfig(
  workers: Int,
  mode: ExecMode = Pipelined,
  batching: Batching = Dynamic,
  ft: Ft = Wal,
  cost: CostParams = CostParams(),
  /** Relative single-node kernel speed (SparkSQL row kernels ~1.7x slower
    * than Quokka's vectorized DuckDB/Polars kernels, per paper §V-A).
    */
  kernelFactor: Double = 1.0,
  channelsPerWorker: Int = 1,
  inputBatchRows: Int = 4096,
  /** Per-stage scheduling barrier cost in stagewise mode (DAGScheduler). */
  stageOverheadS: Double = 0.0,
  /** Lineage determined before execution (Spark/Trino/Fig 8 static
    * strategies): no per-task GCS write-ahead cost is charged.
    */
  staticLineage: Boolean = false,
  /** Dynamic batching accumulates at least this many upstream outputs
    * before launching a consume task (the paper's maximize-batch intent);
    * the remainder is taken once the upstream channel is done.
    */
  dynamicMinRun: Int = 1,
  seed: Long = 7,
) {
  require(workers >= 1)
  def channels: Int = workers * channelsPerWorker
}

/** A worker machine: CPU slots, NVMe queue, NIC uplink, reliable-store
  * uplink, and a kill time.
  */
private[core] final class WorkerRt(val id: Int, cores: Int) {
  val cpu = new Slots(cores)
  val disk = new Serial
  val net = new Serial
  val storeLink = new Serial
  var deadAt: Double = Double.PositiveInfinity
  def alive(t: Double): Boolean = t < deadAt
}

private[core] final class JoinState {
  val left = mutable.LinkedHashMap.empty[Any, mutable.ArrayBuffer[R]]
  val right = mutable.LinkedHashMap.empty[Any, mutable.ArrayBuffer[R]]
  var rows = 0L
}

private[core] final class AggState {
  val m = mutable.LinkedHashMap.empty[Any, (Vector[Any], Array[Long])]
  var rows = 0L
}

/** Runtime state of one channel (paper: one channel of a stage, hosted by
  * one TaskManager). `epoch` invalidates in-flight events across a rewind.
  */
private[core] final class ChannelRt(val stage: Int, val ch: Int) {
  var worker: Int = 0
  var epoch: Int = 0
  var seq: Int = 0
  var busy = false
  var flushed = false
  val consumed = mutable.LinkedHashMap.empty[(Int, Int), Int]
  val mailbox = mutable.HashMap.empty[(Int, Int, Int), Array[R]]
  var myBatches: Vector[Int] = Vector.empty
  var cursor = 0
  var join: JoinState = null
  var agg: AggState = null
  /** Pending (seq, lineage) entries to replay after a rewind. */
  var replay: List[(Int, LineageRec)] = Nil
  var stateRowsAtCkpt = 0L
  /** GCS poll gate: no consume task may launch before this time. */
  var nextPollAt = 0.0
  var pollWakeScheduled = false
  def stateRows: Long = {
    if (join != null) join.rows else if (agg != null) agg.rows else 0L
  }
  def id: (Int, Int) = (stage, ch)
}

/** Counters for the overhead/recovery experiments. */
final class Metrics {
  var tasks = 0L
  var replayTasks = 0L
  var repushJobs = 0L
  var rereadJobs = 0L
  var rewoundChannels = 0L
  var abortedTasks = 0L
  var shuffleBytes = 0L
  var backupBytes = 0L
  var spoolBytes = 0L
  var ckptBytes = 0L
  var recoveredPartitions = 0L
}

final case class RunResult(
  rows: Vector[R], schema: Sch, simSeconds: Double,
  metrics: Metrics, gcsTxns: Long, gcsLineageBytes: Long)

/** The pipelined query engine over the discrete-event cluster, implementing
  * write-ahead lineage (Algorithm 1). Failure recovery (Algorithm 2) lives
  * in [[Recovery]].
  *
  * Execution is eager on data and simulated on time: kernels run at task
  * launch (single-threaded, deterministic), while the simulated clock
  * charges CPU/disk/network/store costs and decides interleavings, failures
  * and recovery behaviour. Replayed tasks must regenerate bit-identical
  * output multisets — checked on every replay.
  */
final class Engine(
  val cfg: EngineConfig,
  val plan: Plan,
  tables: Map[String, Array[R]],
  failures: Seq[(Int, Double)] = Nil,
) {
  import cfg.cost

  private[core] val sim = new Sim
  private[core] val workers = Vector.tabulate(cfg.workers)(new WorkerRt(_, cost.coresPerWorker))
  private[core] val C = cfg.channels
  private[core] val gcs = new Gcs
  val metrics = new Metrics

  private[core] val channels: Vector[Vector[ChannelRt]] =
    plan.stages.map(s => Vector.tabulate(C) { c =>
      val ch = new ChannelRt(s.id, c)
      ch.worker = c % cfg.workers
      s.op match {
        case _: JoinOp => ch.join = new JoinState
        case _: AggOp  => ch.agg = new AggState
        case _         =>
      }
      ch
    })

  /** Global, replayable input batches per input stage ("files on S3"). */
  private[core] val inputBatches: Map[Int, Vector[Array[R]]] = plan.stages.collect {
    case Stage(id, InputOp(table, _), _, _, _) =>
      val rows = tables.getOrElse(table, throw new NoSuchElementException(s"table $table missing"))
      id -> rows.grouped(cfg.inputBatchRows).toVector
  }.toMap

  // assign batches round-robin to input channels
  for ((sid, batches) <- inputBatches; c <- 0 until C) {
    channels(sid)(c).myBatches = batches.indices.filter(_ % C == c).toVector
  }

  /** Unreliable producer-local backups: (stage, ch, seq) -> (worker, slices, bytes). */
  private[core] val backups = mutable.HashMap.empty[(Int, Int, Int), (Int, Vector[(Int, Array[R])], Long)]
  /** Reliable spooled partitions (survive any worker failure). */
  private[core] val spool = mutable.HashMap.empty[(Int, Int, Int), (Vector[(Int, Array[R])], Long)]
  /** Content digest of each task's output — replay-identity invariant. */
  private[core] val outputHash = mutable.HashMap.empty[(Int, Int, Int), Long]
  /** Tasks whose downstream push hit a dead worker: commit withheld
    * (Algorithm 1's "push results failed" branch), resolved by recovery.
    */
  private[core] val held = mutable.ArrayBuffer.empty[HeldTask]
  private[core] final case class HeldTask(
    stage: Int, ch: Int, epoch: Int, seq: Int, rec: LineageRec,
    slices: Vector[(Int, Array[R])], bytes: Long, readyAt: Double, markDone: Boolean)

  private[core] var barrier = false
  private var finished = false
  private var finishT = 0.0
  private val collectGot = mutable.HashSet.empty[Int]
  private val collectRows = mutable.ArrayBuffer.empty[R]
  private val stageReady = Array.tabulate(plan.stages.size)(s =>
    cfg.mode == Pipelined || plan.stages(s).upstreams.isEmpty)
  private val stageDoneCount = Array.fill(plan.stages.size)(0)
  private[core] val rng = new scala.util.Random(cfg.seed)

  // ---------------------------------------------------------------- helpers

  private def stageOf(id: Int): Stage = plan.stages(id)

  private def hashKey(k: Any): Int = {
    val h = k.hashCode
    val m = h % C
    if (m < 0) m + C else m
  }

  private[core] def poke(ch: ChannelRt): Unit = { tryLaunch(ch); checkDone(ch) }

  private[core] def pokeAll(): Unit =
    for (st <- channels; ch <- st) poke(ch)

  private def upstreamChannels(s: Stage): Vector[(Int, Int)] =
    for (u <- s.upstreams; c <- (0 until C).toVector) yield (u, c)

  /** Length of the consecutive run of consumable outputs of upstream `u`
    * starting at the consumer's watermark: each must have committed lineage
    * (the core invariant) and have arrived in the mailbox.
    */
  private def availRun(ch: ChannelRt, u: (Int, Int)): Int = {
    val w = ch.consumed.getOrElse(u, 0)
    var len = 0
    while (gcs.isCommitted(u._1, u._2, w + len) && ch.mailbox.contains((u._1, u._2, w + len)))
      len += 1
    len
  }

  // ------------------------------------------------------------- scheduling

  private[core] def tryLaunch(ch: ChannelRt): Unit = {
    if (finished || barrier || ch.busy) return
    val w = workers(ch.worker)
    if (!w.alive(sim.now)) return
    if (ch.replay.nonEmpty) {
      if (pollGateOpen(ch)) { ch.nextPollAt = sim.now + cost.pollIntervalS; tryReplay(ch) }
      return
    }
    if (!stageReady(ch.stage)) return
    val stage = stageOf(ch.stage)
    stage.op match {
      case InputOp(_, _) =>
        if (ch.cursor < ch.myBatches.size) launchInputTask(ch)
      case _: JoinOp =>
        if (pollGateOpen(ch)) pickConsume(ch).foreach { case (u, k) =>
          ch.nextPollAt = sim.now + cost.pollIntervalS
          launchConsumeTask(ch, u, k)
        }
      case _: AggOp =>
        if (pollGateOpen(ch)) pickConsume(ch) match {
          case Some((u, k)) =>
            ch.nextPollAt = sim.now + cost.pollIntervalS
            launchConsumeTask(ch, u, k)
          case None => if (readyToFlush(ch)) launchFlushTask(ch)
        }
    }
  }

  /** Stateful channels poll the GCS on a quantum: work accumulated since
    * the previous task is taken as one batch at the next poll, keeping
    * dynamic batching coarse instead of trickling single partitions (and
    * keeping per-stage output counts from multiplying by the channel
    * count). Returns false and schedules a wake-up if the gate is closed.
    */
  private def pollGateOpen(ch: ChannelRt): Boolean = {
    if (sim.now >= ch.nextPollAt) true
    else {
      if (!ch.pollWakeScheduled) {
        ch.pollWakeScheduled = true
        sim.at(ch.nextPollAt) { ch.pollWakeScheduled = false; poke(ch) }
      }
      false
    }
  }

  /** Pick (upstream channel, count) per the batching policy. Dynamic takes
    * the longest available run (the paper's maximize-batch strategy);
    * StaticBatch(k) takes exactly k, or the remainder once the upstream
    * channel is done.
    */
  private def pickConsume(ch: ChannelRt): Option[((Int, Int), Int)] = {
    val ups = upstreamChannels(stageOf(ch.stage))
    cfg.batching match {
      case Dynamic =>
        var best: (Int, Int) = null
        var bestLen = 0
        for (u <- ups) {
          val len = availRun(ch, u)
          val qualifies = len >= cfg.dynamicMinRun || (len > 0 && gcs.channelDone(u))
          if (qualifies && len > bestLen) { best = u; bestLen = len }
        }
        if (bestLen > 0) Some((best, bestLen)) else None
      case StaticBatch(k) =>
        ups.collectFirst {
          case u if availRun(ch, u) >= k => (u, k)
        }.orElse(ups.collectFirst {
          case u if gcs.channelDone(u) && {
            val rem = gcs.committedCount(u) - ch.consumed.getOrElse(u, 0)
            rem > 0 && availRun(ch, u) >= rem
          } => (u, gcs.committedCount(u) - ch.consumed.getOrElse(u, 0))
        })
    }
  }

  private def readyToFlush(ch: ChannelRt): Boolean =
    !ch.flushed && upstreamChannels(stageOf(ch.stage)).forall { u =>
      gcs.channelDone(u) && ch.consumed.getOrElse(u, 0) == gcs.committedCount(u)
    }

  // ---------------------------------------------------------------- kernels

  private def runInputKernel(stage: Stage, batch: Array[R]): Array[R] =
    stage.op.asInstanceOf[InputOp].fuse(batch)

  /** Symmetric hash join step: insert each row into its side's table, probe
    * the other side. Output multiset is independent of interleaving.
    */
  private def runJoinKernel(ch: ChannelRt, op: JoinOp, uStage: Int, rows: Array[R]): Array[R] = {
    val st = ch.join
    val out = mutable.ArrayBuffer.empty[R]
    val fromLeft = uStage == op.leftUp
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      if (fromLeft) {
        val k = op.lKey(r)
        st.left.getOrElseUpdate(k, mutable.ArrayBuffer.empty) += r
        st.rows += 1
        st.right.get(k).foreach(_.foreach { other =>
          val e = op.emit(r, other); if (e != null) out += e
        })
      } else {
        val k = op.rKey(r)
        st.right.getOrElseUpdate(k, mutable.ArrayBuffer.empty) += r
        st.rows += 1
        st.left.get(k).foreach(_.foreach { other =>
          val e = op.emit(other, r); if (e != null) out += e
        })
      }
      i += 1
    }
    out.toArray
  }

  private def runAggKernel(ch: ChannelRt, op: AggOp, rows: Array[R]): Unit = {
    val st = ch.agg
    var i = 0
    while (i < rows.length) {
      val r = rows(i)
      val k = op.key(r)
      val slot = st.m.getOrElseUpdate(k, { st.rows += 1; (op.keyOut(r), new Array[Long](op.nAccs)) })
      op.update(slot._2, r)
      i += 1
    }
  }

  private def runFlushKernel(ch: ChannelRt, op: AggOp): Array[R] =
    ch.agg.m.valuesIterator.map { case (keys, accs) => op.finish(keys, accs) }.toArray

  // --------------------------------------------------------------- launches

  private def launchInputTask(ch: ChannelRt): Unit = {
    val stage = stageOf(ch.stage)
    val bi = ch.myBatches(ch.cursor)
    val batch = inputBatches(ch.stage)(bi)
    ch.cursor += 1
    val out = runInputKernel(stage, batch)
    val cpu = cost.taskOverheadS +
      cost.cpuS(batch.length, cost.scanNsPerRow, cfg.kernelFactor) +
      cost.cpuS(out.length, cost.outNsPerRow, cfg.kernelFactor)
    finishTask(ch, ReadRec(bi), out, cpu, replayMode = false)
  }

  private def launchConsumeTask(ch: ChannelRt, u: (Int, Int), k: Int): Unit = {
    val stage = stageOf(ch.stage)
    val from = ch.consumed.getOrElse(u, 0)
    val rows = (from until from + k).toArray.flatMap { s =>
      val slice = ch.mailbox.remove((u._1, u._2, s))
      require(slice.isDefined, s"consuming unavailable slice ($u,$s) at ${ch.id}")
      slice.get
    }
    ch.consumed(u) = from + k
    val (out, nsPerRow) = stage.op match {
      case op: JoinOp => (runJoinKernel(ch, op, u._1, rows), cost.joinNsPerRow)
      case op: AggOp  => runAggKernel(ch, op, rows); (Array.empty[R], cost.aggNsPerRow)
      case _ => throw new IllegalStateException("input stage in consume path")
    }
    val cpu = cost.taskOverheadS +
      cost.cpuS(rows.length, nsPerRow, cfg.kernelFactor) +
      cost.cpuS(out.length, cost.outNsPerRow, cfg.kernelFactor)
    finishTask(ch, ConsumeRec(u._1, u._2, from, k), out, cpu, replayMode = false)
  }

  private def launchFlushTask(ch: ChannelRt): Unit = {
    val op = stageOf(ch.stage).op.asInstanceOf[AggOp]
    val out = runFlushKernel(ch, op)
    ch.flushed = true
    val cpu = cost.taskOverheadS +
      cost.cpuS(ch.agg.rows, cost.aggNsPerRow, cfg.kernelFactor) +
      cost.cpuS(out.length, cost.outNsPerRow, cfg.kernelFactor)
    finishTask(ch, FlushRec, out, cpu, replayMode = false)
  }

  /** Common task tail: charge CPU, then at CPU completion partition the
    * output, persist (backup/spool), push slices, and commit the lineage —
    * Algorithm 1's execute / store / push / commit sequence.
    */
  private def finishTask(ch: ChannelRt, rec: LineageRec, out: Array[R],
                         cpuDur: Double, replayMode: Boolean): Unit = {
    val mySeq = ch.seq
    ch.seq += 1
    ch.busy = true
    metrics.tasks += 1
    if (replayMode) metrics.replayTasks += 1
    val epoch = ch.epoch
    val w = workers(ch.worker)
    val cpuEnd = w.cpu.use(sim.now, cpuDur)
    sim.at(cpuEnd) {
      if (ch.epoch != epoch || !workers(ch.worker).alive(sim.now)) {
        metrics.abortedTasks += 1
      } else {
        ch.busy = false
        completeTask(ch, epoch, mySeq, rec, out, replayMode)
        tryLaunch(ch)
      }
    }
  }

  private[core] def sliceUp(stage: Stage, out: Array[R]): Vector[(Int, Array[R])] = {
    if (stage.id == plan.last) Vector((0, out)) // flush goes to the collector
    else {
      val parts = Array.fill(C)(mutable.ArrayBuffer.empty[R])
      out.foreach(r => parts(hashKey(stage.outKey(r))) += r)
      parts.toVector.zipWithIndex.map { case (b, i) => (i, b.toArray) }
    }
  }

  private def completeTask(ch: ChannelRt, epoch: Int, mySeq: Int, rec: LineageRec,
                           out: Array[R], replayMode: Boolean): Unit = {
    val stage = stageOf(ch.stage)
    val w = workers(ch.worker)
    val slices = sliceUp(stage, out)
    val bytes = out.length.toLong * stage.schema.rowBytes

    // replay-identity invariant: a replayed task must regenerate its output
    val key = (ch.stage, ch.ch, mySeq)
    outputHash.get(key) match {
      case Some(h) =>
        val h2 = Rows.multisetHash(out)
        if (h != h2) throw new IllegalStateException(
          s"replay divergence at $key: $h vs $h2 — lineage replay is broken")
      case None => outputHash(key) = Rows.multisetHash(out)
    }

    // persist: upstream backup to local disk, or spool to the reliable store
    var persistEnd = sim.now
    if (cfg.ft.upstreamBackup) {
      persistEnd = w.disk.use(sim.now, cost.diskS(bytes))
      backups(key) = (ch.worker, slices, bytes)
      metrics.backupBytes += bytes
    }
    if (cfg.ft.spooling) {
      persistEnd = w.storeLink.use(sim.now, cost.storeS(bytes, slices.size))
      spool(key) = (slices, bytes)
      metrics.spoolBytes += bytes
    }

    val isLast = stage.id == plan.last
    val markDone = rec == FlushRec ||
      (stage.op.isInstanceOf[InputOp] && ch.cursor == ch.myBatches.size && mySeq == ch.myBatches.size - 1)

    // push downstream (Algorithm 1: abort commit if a destination is dead)
    val deadDest = !isLast && slices.exists { case (d, _) =>
      !workers(channels(plan.consumers(ch.stage).head)(d).worker).alive(sim.now)
    }
    if (deadDest && !replayMode) {
      held += HeldTask(ch.stage, ch.ch, epoch, mySeq, rec, slices, bytes, persistEnd, markDone)
      return
    }

    var lastNet = sim.now
    if (isLast) {
      // only the flush of the final aggregation carries the query result;
      // its consume tasks produce no downstream output
      if (rec == FlushRec) {
        val netEnd = w.net.use(sim.now, cost.netS(bytes))
        lastNet = netEnd
        metrics.shuffleBytes += bytes
        val rows = slices.head._2
        sim.at(netEnd)(collectArrive(ch.ch, rows))
      }
    } else {
      val consumerStage = plan.consumers(ch.stage).head
      for ((d, rows) <- slices) {
        val dest = channels(consumerStage)(d)
        if (!replayMode || needsSlice(dest, ch.stage, ch.ch, mySeq)) {
          val sbytes = rows.length.toLong * stage.schema.rowBytes
          val netEnd =
            if (dest.worker == ch.worker) math.max(sim.now, lastNet) + 1e-6
            else w.net.use(sim.now, cost.netS(sbytes))
          lastNet = math.max(lastNet, netEnd)
          metrics.shuffleBytes += sbytes
          val destWorkerAtSend = dest.worker
          sim.at(netEnd)(sliceArrive(dest, destWorkerAtSend, ch.stage, ch.ch, mySeq, rows, epoch))
        }
      }
    }

    if (replayMode) {
      poke(ch)
      return // lineage already committed before the failure
    }

    val gcsLat = if (cfg.staticLineage) 0.0 else cost.gcsTxnS
    val commitAt = math.max(persistEnd, lastNet) + gcsLat
    scheduleCommit(ch, epoch, mySeq, rec, markDone, slices, commitAt)
  }

  private[core] def scheduleCommit(ch: ChannelRt, epoch: Int, mySeq: Int, rec: LineageRec,
                                   markDone: Boolean, slices: Vector[(Int, Array[R])],
                                   at: Double): Unit = {
    sim.at(at) {
      if (barrier) {
        // coordinator holds the GCS lock during recovery planning
        sim.after(cost.planS)(scheduleCommit(ch, epoch, mySeq, rec, markDone, slices, sim.now))
      } else if (ch.epoch == epoch && workers(ch.worker).alive(sim.now)) {
        val becameDone = gcs.commit(ch.stage, ch.ch, mySeq, rec, markDone)
        if (becameDone) onChannelDone(ch)
        // an arrival may have been dropped against a worker that died
        // between push and delivery — committed outputs must reach their
        // (possibly reassigned) consumers
        ensureDelivered(ch, mySeq, rec, slices)
        // wake consumers (their inputs just became committed) and self
        if (ch.stage != plan.last)
          plan.consumers(ch.stage).foreach(cs => channels(cs).foreach(poke))
        poke(ch)
        maybeFinish()
      }
    }
  }

  /** Re-push any slice of a just-committed task that its consumer does not
    * have (covers pushes dropped in the failure window). No-op on the
    * normal path: arrivals always precede the commit event.
    */
  private def ensureDelivered(ch: ChannelRt, mySeq: Int, rec: LineageRec,
                              slices: Vector[(Int, Array[R])]): Unit = {
    val stage = stageOf(ch.stage)
    val w = workers(ch.worker)
    if (ch.stage == plan.last) {
      if (rec == FlushRec && collectNeeds(ch.ch)) {
        val rows = slices.head._2
        val netEnd = w.net.use(sim.now, cost.netS(rows.length.toLong * stage.schema.rowBytes))
        sim.at(netEnd)(collectArrive(ch.ch, rows))
      }
    } else {
      val consumerStage = plan.consumers(ch.stage).head
      for ((d, rows) <- slices) {
        val dest = channels(consumerStage)(d)
        if (needsSlice(dest, ch.stage, ch.ch, mySeq) && workers(dest.worker).alive(sim.now)) {
          val sbytes = rows.length.toLong * stage.schema.rowBytes
          val netEnd = w.net.use(sim.now, cost.netS(sbytes))
          val sentTo = dest.worker
          sim.at(netEnd)(sliceArrive(dest, sentTo, ch.stage, ch.ch, mySeq, rows, ch.epoch))
        }
      }
    }
  }

  /** A destination still needs (prodStage, prodCh, seq) iff it has not
    * consumed past it and has no copy in its mailbox.
    */
  private[core] def needsSlice(dest: ChannelRt, ps: Int, pc: Int, seq: Int): Boolean =
    dest.consumed.getOrElse((ps, pc), 0) <= seq && !dest.mailbox.contains((ps, pc, seq))

  private[core] def sliceArrive(dest: ChannelRt, sentToWorker: Int, ps: Int, pc: Int,
                          seq: Int, rows: Array[R], prodEpochAtSend: Int): Unit = {
    // data addressed to a worker that died or lost the channel is dropped
    if (dest.worker != sentToWorker || !workers(dest.worker).alive(sim.now)) return
    if (dest.consumed.getOrElse((ps, pc), 0) > seq) return // already consumed (replay dup)
    // an uncommitted slice from a producer that has since been rewound is
    // stale: the producer's re-executed suffix may commit different content
    // under this sequence number
    if (channels(ps)(pc).epoch != prodEpochAtSend && !gcs.isCommitted(ps, pc, seq)) return
    dest.mailbox.getOrElseUpdate((ps, pc, seq), rows)
    poke(dest)
  }

  private def collectArrive(fromCh: Int, rows: Array[R]): Unit = {
    if (!collectGot.contains(fromCh)) {
      collectGot += fromCh
      collectRows ++= rows
    }
    maybeFinish()
  }

  private[core] def collectNeeds(fromCh: Int): Boolean = !collectGot.contains(fromCh)

  // ----------------------------------------------------------------- replay

  /** Replay the next logged lineage entry of a rewound channel. The GCS
    * supplies the exact lineage, so the channel "retraces its footsteps"
    * instead of choosing inputs dynamically (paper §IV-C).
    */
  private def tryReplay(ch: ChannelRt): Unit = {
    val (mySeq, rec) = ch.replay.head
    val stage = stageOf(ch.stage)
    rec match {
      case ConsumeRec(us, uc, from, k) =>
        val have = (from until from + k).forall(s => ch.mailbox.contains((us, uc, s)))
        if (!have) return
        ch.replay = ch.replay.tail
        val rows = (from until from + k).toArray.flatMap(s => ch.mailbox.remove((us, uc, s)).get)
        ch.consumed((us, uc)) = from + k
        val (out, nsPerRow) = stage.op match {
          case op: JoinOp => (runJoinKernel(ch, op, us, rows), cost.joinNsPerRow)
          case op: AggOp  => runAggKernel(ch, op, rows); (Array.empty[R], cost.aggNsPerRow)
          case _ => throw new IllegalStateException("input stage cannot replay ConsumeRec")
        }
        val cpu = cost.taskOverheadS +
          cost.cpuS(rows.length, nsPerRow, cfg.kernelFactor) +
          cost.cpuS(out.length, cost.outNsPerRow, cfg.kernelFactor)
        finishTask(ch, rec, out, cpu, replayMode = true)
      case FlushRec =>
        ch.replay = ch.replay.tail
        val op = stage.op.asInstanceOf[AggOp]
        val out = runFlushKernel(ch, op)
        ch.flushed = true
        val cpu = cost.taskOverheadS + cost.cpuS(ch.agg.rows, cost.aggNsPerRow, cfg.kernelFactor)
        finishTask(ch, rec, out, cpu, replayMode = true)
      case ReadRec(_) =>
        throw new IllegalStateException("input channels replay via re-read jobs, not the channel")
    }
  }

  // --------------------------------------------------------------- doneness

  private def checkDone(ch: ChannelRt): Unit = {
    if (gcs.channelDone(ch.id)) return
    val stage = stageOf(ch.stage)
    stage.op match {
      case _: InputOp => // done is marked by the last commit
      case _: JoinOp =>
        val complete = !ch.busy && ch.replay.isEmpty &&
          gcs.committedCount(ch.id) == ch.seq &&
          upstreamChannels(stage).forall { u =>
            gcs.channelDone(u) && ch.consumed.getOrElse(u, 0) == gcs.committedCount(u)
          }
        if (complete && gcs.markDone(ch.id)) onChannelDone(ch)
      case _: AggOp => // done is marked by the flush commit
    }
  }

  private def onChannelDone(ch: ChannelRt): Unit = {
    val sid = ch.stage
    stageDoneCount(sid) += 1
    if (stageDoneCount(sid) == C) onStageDone(sid)
    if (sid != plan.last) plan.consumers(sid).foreach(cs => channels(cs).foreach(poke))
    maybeFinish()
  }

  private def onStageDone(sid: Int): Unit = {
    if (cfg.mode == Stagewise) {
      for (cs <- plan.consumers(sid)) {
        if (stageOf(cs).upstreams.forall(u => stageDoneCount(u) == C) && !stageReady(cs)) {
          sim.after(cfg.stageOverheadS) {
            stageReady(cs) = true
            channels(cs).foreach(poke)
          }
        }
      }
    }
  }

  private def maybeFinish(): Unit = {
    if (!finished && collectGot.size == C &&
        (0 until C).forall(c => gcs.channelDone((plan.last, c)))) {
      finished = true
      finishT = sim.now
    }
  }

  // ------------------------------------------------------------- checkpoint

  private def scheduleCkptTicks(): Unit = cfg.ft match {
    case Ckpt(interval, incremental) =>
      def tick(ch: ChannelRt): Unit = {
        if (finished || gcs.channelDone(ch.id)) return
        if (!workers(ch.worker).alive(sim.now)) return
        if (ch.busy) { sim.after(0.05)(tick(ch)); return }
        val rows = if (incremental) ch.stateRows - ch.stateRowsAtCkpt else ch.stateRows
        val bytes = rows * stageOf(ch.stage).schema.rowBytes
        if (bytes > 0) {
          // the channel pauses while its state variable is serialized + put
          ch.busy = true
          metrics.ckptBytes += bytes
          val end = workers(ch.worker).storeLink.use(sim.now, cost.ckptS(bytes))
          val epoch = ch.epoch
          sim.at(end) {
            if (ch.epoch == epoch) {
              ch.busy = false
              ch.stateRowsAtCkpt = ch.stateRows
              poke(ch) // may both resume work and complete doneness
            }
          }
        }
        sim.after(interval)(tick(ch))
      }
      for (st <- channels; ch <- st if ch.join != null || ch.agg != null)
        sim.after(interval)(tick(ch))
    case _ =>
  }

  // ---------------------------------------------------------------- failure

  private def injectFailures(): Unit = failures.foreach { case (w, t) =>
    require(w >= 0 && w < cfg.workers, s"bad worker $w")
    sim.at(t) {
      if (!finished && workers(w).alive(sim.now)) {
        workers(w).deadAt = sim.now
        backups.filterInPlace { case (_, (owner, _, _)) => owner != w }
        sim.after(cost.detectS) {
          if (!finished) {
            barrier = true
            sim.after(cost.planS) {
              Recovery.plan(this)
              barrier = false
              pokeAll()
            }
          }
        }
      }
    }
  }

  // -------------------------------------------------------------------- run

  def run(): RunResult = {
    injectFailures()
    scheduleCkptTicks()
    // input channels with no assigned batches are done from the start
    sim.at(0.0) {
      for {
        st <- channels; ch <- st
        if stageOf(ch.stage).op.isInstanceOf[InputOp] && ch.myBatches.isEmpty
      } if (gcs.markDone(ch.id)) onChannelDone(ch)
    }
    sim.at(0.0)(pokeAll())
    sim.run()
    if (!finished) {
      val undone = for {
        st <- channels; ch <- st if !gcs.channelDone(ch.id)
      } yield s"${ch.id} seq=${ch.seq} committed=${gcs.committedCount(ch.id)} " +
        s"busy=${ch.busy} replay=${ch.replay.size} worker=${ch.worker} " +
        s"consumed=${ch.consumed.toMap} mbox=${ch.mailbox.size}"
      throw new IllegalStateException(
        s"engine deadlock in ${plan.name}: collect=${collectGot.size}/$C\n" + undone.mkString("\n"))
    }
    RunResult(collectRows.toVector, plan.resultSchema, finishT, metrics, gcs.txns, gcs.lineageBytes)
  }
}
