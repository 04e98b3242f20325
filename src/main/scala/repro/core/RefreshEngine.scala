package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions.{col, lit}
import repro.sched.Clock
import repro.txn.{Frontier, TableVersion, TransactionManager}
import scala.collection.mutable

/** The dynamic-table engine (§5): catalog + transaction manager + refresh
  * execution. Each refresh is a micro-batch: an optimized relational plan
  * (Catalyst, via [[Eval]] / [[Differentiator]]) executed inside a locked,
  * versioned commit — mirroring "each micro-batch is an optimized,
  * relational query plan … running in the context of Snowflake's
  * transaction engine".
  *
  * Refresh actions (§3.3.2/§5.4):
  *   - NO_DATA      — sources unchanged (decided from version *metadata*,
  *                    no compute); only the data timestamp advances.
  *   - FULL         — INSERT OVERWRITE of the defining query at the new
  *                    data timestamp.
  *   - INCREMENTAL  — differentiate the defining query over the interval
  *                    and merge the change set into the stored contents.
  *   - REINITIALIZE — full recompute forced by an upstream replacement
  *                    (lineage-epoch change) that invalidated stored state.
  *
  * Production validations (§6.1) enforced here:
  *   1. an upstream DT version must exist at *exactly* the refresh
  *      timestamp, else the refresh fails (snapshot-isolation guard);
  *   2. a change set never has >1 row per ($ROW_ID, $ACTION);
  *   3. a merge must never delete a row that is not present.
  */
final class Engine(val spark: SparkSession, val clock: Clock, failureThreshold: Int = 5) {
  val tm = new TransactionManager(clock)
  private val dts = mutable.LinkedHashMap.empty[String, DtState]

  def isDt(name: String): Boolean = dts.contains(name)
  def dtState(name: String): DtState =
    dts.getOrElse(name, throw new NoSuchElementException(s"unknown dynamic table $name"))
  def graph: DtGraph = new DtGraph(dts.values.map(_.spec).toSeq)

  // ---- base-table DDL/DML (delegated to the transaction manager) ----
  def createBaseTable(name: String, contents: DataFrame): Unit = { tm.createBaseTable(name, contents); () }
  def dml(name: String, inserts: DataFrame, deletes: DataFrame): Unit = { tm.dml(name, inserts, deletes); () }
  def insert(name: String, rows: DataFrame): Unit = dml(name, rows, rows.where(lit(false)))
  def replaceBaseTable(name: String, contents: DataFrame): Unit = { tm.replaceBaseTable(name, contents); () }

  // ---- reads ----
  /** Latest persisted contents (what a user query reads; §4's PL-2 path
    * when combined with other tables).
    */
  def read(name: String): DataFrame = {
    if (isDt(name))
      require(dtState(name).isInitialized, s"dynamic table $name has not been initialized (§3.1)")
    Weighted.expand(tm.table(name).latest.snapshot)
  }

  /** Contents at exactly data timestamp `ts` (DT time travel). */
  def readAt(name: String, ts: Long): DataFrame =
    Weighted.expand(
      tm.table(name).versionAtExactly(ts)
        .getOrElse(throw new NoSuchElementException(s"$name has no version at data timestamp $ts"))
        .snapshot
    )

  /** The DT's current data timestamp (§3.1.1). */
  def dataTimestamp(name: String): Long =
    dtState(name).frontier.getOrElse(throw new IllegalStateException(s"$name not initialized")).dataTs

  // ---- DT DDL ----
  /** Create a dynamic table; with `sync = true` also initialize it now
    * (§3.1: initialization can be synchronous or deferred to the
    * scheduler).
    */
  def createDynamicTable(spec: DtSpec, sync: Boolean = true): Unit = {
    spec.query.sources.foreach { s =>
      require(tm.contains(s), s"source $s of ${spec.name} does not exist")
    }
    require(!tm.contains(spec.name), s"table ${spec.name} already exists")
    dts(spec.name) = new DtState(spec)
    tm.register(spec.name)
    graph.topoOrder // validates acyclicity eagerly
    if (sync) initialize(spec.name)
  }

  def dropDynamicTable(name: String): Unit = { dtState(name); dts.remove(name); tm.drop(name) }

  def suspend(name: String): Unit = dtState(name).suspended = true
  def resume(name: String): Unit = {
    val st = dtState(name); st.suspended = false; st.consecutiveFailures = 0
  }

  /** Initialization-timestamp selection (§3.1.2): reuse the most recent
    * data timestamp shared by all upstream DTs that is still within the
    * target lag — avoiding the quadratic re-refresh of upstream chains —
    * else fall back to creation time, refreshing the upstream closure at
    * that timestamp like a manual refresh. The chosen timestamp may be
    * *before* creation time; the paper calls this a small sacrifice for
    * clean semantics.
    */
  def initialize(name: String): RefreshResult = {
    val st = dtState(name)
    require(!st.isInitialized, s"$name is already initialized")
    val g = graph
    val upDts = g.upstream(name)
    val lagOpt = g.resolvedLag(name)
    val now = clock.nowSeconds
    val candidate: Option[Long] =
      if (upDts.isEmpty) None
      else {
        val common = upDts.map(u => tm.table(u).allDataTimestamps.toSet).reduceLeft(_ intersect _)
        val within = common.filter(t => lagOpt.forall(lag => now - t <= lag))
        if (within.isEmpty) None else Some(within.max)
      }
    val initTs = candidate.getOrElse {
      val floor = (upDts.map(u => dataTimestamp(u)) :+ (now - 1)).max
      val ts = math.max(now, floor + 1)
      g.upstreamClosure(name).foreach(u => if (dataTimestamp(u) < ts) refresh(u, ts))
      ts
    }
    runInitialization(name, initTs)
  }

  private def runInitialization(name: String, initTs: Long): RefreshResult = tm.withLock(name) {
    val st = dtState(name)
    val srcs = st.spec.query.sources.toSeq.sorted
    val resolved = srcs.map(s => s -> resolveVersion(s, initTs)).toMap
    val snapPlain = Eval.snapshot(st.spec.query, s => Weighted.expand(resolved(s).snapshot))
    val weighted = Weighted.consolidate(Weighted.fromSnapshot(snapPlain)).localCheckpoint(true)
    val rows = weighted.count()
    tm.table(name).commit(TableVersion(tm.hlc.now(), initTs, weighted, weighted, rows, 0L))
    st.frontier = Some(Frontier.initial(initTs, srcs, resolved.map { case (s, v) => s -> v.lineageEpoch }, tm.hlc.peek()))
    RefreshResult(name, FullRefresh, initTs, rows)
  }

  /** Resolve the version of source `s` visible at data timestamp `ts`:
    * exact for upstream DTs (validation #1), floor for base tables (§5.3).
    */
  private def resolveVersion(s: String, ts: Long): TableVersion =
    if (isDt(s))
      tm.table(s).versionAtExactly(ts).getOrElse(
        throw new IllegalStateException(
          s"snapshot-isolation violation: upstream DT $s has no version at exactly $ts (§6.1 validation)"))
    else
      tm.table(s).versionAtOrBefore(ts).getOrElse(
        throw new IllegalStateException(s"base table $s has no version at or before $ts"))

  /** Refresh `name` to data timestamp `refreshTs` (> current). Errors
    * increment the consecutive-failure counter; at `failureThreshold` the
    * DT auto-suspends (§3.3.3).
    */
  def refresh(name: String, refreshTs: Long): RefreshResult = {
    val st = dtState(name)
    require(!st.suspended, s"$name is suspended after ${st.consecutiveFailures} consecutive failures")
    try {
      val r = tm.withLock(name)(doRefresh(st, refreshTs))
      st.consecutiveFailures = 0
      r
    } catch {
      case e: Throwable =>
        st.consecutiveFailures += 1
        if (st.consecutiveFailures >= failureThreshold) st.suspended = true
        throw e
    }
  }

  private def doRefresh(st: DtState, refreshTs: Long): RefreshResult = {
    val name = st.spec.name
    val fr = st.frontier.getOrElse(throw new IllegalStateException(s"$name not initialized"))
    require(refreshTs > fr.dataTs, s"$name: refresh timestamp $refreshTs must advance past ${fr.dataTs}")
    val srcs = st.spec.query.sources.toSeq.sorted
    val newV = srcs.map(s => s -> resolveVersion(s, refreshTs)).toMap
    val oldV = srcs.map(s => s -> resolveVersion(s, fr.dataTs)).toMap
    val epochChanged = srcs.exists(s => fr.epochs.get(s).exists(_ != newV(s).lineageEpoch))
    val changedRows = srcs.map(s => tm.table(s).changedRowsBetween(fr.dataTs, refreshTs)).sum
    val vt = tm.table(name)
    val newEpochs = newV.map { case (s, v) => s -> v.lineageEpoch }

    def advance(): Unit =
      st.frontier = Some(fr.advance(refreshTs, srcs, newEpochs, tm.hlc.peek()))

    if (changedRows == 0L && !epochChanged) {
      // NO_DATA: metadata-only commit — zero warehouse compute (§5.4).
      vt.alias(refreshTs)
      advance()
      RefreshResult(name, NoData, refreshTs, 0L)
    } else {
      val action: RefreshAction = st.spec.refreshMode match {
        case FullMode                        => FullRefresh
        case IncrementalMode if epochChanged => Reinitialize
        case IncrementalMode                 => IncrementalRefresh
      }
      val prevStored = vt.latest.snapshot
      val (snapshot, delta) = action match {
        case IncrementalRefresh =>
          val bind: String => SourceState = s => SourceState(
            old = Weighted.expand(oldV(s).snapshot),
            neu = Weighted.expand(newV(s).snapshot),
            delta = tm.table(s).deltaBetween(fr.dataTs, refreshTs)
              .getOrElse(newV(s).snapshot.where(lit(false))),
          )
          val d = Differentiator.delta(st.spec.query, bind).localCheckpoint(true)
          val dupes = ChangeSet.duplicateActionPairs(ChangeSet.fromWeighted(d))
          require(dupes == 0L, s"$name: change set has $dupes duplicate ($$ROW_ID, $$ACTION) pairs (§6.1 validation)")
          // Checkpoint the merge once, then validate against the pinned
          // result — the invariant check must not recompute the plan.
          val merged = Weighted.consolidate(prevStored.unionByName(d)).localCheckpoint(true)
          val negatives = merged.where(col(Weighted.W) < 0).count()
          require(negatives == 0L, s"$name: refresh deletes $negatives row group(s) not present in the DT (§6.1 validation)")
          (merged, d)
        case _ => // FULL or REINITIALIZE: recompute from the new snapshots.
          val plain = Eval.snapshot(st.spec.query, s => Weighted.expand(newV(s).snapshot))
          val snap = Weighted.consolidate(Weighted.fromSnapshot(plain)).localCheckpoint(true)
          // Emit a correct delta anyway so downstream incremental DTs keep working.
          val d = Weighted.consolidate(snap.unionByName(Weighted.negate(prevStored))).localCheckpoint(true)
          (snap, d)
      }
      val deltaRows = delta.count()
      vt.commit(TableVersion(tm.hlc.now(), refreshTs, snapshot, delta, deltaRows, vt.latest.lineageEpoch))
      advance()
      RefreshResult(name, action, refreshTs, deltaRows)
    }
  }

  /** Manual refresh (§3.1.2): choose a data timestamp after the command
    * was issued and refresh the whole upstream closure at it, then `name`.
    */
  def refreshManual(name: String): RefreshResult = {
    val g = graph
    val closure = g.upstreamClosure(name) :+ name
    val floor = closure.map(dataTimestamp).max
    val ts = math.max(clock.nowSeconds, floor + 1)
    closure.dropRight(1).foreach(u => if (dataTimestamp(u) < ts) refresh(u, ts))
    refresh(name, ts)
  }

  /** Refresh every initialized, non-suspended DT at data timestamp `ts`
    * in topological order (used by the micro-batch driver and tests; the
    * production scheduler in `repro.sched` makes finer-grained choices).
    */
  def refreshGraphAt(ts: Long): Seq[RefreshResult] =
    graph.topoOrder.flatMap { n =>
      val st = dtState(n)
      if (st.isInitialized && !st.suspended && dataTimestamp(n) < ts) Some(refresh(n, ts)) else None
    }
}
