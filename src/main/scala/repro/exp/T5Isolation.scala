package repro.exp

import repro.isolation._
import scala.util.Random

/** T5 — transactional phenomena under persisted-table semantics vs
  * delayed view semantics (§4, Figures 1 and 2).
  *
  * Reproduced claims:
  *   - modelling refreshes as ordinary transactions (persisted table
  *     semantics) yields a *serializable* DSG even when the application
  *     observes read skew — the framework cannot see the anomaly;
  *   - modelling refreshes as derivations (DVS) exposes the same history
  *     as G2 / G-single;
  *   - across randomized histories, the DVS model detects exactly the
  *     histories where the application-level skew truly exists, while the
  *     persisted model flags none.
  */
object T5Isolation {

  final case class Row(scenario: String, model: String, phenomena: String, level: String)
  final case class RandomStats(histories: Int, trueSkew: Int, dvsFlagged: Int, persistedFlagged: Int,
                               dvsExact: Boolean)

  final case class Result(rows: Seq[Row], random: RandomStats) {
    def table: String = Tables.render(
      "T5 Isolation phenomena: persisted vs delayed view semantics (§4)",
      Seq("scenario", "model", "phenomena detected", "strongest level"),
      rows.map(r => Seq(r.scenario, r.model, r.phenomena, r.level)),
    )
    def randomTable: String = Tables.render(
      "T5b Randomized stale-refresh histories",
      Seq("histories", "with true read skew", "flagged by DVS model", "flagged by persisted model", "DVS matches ground truth"),
      Seq(Seq(random.histories.toString, random.trueSkew.toString, random.dvsFlagged.toString,
        random.persistedFlagged.toString, random.dvsExact.toString)),
      Seq("paper: the traditional model 'is unable to identify a phenomenon that seems obvious to observers'"),
    )
  }

  /** Figure 1 / Figure 2 histories, parameterized by how stale the read
    * DT version is: staleRead = true reads y3 (derived from x1) with x2.
    */
  def persistedHistory(staleRead: Boolean): History = History(
    ops = Seq(
      Write(1, "x", 1), Write(2, "x", 2),
      Read(3, "x", 1), Write(3, "y", 3),
      Read(4, "x", 2), Write(4, "y", 4),
      Read(5, "y", if (staleRead) 3 else 4), Read(5, "x", 2),
    ),
    committed = Set(1, 2, 3, 4, 5),
    versionOrder = Map("x" -> Seq(1, 2), "y" -> Seq(3, 4)))

  def dvsHistory(staleRead: Boolean): History = History(
    ops = Seq(
      Write(1, "x", 1), Write(2, "x", 2),
      Derive(3, "y", 3, Seq(("x", 1))),
      Derive(4, "y", 4, Seq(("x", 2))),
      Read(5, "y", if (staleRead) 3 else 4), Read(5, "x", 2),
    ),
    committed = Set(1, 2, 3, 4, 5),
    versionOrder = Map("x" -> Seq(1, 2), "y" -> Seq(3, 4)))

  /** A random history: n versions of x; a DT y refreshed (derived) from a
    * random version; a reader mixing a DT version with a base version.
    * True read skew exists iff the reader's two observations correspond
    * to different base versions.
    */
  private def randomPair(rng: Random): (History, History, Boolean) = {
    val nV = 2 + rng.nextInt(3)
    val writes = (1 to nV).map(v => Write(v, "x", v))
    // y_i derives from x_src(i); refreshes advance monotonically, like a
    // real DT whose data timestamp only moves forward.
    val refreshSrc = (1 to nV).map(_ => 1 + rng.nextInt(nV)).sorted
    val readY = 1 + rng.nextInt(nV)
    val readX = 1 + rng.nextInt(nV)
    val trueSkew = refreshSrc(readY - 1) != readX
    val readerTxn = 100
    val vo = Map("x" -> (1 to nV).toSeq, "y" -> (1 to nV).map(_ + 10).toSeq)
    val persisted = History(
      writes ++ (1 to nV).flatMap(i => Seq(Read(50 + i, "x", refreshSrc(i - 1)), Write(50 + i, "y", i + 10))) ++
        Seq(Read(readerTxn, "y", readY + 10), Read(readerTxn, "x", readX)),
      committed = (1 to nV).toSet ++ (51 to 50 + nV).toSet + readerTxn,
      versionOrder = vo)
    val dvs = History(
      writes ++ (1 to nV).map(i => Derive(50 + i, "y", i + 10, Seq(("x", refreshSrc(i - 1))))) ++
        Seq(Read(readerTxn, "y", readY + 10), Read(readerTxn, "x", readX)),
      committed = (1 to nV).toSet ++ (51 to 50 + nV).toSet + readerTxn,
      versionOrder = vo)
    (persisted, dvs, trueSkew)
  }

  def run(randomHistories: Int = 200, seed: Long = 7L): Result = {
    def describe(h: History): (String, String) = {
      val r = Phenomena.analyze(h)
      (if (r.present.isEmpty) "none" else r.present.toSeq.sorted.mkString(", "), r.strongestLevel)
    }
    val rows = Seq(
      ("Fig 1: stale DT read, refreshes as txns", "persisted", persistedHistory(true)),
      ("Fig 2: stale DT read, refreshes as derivations", "DVS", dvsHistory(true)),
      ("consistent DT read, refreshes as derivations", "DVS", dvsHistory(false)),
    ).map { case (s, m, h) => val (p, l) = describe(h); Row(s, m, p, l) }

    val rng = new Random(seed)
    var trueSkew = 0; var dvsFlag = 0; var persistedFlag = 0; var exact = true
    for (_ <- 1 to randomHistories) {
      val (hp, hd, skew) = randomPair(rng)
      val fp = Phenomena.analyze(hp).g2
      val fd = Phenomena.analyze(hd).g2
      if (skew) trueSkew += 1
      if (fd) dvsFlag += 1
      if (fp) persistedFlag += 1
      if (fd != skew) exact = false
    }
    Result(rows, RandomStats(randomHistories, trueSkew, dvsFlag, persistedFlag, exact))
  }
}
