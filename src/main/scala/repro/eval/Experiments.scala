package repro.eval

import repro.blocking.TokenBlockingWorkflow
import repro.core._

/** The experiment matrix of Sec. 7, shared by the spark-submit jobs and the
  * bench suites so both produce identical tables.
  */
object Experiments {

  /** GS-PSN comparison budget used on freebase, emulating the paper's
    * footnote 9 (GS-PSN was limited by the 80 GB heap and terminated below
    * 20 % recall): the budget allows roughly three window sizes' worth of
    * stored comparisons.
    */
  def gsPsnBudget(nlSize: Int): Long = 3L * nlSize

  /** Methods evaluated on a structured dataset (Fig. 9/10): the schema-based
    * PSN baseline + both naïve and all four advanced schema-agnostic methods.
    */
  def structuredMethods(ds: ErDataset): Seq[ProgressiveMethod] = {
    val nl = NeighborList.build(ds.pc)
    lazy val pi = TokenBlockingWorkflow.profileIndex(ds.pc)
    ds.psnKey.map(k => new PSN(ds.pc, k)).toSeq ++ Seq(
      new SAPSN(ds.pc, nl),
      new SAPSAB(ds.pc),
      new LSPSN(ds.pc, nl),
      new GSPSN(ds.pc, nl, wMax = 20),
      new PBS(ds.pc, pi),
      new PPS(ds.pc, pi))
  }

  /** Methods evaluated on a heterogeneous dataset (Fig. 11/12): SA-PSN is
    * the only baseline (no expert keys exist — Sec. 7 "Baselines");
    * GS-PSN uses w_max = 200 and, on freebase, the memory budget.
    */
  def heterogeneousMethods(ds: ErDataset): Seq[ProgressiveMethod] = {
    val nl = NeighborList.build(ds.pc)
    lazy val pi = TokenBlockingWorkflow.profileIndex(ds.pc)
    val budget = if (ds.name == "freebase") gsPsnBudget(nl.size) else Long.MaxValue
    Seq(
      new SAPSN(ds.pc, nl),
      new SAPSAB(ds.pc),
      new LSPSN(ds.pc, nl),
      new GSPSN(ds.pc, nl, wMax = 200, maxComparisons = budget),
      new PBS(ds.pc, pi),
      new PPS(ds.pc, pi))
  }

  def runAll(
      datasets: Seq[ErDataset],
      methods: ErDataset => Seq[ProgressiveMethod],
      maxEcStar: Double = 30.0): Seq[MethodResult] =
    for (ds <- datasets; m <- methods(ds)) yield Harness.run(m, ds, maxEcStar)

  /** Method factories for the timing study: each thunk builds its own
    * pre-processing structures (Neighbor List / Token Blocking Workflow), so
    * `Harness.timed` charges them to the initialization time, as the paper
    * does (Sec. 7 "Metrics").
    */
  def timingFactories(ds: ErDataset): Seq[() => ProgressiveMethod] = Seq(
    () => SAPSN(ds.pc),
    () => LSPSN(ds.pc),
    () => {
      val nl = NeighborList.build(ds.pc)
      val budget = if (ds.name == "freebase") gsPsnBudget(nl.size) else Long.MaxValue
      new GSPSN(ds.pc, nl, wMax = 200, maxComparisons = budget)
    },
    () => new PBS(ds.pc, TokenBlockingWorkflow.profileIndex(ds.pc)),
    () => new PPS(ds.pc, TokenBlockingWorkflow.profileIndex(ds.pc)))

  /** Timing matrix of Sec. 7.3 (movies + dbpedia; SA-PSAB excluded as in the
    * paper — an order of magnitude slower): every advanced method + SA-PSN,
    * with the cheap and the expensive match function.
    */
  def runTimings(datasets: Seq[ErDataset], maxEcStar: Double = 5.0): Seq[TimedResult] =
    for {
      ds <- datasets
      fn <- Seq(MatchFunctions.JaccardFn, MatchFunctions.EditDistanceFn)
      mk <- timingFactories(ds)
    } yield Harness.timed(mk, ds, fn, maxEcStar)
}
