package repro.data

import repro.eval.ErDataset

/** Registry of the 7 evaluation datasets (Table 2), at two scales:
  * `testScale` for unit tests (fast) and `benchScale` for the benchmark
  * suites that reproduce the paper's tables.
  */
object Datasets {

  /** The four structured Dirty ER datasets — fixed paper-size shapes except
    * cddb, which is scalable.
    */
  def structured(cddbScale: Double = 1.0): Seq[ErDataset] = Seq(
    StructuredData.census(),
    StructuredData.restaurant(),
    StructuredData.cora(),
    StructuredData.cddb(cddbScale))

  /** The three heterogeneous Clean-clean ER datasets at a given SF. */
  def heterogeneous(scale: Double = 1.0): Seq[ErDataset] = Seq(
    HeterogeneousData.movies(0.1 * scale),
    HeterogeneousData.dbpedia(scale),
    HeterogeneousData.freebase(scale))

  /** Small versions for unit tests. */
  def structuredSmall: Seq[ErDataset] = structured(cddbScale = 0.15)
  def heterogeneousSmall: Seq[ErDataset] = Seq(
    HeterogeneousData.movies(0.02),
    HeterogeneousData.dbpedia(0.4),
    HeterogeneousData.freebase(0.5))
}
