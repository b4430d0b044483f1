package repro.core

/** The contract shared by every progressive method (Sec. 3.1).
  *
  * The paper splits a method into an initialization phase (build data
  * structures, find the overall best comparison) and a repeated emission
  * phase (return the next best comparison). We model both as a lazy
  * `Iterator[Comparison]`: creating the iterator and pulling its first
  * element is the initialization phase; every further `next()` is one
  * emission. Methods that terminate (e.g. GS-PSN after exhausting
  * `[1, w_max]`) simply end the iterator — the paper's `null` emission.
  */
trait ProgressiveMethod {

  /** Human-readable acronym used in result tables (e.g. "LS-PSN"). */
  def name: String

  /** A fresh emission stream. Each call restarts the method from scratch. */
  def emissions: Iterator[Comparison]
}
