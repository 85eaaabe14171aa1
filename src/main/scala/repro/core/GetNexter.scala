package repro.core

import repro.webdb.WebTuple

/** The paper's "Get-Next" primitive: each call discovers the next-best
  * tuple under the user-specified ranking function, issuing as few queries
  * to the hidden web database as possible. Implementations keep per-session
  * state (seen tuples, tie-group queues, resolved regions) so repeated
  * calls are incremental.
  */
trait GetNexter {

  /** Discover the next tuple in user-ranking order; `None` once the result
    * set under the session's filter is exhausted.
    */
  def getNext(): Option[WebTuple]

  /** Convenience: up to `n` further tuples (stops early on exhaustion). */
  def next(n: Int): Vector[WebTuple] = {
    val b    = Vector.newBuilder[WebTuple]
    var i    = 0
    var done = false
    while (i < n && !done) getNext() match {
      case Some(t) => b += t; i += 1
      case None    => done = true
    }
    b.result()
  }
}
