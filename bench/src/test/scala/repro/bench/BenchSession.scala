package repro.bench

import repro.SparkSpec
import repro.exp.ExpSession

/** One shared experiment session for all bench suites (a single forked JVM
  * runs them sequentially, so datasets and trained models are reused
  * across the four table benches).
  */
object BenchSession {
  lazy val session: ExpSession = new ExpSession(SparkSpec.shared)
}
