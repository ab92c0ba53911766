package repro.exec

/** Driver-side run statistics — the paper's three performance measures
  * (§7: runtime, peak RAM, #triggers) plus round/TG bookkeeping.
  *
  * #triggers is the count of body instantiations (join-output rows before
  * any dedup), the measure the paper calls "robust to most implementation
  * choices"; it is incremented by the engines after counting each bindings
  * DataFrame.
  */
final class Metrics {
  var triggers: Long = 0L
  var rounds: Int = 0
  var wallMs: Long = 0L
  var peakMemMb: Long = 0L
  /** TGmat optimization overheads (Table 8b): minDatalog / ruleExec. */
  var minDatalogMs: Long = 0L
  var ruleExecMs: Long = 0L

  def sampleMem(): Unit = {
    val rt = Runtime.getRuntime
    val used = (rt.totalMemory() - rt.freeMemory()) / (1024 * 1024)
    if (used > peakMemMb) peakMemMb = used
  }

  /** Times a block into `wallMs` (cumulative) and returns its value. */
  def timed[A](block: => A): A = {
    val t0 = System.nanoTime()
    val a = block
    wallMs += (System.nanoTime() - t0) / 1000000L
    sampleMem()
    a
  }
}

/** Result of one materialization run. */
final case class RunResult(store: FactStore, metrics: Metrics, idbFacts: Long)
