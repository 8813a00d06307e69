package repro.gen

import repro.core.Ev
import java.util.Random

/** Deterministic in-memory stream generators for the paper's workloads (§6).
  * Pure JVM (no Spark) so single-threaded benchmark loops measure the engines,
  * not the dataflow layer. Spark-side equivalents live in
  * [[repro.spark.SparkStreams]].
  */
object StreamGen {

  /** RandomStream of §6 "Sequence queries with output": the given event types
    * plus B1..B6 noise, each with uniform probability; ts = idx.
    */
  def randomStream(n: Int, types: Seq[String], noise: Int = 6, seed: Long = 7): Array[Ev] = {
    val all = (types ++ (1 to noise).map(i => s"B$i")).toArray
    val rnd = new Random(seed)
    Array.tabulate(n) { i =>
      Ev(i.toLong, i.toLong, all(rnd.nextInt(all.length)), "", 0.0, 0.0)
    }
  }

  /** Stock symbols used by appendix-C queries (plus fillers). */
  val StockNames: Array[String] =
    Array("MSFT", "ORCL", "CSCO", "AMAT", "AMZN", "INTC", "IBM", "DELL", "QQQ", "IPIX")

  /** Synthetic stand-in for the WPI stock trace (see DESIGN.md §3).
    *
    * BUY/SELL of the appendix-C symbols; prices span the paper's filter
    * thresholds (26.0, 11.14, 18.92); ~`nVolumes` distinct volumes so
    * PARTITION BY [volume] forms real substreams; ts spaced `tsStepMs` ms
    * apart so a 30 000 ms window holds ~100 events (the paper's calibration:
    * 4 803 e/s over 30 s ≈ 100 in-window events at their rate — we keep the
    * *in-window event count* equal rather than the rate).
    */
  def stockStream(n: Int, seed: Long = 11, nVolumes: Int = 50, tsStepMs: Long = 300): Array[Ev] = {
    val rnd = new Random(seed)
    Array.tabulate(n) { i =>
      val name = StockNames(rnd.nextInt(StockNames.length))
      val etype = if (rnd.nextBoolean()) "BUY" else "SELL"
      // Log-uniform-ish price in [1, 100): crosses all the filter thresholds.
      val price = math.floor(math.pow(10.0, rnd.nextDouble() * 2.0) * 100) / 100.0
      val volume = (rnd.nextInt(nVolumes) + 1) * 100.0
      Ev(i.toLong, i.toLong * tsStepMs, etype, name, price, volume)
    }
  }

  /** Cycle a base stream to `total` events, rebasing idx/ts so positions keep
    * increasing — used when a benchmark outruns the generated array.
    */
  def cycled(base: Array[Ev], total: Long): Iterator[Ev] = {
    val m = base.length
    val tsSpan = base(m - 1).ts - base(0).ts + math.max(1, if (m > 1) base(1).ts - base(0).ts else 1)
    new Iterator[Ev] {
      private var i = 0L
      def hasNext: Boolean = i < total
      def next(): Ev = {
        val b = base((i % m).toInt)
        val ev = b.copy(idx = i, ts = b.ts + (i / m) * tsSpan)
        i += 1
        ev
      }
    }
  }
}
