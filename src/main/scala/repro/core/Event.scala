package repro.core

/** A primitive event (data-tuple) of the paper's event model (§3).
  *
  * Attribute names are fixed to the ones the evaluation needs (stock domain +
  * synthetic A/B types) so the type is flat and Spark-encodable:
  *
  *  - `idx`    global stream position (the paper's position `i`)
  *  - `ts`     arrival time in milliseconds (the paper assigns arrival time)
  *  - `etype`  event type in `T` (BUY, SELL, A1, ...)
  *  - `name`   stock symbol ("" when absent, i.e. NULL)
  *  - `price`, `volume`  numeric attributes (NaN-free; 0 when absent)
  */
final case class Ev(
    idx: Long,
    ts: Long,
    etype: String,
    name: String,
    price: Double,
    volume: Double,
)

/** A recognized complex event `C = ([start, end], data)` (§3).
  *
  * `data` is kept sorted ascending so equality is canonical across engines.
  */
final case class ComplexEvent(start: Long, end: Long, data: List[Long]) {
  require(data.isEmpty || (data.head >= start && data.last <= end),
    s"data $data outside [$start,$end]")
}

object ComplexEvent {
  /** Canonicalizing constructor: sorts `data`. */
  def of(start: Long, end: Long, data: Seq[Long]): ComplexEvent =
    ComplexEvent(start, end, data.sorted.toList)
}
