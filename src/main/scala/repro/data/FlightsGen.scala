package repro.data

import scala.util.Random
import repro.core._

/** Synthetic stand-in for the Flights dataset (Table 5: 2376 tuples,
  * 7 attrs, 30% errors, types MV + FI + VAD).
  *
  * Structural profile: each flight appears only ~2.2 times (records from a
  * handful of conflicting sources), and departure/arrival times are
  * high-cardinality strings. The paper observes that almost no algorithm
  * moves the needle on Flights — tiny groups mean majority votes tie and
  * the correct time string is rarely recoverable.
  */
object FlightsGen extends DataGen {
  override val name = "Flights"
  override val defaultRows = 2376

  override val attrs: Seq[String] = Seq(
    "flight", "src", "dst", "sched_dep_time", "act_dep_time",
    "sched_arr_time", "act_arr_time")

  override val numericAttrs: Set[String] = Set.empty

  override val rules: Seq[Rule] = Seq(
    FD(Seq("flight"), "src"),
    FD(Seq("flight"), "dst"),
    FD(Seq("flight"), "sched_dep_time"),
    FD(Seq("flight"), "act_dep_time"),
    FD(Seq("flight"), "sched_arr_time"),
    FD(Seq("flight"), "act_arr_time"),
  )

  override val nominalErrorRate = 0.30
  override val errorTypes: Seq[String] = Seq("MV", "FI", "VAD")
  override val classTarget = "src"

  override def defaultSpec(seed: Long): ErrorGen.ErrorSpec = ErrorGen.ErrorSpec(
    nominalErrorRate,
    Seq(ErrorGen.ExplicitMV -> 1.0, ErrorGen.ImplicitMV -> 1.0,
        ErrorGen.Format -> 1.5, ErrorGen.InnerSwap -> 1.0),
    seed)

  private val Carriers = Vector("AA", "UA", "DL", "WN", "B6", "AS", "NK", "F9")
  private val Airports = Vector(
    "ORD", "DFW", "ATL", "LAX", "JFK", "DEN", "SFO", "SEA", "MIA", "BOS",
    "PHX", "IAH", "MSP", "DTW", "CLT", "LGA", "PHL", "SLC", "BWI", "SAN")

  private def clock(minuteOfDay: Int): String = {
    val h24 = (minuteOfDay / 60) % 24
    val m   = minuteOfDay % 60
    val ampm = if (h24 < 12) "a.m." else "p.m."
    val h12 = { val h = h24 % 12; if (h == 0) 12 else h }
    f"$h12%d:$m%02d $ampm"
  }

  override def cleanRows(n: Int, seed: Long): Array[Array[String]] = {
    val rnd = new Random(seed)
    val nFlights = math.max(1, math.ceil(n / 2.2).toInt)
    val flights = (0 until nFlights).map { f =>
      val src = Airports(f % Airports.size)
      val dst = Airports((f / Airports.size + f + 1) % Airports.size)
      val dstFixed = if (dst == src) Airports((f + 3) % Airports.size) else dst
      val fid = s"${Carriers(f % Carriers.size)}-${1000 + (f * 37) % 9000}-$src-$dstFixed"
      val dep = 300 + rnd.nextInt(1080)
      val dur = 60 + rnd.nextInt(300)
      val depDelay = rnd.nextInt(40)
      val arrDelay = rnd.nextInt(50)
      Array(fid, src, dstFixed, clock(dep), clock(dep + depDelay),
        clock(dep + dur), clock(dep + dur + arrDelay))
    }
    Array.tabulate(n)(i => flights(i % nFlights).clone())
  }
}
