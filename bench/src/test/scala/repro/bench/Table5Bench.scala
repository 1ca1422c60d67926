package repro.bench

import repro.ReproSpec
import repro.core.Harness

/** Reproduces Table 5: dataset characteristics.
  *
  * Paper reference:
  *   Hospital 1000x20  3% T,VAD | Flights 2376x7 30% MV,FI,VAD
  *   Beers    2410x11 16% MV,FI,VAD | Rayyan 1000x11 9% MV,T,FI,VAD
  *   Tax    200000x15  4% T,FI,VAD  (measured here on a 20k subset)
  */
class Table5Bench extends ReproSpec {

  test("Table 5: dataset characteristics") {
    val stats = Harness.table5(spark, taxRows = 20000)
    println("==== Table 5 (measured) ====")
    println(Harness.renderTable5(stats))

    val byName = stats.map(s => s.name -> s).toMap
    assert(byName("Hospital").tuples === 1000 && byName("Hospital").attrs === 20)
    assert(byName("Flights").tuples === 2376 && byName("Flights").attrs === 7)
    assert(byName("Beers").tuples === 2410 && byName("Beers").attrs === 11)
    assert(byName("Rayyan").tuples === 1000 && byName("Rayyan").attrs === 11)
    assert(byName("Tax").attrs === 15)

    def near(n: String, nominal: Double): Unit = {
      val r = byName(n).errorRate
      assert(r > nominal * 0.6 && r < nominal * 1.4, s"$n rate $r vs $nominal")
    }
    near("Hospital", 0.03); near("Flights", 0.30); near("Beers", 0.16)
    near("Rayyan", 0.09); near("Tax", 0.04)
  }
}
