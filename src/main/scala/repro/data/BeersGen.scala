package repro.data

import scala.util.Random
import repro.core._

/** Synthetic stand-in for the Beers dataset (Table 5: 2410 tuples,
  * 11 attrs, 16% errors, types MV + FI + VAD).
  *
  * Structural profile: ~560 breweries (groups of ~4), beer names and ids
  * near-unique, several numeric columns — "complex and lengthy data" on
  * which the paper sees almost all algorithms struggle and HoloClean
  * collapse (rare-value detection fires on the unique columns).
  */
object BeersGen extends DataGen {
  override val name = "Beers"
  override val defaultRows = 2410

  override val attrs: Seq[String] = Seq(
    "id", "beer_name", "style", "ounces", "abv", "ibu",
    "brewery_id", "brewery_name", "city", "state", "established")

  override val numericAttrs: Set[String] = Set("ounces", "abv", "ibu", "established")

  override val rules: Seq[Rule] = Seq(
    FD(Seq("brewery_id"), "brewery_name"),
    FD(Seq("brewery_id"), "city"),
    FD(Seq("brewery_id"), "state"),
    FD(Seq("brewery_id"), "established"),
    FD(Seq("city"), "state"),
  )

  override val nominalErrorRate = 0.16
  override val errorTypes: Seq[String] = Seq("MV", "FI", "VAD")
  override val classTarget = "style"

  override def defaultSpec(seed: Long): ErrorGen.ErrorSpec = ErrorGen.ErrorSpec(
    nominalErrorRate,
    Seq(ErrorGen.ExplicitMV -> 1.0, ErrorGen.ImplicitMV -> 1.0,
        ErrorGen.Format -> 1.5, ErrorGen.InnerSwap -> 1.0),
    seed)

  private val Styles = Vector(
    "American IPA", "American Pale Ale", "Amber Ale", "Blonde Ale",
    "Porter", "Stout", "Witbier", "Hefeweizen", "Pilsner", "Saison",
    "Brown Ale", "Cream Ale", "Fruit Beer", "Kolsch", "Scotch Ale")

  private val BeerAdjectives = Vector(
    "Hoppy", "Golden", "Dark", "Wild", "Lazy", "Burning", "Frozen",
    "Rolling", "Crooked", "Lucky", "Iron", "Velvet", "Rusty", "Salty")

  private val BeerNouns = Vector(
    "Trail", "Canyon", "Harvest", "Anchor", "Summit", "Meadow", "Raven",
    "Bison", "Lantern", "Compass", "Orchard", "Thistle", "Falcon", "Quarry")

  override def cleanRows(n: Int, seed: Long): Array[Array[String]] = {
    val rnd = new Random(seed)
    val nBreweries = math.max(1, (n / 4.3).toInt)
    val breweries = (0 until nBreweries).map { b =>
      val city  = cityName(b % math.max(1, nBreweries / 2))
      val cIdx  = b % math.max(1, nBreweries / 2)
      (code("", b + 1, 4),
        s"${BeerAdjectives(b % BeerAdjectives.size)} ${BeerNouns((b / BeerAdjectives.size) % BeerNouns.size)} Brewing Co ${b / (BeerAdjectives.size * BeerNouns.size)}".trim,
        city, StateNames(cIdx % StateNames.size),
        (1870 + (b * 13) % 150).toString)
    }
    Array.tabulate(n) { i =>
      val b = i % nBreweries
      val (bid, bname, city, state, est) = breweries(b)
      val beerName = s"${BeerAdjectives((i * 7) % BeerAdjectives.size)} ${BeerNouns((i * 11) % BeerNouns.size)} ${Styles(i % Styles.size)} #${i + 1}"
      val ounces = if (i % 3 == 0) "16.0" else "12.0"
      val abv = f"${0.035 + (i % 60) * 0.001}%.3f"
      val ibu = (10 + (i * 17) % 90).toString
      Array(code("", 100000 + i, 6), beerName, Styles(i % Styles.size),
        ounces, abv, ibu, bid, bname, city, state, est)
    }
  }
}
