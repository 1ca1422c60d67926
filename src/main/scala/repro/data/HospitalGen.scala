package repro.data

import scala.util.Random
import repro.core._

/** Synthetic stand-in for the Hospital dataset (Table 5: 1000 tuples,
  * 20 attrs, 3% errors, types T + VAD).
  *
  * Structural profile mirrored from the real dataset: high redundancy
  * (each provider appears ~10x, each measure ~100x), many rules — the
  * paper notes Hospital "features the highest number of rules" and
  * "abundant redundancy ... proves easier to repair".
  */
object HospitalGen extends DataGen {
  override val name = "Hospital"
  override val defaultRows = 1000

  override val attrs: Seq[String] = Seq(
    "provider_number", "hospital_name", "address1", "address2", "address3",
    "city", "state", "zip_code", "county_name", "phone_number",
    "hospital_type", "hospital_owner", "emergency_service", "condition",
    "measure_code", "measure_name", "score", "sample", "stateavg",
    "measure_date")

  override val numericAttrs: Set[String] = Set.empty

  override val rules: Seq[Rule] = Seq(
    FD(Seq("provider_number"), "hospital_name"),
    FD(Seq("provider_number"), "phone_number"),
    FD(Seq("provider_number"), "zip_code"),
    FD(Seq("zip_code"), "city"),
    FD(Seq("city"), "county_name"),
    FD(Seq("measure_code"), "measure_name"),
    FD(Seq("measure_code"), "condition"),
    FD(Seq("measure_code"), "measure_date"),
    FD(Seq("state", "measure_code"), "stateavg"),
    // city -> state expressed as a DC (Example 2.3's dc_1) to exercise the
    // denial-constraint path of rule-driven algorithms.
    DC("city_state", Seq(
      Pred("city", "=", PredOperand.Attr("city")),
      Pred("state", "!=", PredOperand.Attr("state")))),
  )

  override val nominalErrorRate = 0.03
  override val errorTypes: Seq[String] = Seq("T", "VAD")
  override val classTarget = "condition"

  override def defaultSpec(seed: Long): ErrorGen.ErrorSpec = ErrorGen.ErrorSpec(
    nominalErrorRate,
    Seq(ErrorGen.Typo -> 1.0, ErrorGen.InnerSwap -> 1.0),
    seed)

  private val Conditions = Vector(
    "Heart Attack", "Heart Failure", "Pneumonia", "Surgical Infection",
    "Stroke", "Diabetes", "Asthma", "Hip Replacement", "Kidney Failure",
    "Emergency Care")

  private val HospitalTypes = Vector(
    "Acute Care Hospitals", "Critical Access Hospitals", "Childrens Hospitals")

  private val Owners = Vector(
    "Government - State", "Government - Local", "Voluntary non-profit",
    "Proprietary")

  override def cleanRows(n: Int, seed: Long): Array[Array[String]] = {
    val rnd = new Random(seed)
    val nHospitals = math.max(1, n / 10)
    val nMeasures  = 10
    val nCities    = math.max(1, nHospitals / 3)

    val cities = (0 until nCities).map { c =>
      (cityName(c), StateNames(c % StateNames.size), s"${cityName(c)} County")
    }
    val hospitals = (0 until nHospitals).map { h =>
      val (city, state, county) = cities(h % nCities)
      val zip = code("", (h % nCities) * 7 + 10000, 5)
      (code("", 10000 + h, 6),
        s"${LastNames(h % LastNames.size)} ${if (h % 3 == 0) "Memorial" else if (h % 3 == 1) "Regional" else "General"} Hospital ${h / LastNames.size}",
        s"${100 + h % 899} ${CityStems(h % CityStems.size)} Street",
        city, state, zip, county,
        s"${200 + h % 799}${code("", 1000000 + (h * 7919) % 8999999, 7)}",
        HospitalTypes(h % HospitalTypes.size),
        Owners(h % Owners.size),
        if (h % 4 == 0) "No" else "Yes")
    }
    val measures = (0 until nMeasures).map { m =>
      (code("AMI-", m + 1, 2),
        s"${Conditions(m % Conditions.size)} patients given recommended treatment ${m + 1}",
        Conditions(m % Conditions.size),
        f"2023-${m % 12 + 1}%02d-01")
    }
    val stateAvg = scala.collection.mutable.Map.empty[(String, String), String]

    Array.tabulate(n) { i =>
      val h = i % nHospitals
      val m = (i / nHospitals) % nMeasures
      val (pn, hname, addr, city, state, zip, county, phone, htype, owner, emerg) = hospitals(h)
      val (mcode, mname, cond, mdate) = measures(m)
      val score  = s"${60 + (h * 7 + m * 13) % 40}%"
      val sample = s"${10 + (h * 11 + m * 29) % 490} patients"
      val savg = stateAvg.getOrElseUpdate((state, mcode),
        s"${50 + rnd.nextInt(50)}%")
      Array(pn, hname, addr, "xx", "xx", city, state, zip, county, phone,
        htype, owner, emerg, cond, mcode, mname, score, sample, savg, mdate)
    }
  }
}
