package repro.lake

import scala.util.Random
import Dirt.Renderer

/** Domain specifications: what a column *means* (ground truth), how its
  * canonical values are generated, which column-name synonyms and format
  * renderers real publishers use for it.
  */
final case class DomainSpec(
    key: String,
    /** Column-name synonyms; index 0 is the canonical (clean) name. */
    names: IndexedSeq[String],
    /** Canonical value generator. */
    gen: Random => String,
    /** Format variants; index 0 is identity (clean). */
    renderers: IndexedSeq[Renderer],
    numeric: Boolean = false,
    /** Shared across clusters (city, date, …) — creates the cross-cluster
      * value overlap that pressures value-equality-based discovery.
      */
    generic: Boolean = false,
)

object Domains {
  import Vocab._
  import Dirt._

  // ---- generic (cross-cluster) domains ------------------------------------

  val cityD = DomainSpec("city",
    Vector("City", "Town", "Location", "Area", "Locality"),
    city, Vector(identity, upper, lower), generic = true)

  val postcodeD = DomainSpec("postcode",
    Vector("Postcode", "Post Code", "Postal Code", "PCode"),
    postcode, Vector(identity, stripSpaces, lower), generic = true)

  val addressD = DomainSpec("street_address",
    Vector("Address", "Street", "Street Address", "Addr"),
    streetAddress, Vector(identity, abbrevStreet, upper), generic = true)

  val phoneD = DomainSpec("phone",
    Vector("Phone", "Telephone", "Tel", "Contact Number"),
    phone, Vector(identity, stripSpaces), generic = true)

  val emailD = DomainSpec("email",
    Vector("Email", "E-mail", "Contact Email"),
    email, Vector(identity, upper), generic = true)

  val dateD = DomainSpec("date",
    Vector("Date", "Registered", "Updated", "Record Date"),
    dateIso, Vector(identity, dateSlashDmy, dateDotDmy), generic = true)

  val hoursD = DomainSpec("opening_hours",
    Vector("Opening Hours", "Hours", "Open"),
    openingHours, Vector(identity), generic = true)

  val urlD = DomainSpec("url",
    Vector("Website", "URL", "Web"),
    url, Vector(identity, upper), generic = true)

  val countyD = DomainSpec("county",
    Vector("County", "Region"),
    county, Vector(identity, upper), generic = true)

  val yearD = DomainSpec("year",
    Vector("Year", "Reporting Year"),
    year, Vector(identity), numeric = true, generic = true)

  // ---- cluster-specific subject + property domains ------------------------

  private def num(key: String, names: IndexedSeq[String], mu: Double, sigma: Double,
                  decimals: Int = 0, moneyLike: Boolean = false) =
    DomainSpec(key, names,
      rnd => gaussian(rnd, mu, sigma, lo = 0.0, decimals = decimals),
      if (moneyLike) Vector(identity, money, thousands) else Vector(identity, thousands),
      numeric = true)

  /** One topical cluster: a subject domain + property domains drawn from. */
  final case class ClusterSpec(name: String, subject: DomainSpec, props: IndexedSeq[DomainSpec])

  val gp = ClusterSpec("gp",
    DomainSpec("practice_name",
      Vector("Practice", "Practice Name", "GP Practice", "GP", "Surgery Name"),
      practiceName, Vector(identity, upper, dropLastWord)),
    Vector(addressD, cityD, postcodeD, phoneD, hoursD, dateD,
      num("patients", Vector("Patients", "Registered Patients", "List Size"), 5200, 2100),
      num("gp_payment", Vector("Payment", "Total Payment", "Funding"), 64000, 21000, moneyLike = true)))

  val business = ClusterSpec("business",
    DomainSpec("company_name",
      Vector("Company", "Company Name", "Business", "Business Name", "Organisation"),
      companyName, Vector(identity, upper, dropLastWord)),
    Vector(cityD, postcodeD, emailD, urlD, dateD,
      DomainSpec("sector", Vector("Sector", "Industry", "Category"),
        rnd => sectors(rnd.nextInt(sectors.size)), Vector(identity, upper, lower)),
      num("revenue", Vector("Revenue", "Turnover", "Annual Revenue"), 2400000, 900000, moneyLike = true),
      num("employees", Vector("Employees", "Staff Count", "Headcount"), 120, 60)))

  val school = ClusterSpec("school",
    DomainSpec("school_name",
      Vector("School", "School Name", "Establishment", "Establishment Name"),
      schoolName, Vector(identity, upper, dropLastWord)),
    Vector(addressD, cityD, postcodeD, phoneD, dateD,
      DomainSpec("headteacher", Vector("Headteacher", "Head Teacher", "Principal"),
        personName, Vector(identity, upper)),
      num("pupils", Vector("Pupils", "Number on Roll", "Enrolment"), 640, 260),
      num("ofsted_score", Vector("Rating", "Ofsted Score", "Inspection Score"), 2.4, 0.8, decimals = 1)))

  val transport = ClusterSpec("transport",
    DomainSpec("route_name",
      Vector("Route", "Route Name", "Service", "Bus Route"),
      routeName, Vector(identity, upper)),
    Vector(cityD, hoursD, yearD,
      DomainSpec("operator", Vector("Operator", "Carrier", "Company"),
        rnd => operators(rnd.nextInt(operators.size)), Vector(identity, upper)),
      num("fare", Vector("Fare", "Ticket Price", "Adult Fare"), 3.6, 1.1, decimals = 2, moneyLike = true),
      num("distance_km", Vector("Distance", "Route Length", "Km"), 18, 7, decimals = 1)))

  val crime = ClusterSpec("crime",
    DomainSpec("area_name",
      Vector("Area", "Area Name", "Ward", "Neighbourhood"),
      areaName, Vector(identity, upper)),
    Vector(cityD, countyD, yearD,
      DomainSpec("crime_category", Vector("Category", "Crime Type", "Offence"),
        rnd => crimeCategories(rnd.nextInt(crimeCategories.size)), Vector(identity, upper, lower)),
      num("crimes", Vector("Crimes", "Offence Count", "Incidents"), 340, 150),
      num("detection_rate", Vector("Detection Rate", "Solved Rate"), 0.32, 0.12, decimals = 2)))

  val hospital = ClusterSpec("hospital",
    DomainSpec("hospital_name",
      Vector("Hospital", "Hospital Name", "Trust", "Provider"),
      hospitalName, Vector(identity, upper, dropLastWord)),
    Vector(addressD, cityD, postcodeD, phoneD, urlD,
      num("beds", Vector("Beds", "Bed Count", "Available Beds"), 420, 170),
      num("staff", Vector("Staff", "Workforce", "FTE Staff"), 2600, 1000)))

  val housing = ClusterSpec("housing",
    DomainSpec("development_name",
      Vector("Development", "Development Name", "Scheme", "Site"),
      developmentName, Vector(identity, upper)),
    Vector(addressD, cityD, postcodeD, dateD,
      num("price", Vector("Price", "Asking Price", "Sale Price"), 310000, 110000, moneyLike = true),
      num("bedrooms", Vector("Bedrooms", "Beds", "Rooms"), 3.1, 1.0)))

  val library = ClusterSpec("library",
    DomainSpec("library_name",
      Vector("Library", "Library Name", "Branch", "Branch Name"),
      libraryName, Vector(identity, upper)),
    Vector(addressD, cityD, postcodeD, emailD, hoursD,
      num("books", Vector("Books", "Stock", "Catalogue Size"), 42000, 16000),
      num("visitors", Vector("Visitors", "Annual Visitors", "Footfall"), 61000, 24000)))

  val clusters: IndexedSeq[ClusterSpec] =
    Vector(gp, business, school, transport, crime, hospital, housing, library)
}
