package repro.lake

import scala.util.Random

/** Synthetic machine-generated and natural-language data domains.
  *
  * Substitutes the proprietary enterprise lake (DESIGN.md §3.1): each domain
  * mimics a real machine-generated format observed in the paper (Fig. 3) —
  * timestamps in several formats, GUIDs, knowledge-base entity ids, locale
  * codes, hex ids, composite pipe-delimited columns, … — with the properties
  * the method depends on:
  *
  *  - *within-domain variation* (unpadded day/month, 1–2-digit hours) so
  *    too-narrow patterns are impure in corpus columns;
  *  - *temporal ordering* for date/time domains (a column covers a narrow
  *    window, so a 10% training prefix often sees a single month — the
  *    paper's "Mar 2019" pitfall for profilers);
  *  - deterministic generation from a seed.
  */
object Domains {

  /** One data domain.
    *
    * @param name        domain id (ground-truth label; never seen by inference)
    * @param isNL        natural-language content (pattern methods should
    *                    produce no rule; the paper excludes such cases)
    * @param popularity  relative weight: expected number of corpus columns
    * @param groundTruth ideal validation pattern (display form), for Table 2
    * @param make        (rng, n) => n values, in arrival order
    */
  final case class Domain(
      name: String,
      isNL: Boolean,
      popularity: Int,
      groundTruth: String,
      make: (Random, Int) => Vector[String])

  // ---------- helpers ----------
  private def ri(r: Random, lo: Int, hi: Int): Int = lo + r.nextInt(hi - lo + 1)
  private def pad(n: Int, w: Int): String = s"%0${w}d".format(n)
  private val HexChars = "0123456789abcdef"
  private def hex(r: Random, n: Int): String =
    (1 to n).map(_ => HexChars(r.nextInt(16))).mkString
  private def pick[A](r: Random, xs: Seq[A]): A = xs(r.nextInt(xs.length))
  private def fill(f: Random => String): (Random, Int) => Vector[String] =
    (r, n) => Vector.fill(n)(f(r))

  private val Months = Vector("Jan", "Feb", "Mar", "Apr", "May", "Jun",
    "Jul", "Aug", "Sep", "Oct", "Nov", "Dec")
  private val DaysInMonth = Vector(31, 28, 31, 30, 31, 30, 31, 31, 30, 31, 30, 31)

  /** A simple (month, day, year) walker: starts at a random date, advances
    * 0–2 days per row — so a column spans a narrow window, like a real feed.
    * Occasional month/year jumps (think backfills and long-lived feeds) make
    * sure most *corpus* columns cross month and year boundaries, so constant
    * month/year patterns are measurably impure; a short *training prefix*
    * still often sits inside one month — the paper's profiling pitfall.
    */
  private final class DateWalker(r: Random) {
    var y: Int = ri(r, 2015, 2023)
    var m: Int = ri(r, 1, 12)
    var d: Int = ri(r, 1, 28)
    def advance(): Unit = {
      d += r.nextInt(3)
      if (r.nextDouble() < 0.04) d += 28       // month-scale jump
      if (r.nextDouble() < 0.02) { y += 1 }    // year rollover / backfill
      if (d > DaysInMonth(m - 1)) { d -= DaysInMonth(m - 1); m += 1 }
      if (m > 12) { m = 1; y += 1 }
      if (y > 2026) y = 2015
    }
  }

  private def timeOfDay(r: Random, h24: Boolean): (Int, Int, Int) = {
    val h = if (h24) ri(r, 0, 23) else ri(r, 1, 12)
    (h, ri(r, 0, 59), ri(r, 0, 59))
  }

  private def dateSlash(w: DateWalker): String = s"${w.m}/${w.d}/${w.y}"
  private def dateIso(w: DateWalker): String = s"${w.y}-${pad(w.m, 2)}-${pad(w.d, 2)}"

  private def walkDates(fmt: (DateWalker, Random) => String): (Random, Int) => Vector[String] =
    (r, n) => {
      val w = new DateWalker(r)
      Vector.fill(n) { w.advance(); fmt(w, r) }
    }

  private val StatusWords = Vector("Booked", "Completed", "Cancelled", "Pending",
    "Refunded", "Shipped", "Returned")
  private val AdsLeft = Vector("DELIVERED", "CLICKED", "FILTERED", "BILLED", "QUEUED")
  private val AdsRight = Vector("OK", "ERR", "LOW", "CAP")
  private val LangCodes = Vector("en", "fr", "de", "es", "zh", "ja", "pt", "it", "ru", "ko")
  private val CountryCodes = Vector("US", "GB", "DE", "FR", "CN", "JP", "BR", "IT", "RU", "KR",
    "CA", "AU", "IN", "MX", "NL")
  private val WordsLower = Vector("alpha", "bravo", "delta", "echo", "fox", "golf", "hotel",
    "india", "kilo", "lima", "metro", "nova", "oscar", "prime", "query", "radar",
    "sigma", "tango", "ultra", "vector", "watt", "xray", "yield", "zeta")
  private val FirstNames = Vector("John", "Mary", "Wei", "Priya", "Carlos", "Anna", "Yuki",
    "Omar", "Lena", "Ivan", "Sara", "Tom", "Nina", "Raj", "Emma", "Luis")
  private val LastNames = Vector("Smith", "Garcia", "Chen", "Patel", "Muller", "Rossi",
    "Tanaka", "Hassan", "Novak", "Silva", "Kim", "Brown", "Olsen", "Dubois")
  private val CompanySuffix = Vector("Inc.", "Ltd", "LLC", "Corp", "GmbH")
  private val StreetKinds = Vector("St", "Ave", "Blvd", "Rd", "Ln")

  // ---------- machine-generated domains ----------
  val dateSlashD = Domain("date_slash", isNL = false, 80,
    "<digit>+/<digit>+/<digit>{4}", walkDates((w, _) => dateSlash(w)))

  val dateIsoD = Domain("date_iso", isNL = false, 70,
    "<digit>{4}-<digit>{2}-<digit>{2}", walkDates((w, _) => dateIso(w)))

  val timeHmsD = Domain("time_hms", isNL = false, 50,
    "<digit>+:<digit>{2}:<digit>{2}", fill { r =>
      val (h, m, s) = timeOfDay(r, h24 = false); s"$h:${pad(m, 2)}:${pad(s, 2)}"
    })

  val timeAmPmD = Domain("time_ampm", isNL = false, 40,
    "<digit>+:<digit>{2}:<digit>{2} <upper>{2}", fill { r =>
      val (h, m, s) = timeOfDay(r, h24 = false)
      s"$h:${pad(m, 2)}:${pad(s, 2)} ${pick(r, Vector("AM", "PM"))}"
    })

  val dateTimeAmPmD = Domain("datetime_ampm", isNL = false, 45,
    "<digit>+/<digit>+/<digit>{4} <digit>+:<digit>{2}:<digit>{2} <upper>{2}",
    walkDates { (w, r) =>
      val (h, m, s) = timeOfDay(r, h24 = false)
      s"${dateSlash(w)} $h:${pad(m, 2)}:${pad(s, 2)} ${pick(r, Vector("AM", "PM"))}"
    })

  val dateTimeIsoD = Domain("datetime_iso", isNL = false, 40,
    "<digit>{4}-<digit>{2}-<digit>{2} <digit>{2}:<digit>{2}:<digit>{2}",
    walkDates { (w, r) =>
      val (h, m, s) = timeOfDay(r, h24 = true)
      s"${dateIso(w)} ${pad(h, 2)}:${pad(m, 2)}:${pad(s, 2)}"
    })

  val isoZD = Domain("iso_z", isNL = false, 10,
    "<digit>{4}-<digit>{2}-<digit>{2}T<digit>{2}:<digit>{2}:<digit>{2}Z",
    walkDates { (w, r) =>
      val (h, m, s) = timeOfDay(r, h24 = true)
      s"${dateIso(w)}T${pad(h, 2)}:${pad(m, 2)}:${pad(s, 2)}Z"
    })

  val dateMonD = Domain("date_mon", isNL = false, 30,
    "<letter>{3} <digit>{2} <digit>{4}",
    walkDates((w, _) => s"${Months(w.m - 1)} ${pad(w.d, 2)} ${w.y}"))

  val guidD = Domain("guid", isNL = false, 60,
    "<alnum>{8}-<alnum>{4}-<alnum>{4}-<alnum>{4}-<alnum>{12}", fill { r =>
      s"${hex(r, 8)}-${hex(r, 4)}-${hex(r, 4)}-${hex(r, 4)}-${hex(r, 12)}"
    })

  val guidBracedD = Domain("guid_braced", isNL = false, 15,
    "{<alnum>{8}-<alnum>{4}-<alnum>{4}-<alnum>{4}-<alnum>{12}}", fill { r =>
      s"{${hex(r, 8)}-${hex(r, 4)}-${hex(r, 4)}-${hex(r, 4)}-${hex(r, 12)}}".toUpperCase
    })

  val ipD = Domain("ip_v4", isNL = false, 40,
    "<digit>+.<digit>+.<digit>+.<digit>+", fill { r =>
      s"${ri(r, 1, 255)}.${ri(r, 0, 255)}.${ri(r, 0, 255)}.${ri(r, 0, 255)}"
    })

  val kbEidD = Domain("kb_eid", isNL = false, 35,
    "/m/<alnum>+", fill { r => s"/m/0${hex(r, ri(r, 5, 6))}" })

  val hex16D = Domain("hex16", isNL = false, 30, "<alnum>{16}", fill(r => hex(r, 16)))
  val hex32D = Domain("hex32", isNL = false, 15, "<alnum>{32}", fill(r => hex(r, 32)))
  val hex8D  = Domain("hex8",  isNL = false, 25, "<alnum>{8}",  fill(r => hex(r, 8)))

  // log-uniform-ish lengths so fixed-length digit patterns are clearly
  // impure in ordinary int columns
  val intSmallD = Domain("int_small", isNL = false, 70,
    "<digit>+", fill { r =>
      ri(r, 1, 3) match {
        case 1 => ri(r, 0, 9).toString
        case 2 => ri(r, 10, 99).toString
        case _ => ri(r, 100, 999).toString
      }
    })

  val intLargeD = Domain("int_large", isNL = false, 50,
    "<digit>+", fill { r => (1000000L + math.abs(r.nextLong()) % 9999000000L).toString })

  val float2D = Domain("float2", isNL = false, 50,
    "<digit>+.<digit>{2}", fill { r => f"${r.nextDouble() * 10000}%.2f" })

  // always signed: an optional sign would be a union domain, which the
  // paper's profiler does not support (its stated failure mode) and which
  // would also poison unsigned float patterns in corpus statistics
  val floatSignedD = Domain("float_signed", isNL = false, 20,
    "-<digit>+.<digit>+", fill { r =>
      val dec = ri(r, 1, 4)
      s"-${ri(r, 0, 999)}.${(1 to dec).map(_ => r.nextInt(10)).mkString}"
    })

  val percentD = Domain("percent", isNL = false, 15,
    "<digit>+.<digit>{1}%", fill { r => f"${r.nextDouble() * 100}%.1f%%" })

  val localeD = Domain("locale", isNL = false, 40,
    "<lower>{2}-<upper>{2}", fill { r =>
      s"${pick(r, LangCodes)}-${pick(r, CountryCodes)}"
    })

  val lang2D = Domain("lang2", isNL = false, 25, "<lower>{2}", fill(r => pick(r, LangCodes)))
  val country2D = Domain("country2", isNL = false, 30, "<upper>{2}", fill(r => pick(r, CountryCodes)))
  val month3D = Domain("month3", isNL = false, 20, "<letter>{3}", fill(r => pick(r, Months)))

  val statusD = Domain("status_enum", isNL = false, 40,
    "<letter>+", fill(r => pick(r, StatusWords)))

  val adsStatusD = Domain("ads_status", isNL = false, 20,
    "<upper>+_<upper>+", fill { r => s"${pick(r, AdsLeft)}_${pick(r, AdsRight)}" })

  val flagYnD = Domain("flag_yn", isNL = false, 30, "<upper>{1}", fill(r => pick(r, Vector("Y", "N"))))
  val flagTfD = Domain("flag_tf", isNL = false, 15, "<upper>{1}", fill(r => pick(r, Vector("T", "F"))))
  val boolWordD = Domain("bool_word", isNL = false, 30, "<lower>+", fill(r => pick(r, Vector("true", "false"))))

  val version3D = Domain("version3", isNL = false, 25,
    "<digit>+.<digit>+.<digit>+", fill { r => s"${ri(r, 0, 20)}.${ri(r, 0, 30)}.${ri(r, 0, 99)}" })

  val buildTagD = Domain("build_tag", isNL = false, 12,
    "v<digit>+.<digit>+.<digit>+.<digit>+", fill { r =>
      s"v${ri(r, 1, 9)}.${ri(r, 0, 20)}.${ri(r, 0, 99)}.${ri(r, 0, 9999)}"
    })

  val orderIdD = Domain("order_id", isNL = false, 25,
    "ORD-<digit>{8}", fill { r => s"ORD-${pad(ri(r, 0, 99999999), 8)}" })

  val custCodeD = Domain("cust_code", isNL = false, 25,
    "<upper>{2}<digit>{6}", fill { r =>
      s"${('A' + r.nextInt(26)).toChar}${('A' + r.nextInt(26)).toChar}${pad(ri(r, 0, 999999), 6)}"
    })

  val zip5D = Domain("zip5", isNL = false, 30, "<digit>{5}", fill(r => pad(ri(r, 501, 99950), 5)))

  val phoneUsD = Domain("phone_us", isNL = false, 20,
    "(<digit>{3}) <digit>{3}-<digit>{4}", fill { r =>
      s"(${ri(r, 200, 989)}) ${ri(r, 200, 999)}-${pad(ri(r, 0, 9999), 4)}"
    })

  val macD = Domain("mac", isNL = false, 12,
    "<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}",
    fill { r => (1 to 6).map(_ => hex(r, 2)).mkString(":") })

  val emailD = Domain("email", isNL = false, 18,
    "<lower>+@<lower>+.<lower>{3}", fill { r =>
      s"${pick(r, WordsLower)}${if (r.nextBoolean()) ri(r, 1, 99).toString else ""}@${pick(r, Vector("contoso", "fabrikam", "example"))}.com"
    })

  // Deliberately flexible formats (the paper reports its profiler cannot
  // handle flexibly-formatted URLs — these supply realistic failure cases).
  val urlD = Domain("url", isNL = false, 15,
    "(flexible)", fill { r =>
      val depth = ri(r, 0, 3)
      val path = (1 to depth).map(_ => pick(r, WordsLower)).mkString("/", "/", "")
      val q = if (r.nextInt(4) == 0) s"?id=${ri(r, 1, 9999)}" else ""
      s"https://www.${pick(r, WordsLower)}.com${if (depth > 0) path else ""}$q"
    })

  val pathUnixD = Domain("path_unix", isNL = false, 15,
    "(flexible)", fill { r =>
      (1 to ri(r, 2, 4)).map(_ => pick(r, WordsLower)).mkString("/", "/", "") +
        (if (r.nextBoolean()) s".${pick(r, Vector("log", "txt", "dat"))}" else "")
    })

  val fileCsvD = Domain("file_csv", isNL = false, 10,
    "<lower>+_<digit>+.csv", fill { r => s"${pick(r, WordsLower)}_${ri(r, 1, 999)}.csv" })

  /** Fig. 8-style composite column: float | datetime | datetime | status.
    * The paper observes such concatenated columns are common in
    * machine-generated data; popularity reflects that so vertical cuts have
    * a visible benchmark population.
    */
  val compositePipeD = Domain("composite_pipe", isNL = false, 25,
    "<digit>+.<digit>+|<datetime>|<datetime>|<letter>+",
    (r, n) => {
      val w = new DateWalker(r)
      Vector.fill(n) {
        w.advance()
        val (h, m, s) = timeOfDay(r, h24 = true)
        val dt1 = s"${dateSlash(w)} ${pad(h, 2)}:${pad(m, 2)}:${pad(s, 2)}"
        val dt2 = s"${dateSlash(w)} ${pad((h + 1) % 24, 2)}:${pad(m, 2)}:${pad(s, 2)}"
        s"${r.nextInt(10)}.${r.nextInt(10)}|$dt1|$dt2|${pick(r, StatusWords)}"
      }
    })

  val compositeIdD = Domain("composite_id", isNL = false, 10,
    "<alnum>{8}_<digit>+", fill { r => s"${hex(r, 8)}_${ri(r, 1, 99999)}" })

  val kvPairD = Domain("kv_pair", isNL = false, 8,
    "id=<digit>+;ts=<digit>+", fill { r => s"id=${ri(r, 1, 99999)};ts=${1500000000 + ri(r, 0, 99999999)}" })

  // ---------- natural-language domains (no valid syntactic pattern) ----------
  val nlNameD = Domain("nl:name", isNL = true, 40, "", fill { r =>
    val mid = if (r.nextInt(4) == 0) s" ${('A' + r.nextInt(26)).toChar}." else ""
    s"${pick(r, FirstNames)}$mid ${pick(r, LastNames)}"
  })

  val nlCompanyD = Domain("nl:company", isNL = true, 30, "", fill { r =>
    val words = (1 to ri(r, 1, 3)).map(_ => pick(r, WordsLower).capitalize).mkString(" ")
    s"$words ${pick(r, CompanySuffix)}"
  })

  val nlCityD = Domain("nl:city", isNL = true, 12, "", fill { r =>
    val base = pick(r, WordsLower).capitalize
    if (r.nextInt(3) == 0) s"$base ${pick(r, Vector("Falls", "Heights", "Springs", "Park"))}" else base
  })

  val nlDeptD = Domain("nl:dept", isNL = true, 20, "", fill { r =>
    pick(r, Vector("Human Resources", "Sales Ops", "R&D", "Customer Support",
      "Corporate Finance", "Legal Affairs", "Data & Analytics", "IT Operations"))
  })

  val nlProductD = Domain("nl:product", isNL = true, 20, "", fill { r =>
    s"${pick(r, WordsLower).capitalize} ${pick(r, Vector("Max", "Mini", "Pro", "Lite"))} ${ri(r, 1, 20)}" +
      (if (r.nextInt(3) == 0) s" (${pick(r, Vector("refurbished", "new", "used"))})" else "")
  })

  val nlSentenceD = Domain("nl:sentence", isNL = true, 25, "", fill { r =>
    (1 to ri(r, 3, 8)).map(_ => pick(r, WordsLower)).mkString(" ") +
      (if (r.nextInt(3) == 0) "." else "")
  })

  val nlAddressD = Domain("nl:address", isNL = true, 20, "", fill { r =>
    s"${ri(r, 1, 9999)} ${pick(r, WordsLower).capitalize} ${pick(r, StreetKinds)}" +
      (if (r.nextInt(3) == 0) s", Apt ${ri(r, 1, 99)}" else "")
  })

  /** All domains, machine-generated first. */
  val all: Vector[Domain] = Vector(
    dateSlashD, dateIsoD, timeHmsD, timeAmPmD, dateTimeAmPmD, dateTimeIsoD, isoZD,
    dateMonD, guidD, guidBracedD, ipD, kbEidD, hex16D, hex32D, hex8D,
    intSmallD, intLargeD, float2D, floatSignedD, percentD,
    localeD, lang2D, country2D, month3D, statusD, adsStatusD,
    flagYnD, flagTfD, boolWordD, version3D, buildTagD, orderIdD, custCodeD,
    zip5D, phoneUsD, macD, emailD, urlD, pathUnixD, fileCsvD,
    compositePipeD, compositeIdD, kvPairD,
    nlNameD, nlCompanyD, nlCityD, nlDeptD, nlProductD, nlSentenceD, nlAddressD)

  val machineGenerated: Vector[Domain] = all.filterNot(_.isNL)
  val naturalLanguage: Vector[Domain] = all.filter(_.isNL)

  def byName(n: String): Domain = all.find(_.name == n).getOrElse(
    throw new IllegalArgumentException(s"unknown domain $n"))

  /** Ad-hoc special values that creep into dirty columns (Fig. 9). */
  val SpecialValues: Vector[String] = Vector("-", "N/A", "NULL", "none", "?", "")

  /** Weighted draw of the (single) special marker a dirty column uses — one
    * emitting program, one null convention. Symbol-ish markers dominate.
    */
  def pickSpecialMarker(r: Random): String = {
    val x = r.nextDouble()
    if (x < 0.40) "-"
    else if (x < 0.70) "N/A"
    else if (x < 0.85) ""
    else if (x < 0.93) "?"
    else if (x < 0.97) "NULL"
    else "none"
  }
}
