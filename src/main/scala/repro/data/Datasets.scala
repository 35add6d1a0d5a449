package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Synthetic stand-ins for the paper's six evaluation datasets (§6.1),
  * scaled by a row scale-factor `sf` (sf = 1.0 reproduces the paper's row
  * counts; tests use ~0.01-0.1 of the smaller tables). Column counts and
  * types match the real datasets; planted patterns give each table the
  * prominent association rules its real counterpart is known for (e.g.
  * cancelled flights having NaN operational columns in FL). See DESIGN.md
  * §3 for the substitution rationale.
  */
object Datasets {

  final case class Meta(name: String, patterns: Seq[Pattern], targets: Seq[String])

  private def rows(paperRows: Long, sf: Double, floor: Long = 2000L): Long =
    math.max(floor, (paperRows * sf).toLong)

  // ---------------------------------------------------------------- FL ----
  /** Flights (paper: 6M × 31, target CANCELLED). */
  def flights(spark: SparkSession, sf: Double = 0.01): (DataFrame, Meta) = {
    val airlines = Seq("AA", "DL", "UA", "WN", "B6", "AS", "NK", "HA")
    val airports = Seq("ATL", "LAX", "ORD", "DFW", "JFK", "SFO", "SEA", "MCO",
      "BOS", "SAN", "DEN", "PHX")
    val cols = Seq[ColSpec](
      NumCol("YEAR", 2015, 2015),
      NumCol("MONTH", 1, 12),
      NumCol("DAY", 1, 31),
      NumCol("DAY_OF_WEEK", 1, 7),
      CatCol("AIRLINE", airlines),
      NumCol("FLIGHT_NUMBER", 1, 7000),
      CatCol("TAIL_NUMBER", (1 to 20).map(i => s"N$i")),
      CatCol("ORIGIN_AIRPORT", airports),
      CatCol("DESTINATION_AIRPORT", airports),
      NumCol("SCHEDULED_DEPARTURE", 0, 24),
      NumCol("DEPARTURE_TIME", 0, 24, nullFrac = 0.02),
      NumCol("DEPARTURE_DELAY", -10, 60, nullFrac = 0.02),
      NumCol("TAXI_OUT", 5, 40),
      NumCol("WHEELS_OFF", 0, 24),
      NumCol("SCHEDULED_TIME", 40, 420),
      NumCol("ELAPSED_TIME", 40, 430, nullFrac = 0.02),
      NumCol("AIR_TIME", 30, 400, nullFrac = 0.02),
      NumCol("DISTANCE", 100, 3000),
      NumCol("WHEELS_ON", 0, 24),
      NumCol("TAXI_IN", 2, 30),
      NumCol("SCHEDULED_ARRIVAL", 0, 24),
      NumCol("ARRIVAL_TIME", 0, 24, nullFrac = 0.02),
      NumCol("ARRIVAL_DELAY", -30, 90, nullFrac = 0.02),
      CatCol("DIVERTED", Seq("0", "1"), weights = Some(Seq(0.97, 0.03))),
      CatCol("CANCELLED", Seq("0", "1"), weights = Some(Seq(0.95, 0.05))),
      CatCol("CANCELLATION_REASON", Seq("A", "B", "C"), nullFrac = 0.97),
      NumCol("AIR_SYSTEM_DELAY", 0, 60),
      NumCol("SECURITY_DELAY", 0, 60),
      NumCol("AIRLINE_DELAY", 0, 60),
      NumCol("LATE_AIRCRAFT_DELAY", 0, 60),
      NumCol("WEATHER_DELAY", 0, 60),
    )
    // As in the real flights data: the delay-breakdown columns are NaN
    // *jointly* for every flight without a recorded delay.
    val overlays = Seq(NullOverlay("delay_detail",
      Seq("AIR_SYSTEM_DELAY", "SECURITY_DELAY", "AIRLINE_DELAY",
        "LATE_AIRCRAFT_DELAY", "WEATHER_DELAY"), nullFrac = 0.7))
    val patterns = Seq(
      Pattern("cancelled", 0.15, Map(
        "CANCELLED" -> CatCell("1"),
        "DEPARTURE_TIME" -> NullCell,
        "DEPARTURE_DELAY" -> NullCell,
        "ELAPSED_TIME" -> NullCell,
        "AIR_TIME" -> NullCell,
        "ARRIVAL_TIME" -> NullCell,
        "ARRIVAL_DELAY" -> NullCell,
        "CANCELLATION_REASON" -> CatCell(Seq("A", "B", "C")),
      )),
      Pattern("longhaul_ok", 0.12, Map(
        "DISTANCE" -> NumCell(2700, 2700),
        "AIR_TIME" -> NumCell(350, 350),
        "SCHEDULED_TIME" -> NumCell(380, 380),
        "CANCELLED" -> CatCell("0"),
        "ARRIVAL_DELAY" -> NumCell(-10, -10),
      )),
      Pattern("afternoon_cancel", 0.08, Map(
        "SCHEDULED_DEPARTURE" -> NumCell(14.5, 14.5),
        "SCHEDULED_ARRIVAL" -> NumCell(16.5, 16.5),
        "CANCELLED" -> CatCell("1"),
        "DEPARTURE_TIME" -> NullCell,
        "AIR_TIME" -> NullCell,
      )),
      Pattern("late_cascade", 0.1, Map(
        "DEPARTURE_DELAY" -> NumCell(50, 50),
        "ARRIVAL_DELAY" -> NumCell(75, 75),
        "LATE_AIRCRAFT_DELAY" -> NumCell(50, 50),
        "CANCELLED" -> CatCell("0"),
      )),
    )
    // Independent correlation layers on disjoint column groups (route
    // structure, time-of-week structure) — real tables carry several such.
    val routeLayer = Seq(
      Pattern("hub_AA", 0.15, Map(
        "AIRLINE" -> CatCell("AA"),
        "ORIGIN_AIRPORT" -> CatCell("ATL"),
        "TAXI_OUT" -> NumCell(33, 33),
      )),
      Pattern("west_UA", 0.12, Map(
        "AIRLINE" -> CatCell("UA"),
        "ORIGIN_AIRPORT" -> CatCell("SFO"),
        "DESTINATION_AIRPORT" -> CatCell("SEA"),
        "TAXI_IN" -> NumCell(5, 5),
      )),
    )
    val timeLayer = Seq(
      Pattern("weekend_morning", 0.15, Map(
        "DAY_OF_WEEK" -> NumCell(6.5, 6.5),
        "WHEELS_OFF" -> NumCell(9, 9),
        "WHEELS_ON" -> NumCell(11.5, 11.5),
      )),
      Pattern("weekday_evening", 0.15, Map(
        "DAY_OF_WEEK" -> NumCell(3, 3),
        "WHEELS_OFF" -> NumCell(18, 18),
        "WHEELS_ON" -> NumCell(20.5, 20.5),
      )),
    )
    val layers = Seq(patterns, routeLayer, timeLayer)
    val df = SynthTable.buildLayered(spark, rows(6000000L, sf), cols, layers,
      tag = "FL", overlays = overlays)
    (df, Meta("FL", layers.flatten, targets = Seq("CANCELLED")))
  }

  // ---------------------------------------------------------------- CY ----
  /** Cyber-security (paper: 30K × 15). */
  def cyber(spark: SparkSession, sf: Double = 1.0): (DataFrame, Meta) = {
    val cols = Seq[ColSpec](
      CatCol("protocol", Seq("TCP", "UDP", "ICMP"), weights = Some(Seq(0.6, 0.3, 0.1))),
      CatCol("src_ip_class", Seq("intA", "intB", "extA", "extB", "extC", "dmz")),
      CatCol("dst_port", Seq("22", "53", "80", "443", "8080", "other")),
      NumCol("src_port_band", 1024, 65535),
      NumCol("packets", 1, 100000),
      NumCol("bytes", 40, 2000000),
      NumCol("duration", 0, 600),
      CatCol("flag", Seq("S", "SA", "F", "R", "P")),
      CatCol("service", Seq("http", "dns", "ssh", "smtp", "ftp", "other")),
      CatCol("country", Seq("US", "CN", "RU", "DE", "BR", "IN", "FR", "GB")),
      NumCol("hour", 0, 24),
      CatCol("severity", Seq("low", "med", "high"), weights = Some(Seq(0.6, 0.3, 0.1))),
      CatCol("alert", Seq("none", "alert"), weights = Some(Seq(0.8, 0.2))),
      CatCol("attack_type", Seq("none", "ddos", "scan", "bruteforce"),
        weights = Some(Seq(0.85, 0.05, 0.05, 0.05))),
      CatCol("tcp_state", Seq("EST", "SYN", "FIN", "RST", "CLO")),
    )
    val patterns = Seq(
      Pattern("ddos", 0.15, Map(
        "protocol" -> CatCell("UDP"),
        "dst_port" -> CatCell("53"),
        "packets" -> NumCell(90000, 90000),
        "attack_type" -> CatCell("ddos"),
        "severity" -> CatCell("high"),
        "alert" -> CatCell("alert"),
      )),
      Pattern("scan", 0.12, Map(
        "flag" -> CatCell("S"),
        "bytes" -> NumCell(80, 80),
        "duration" -> NumCell(0.5, 0.5),
        "attack_type" -> CatCell("scan"),
        "service" -> CatCell("other"),
        "tcp_state" -> CatCell("SYN"),
      )),
      Pattern("bruteforce", 0.08, Map(
        "dst_port" -> CatCell("22"),
        "service" -> CatCell("ssh"),
        "attack_type" -> CatCell("bruteforce"),
        "packets" -> NumCell(1200, 1200),
        "severity" -> CatCell("med"),
      )),
    )
    // Independent geo/time structure on the columns the attack layer
    // leaves free.
    val geoLayer = Seq(
      Pattern("cn_night", 0.15, Map(
        "country" -> CatCell("CN"),
        "src_ip_class" -> CatCell("extA"),
        "hour" -> NumCell(3, 3),
        "src_port_band" -> NumCell(40000, 40000),
      )),
      Pattern("us_day", 0.15, Map(
        "country" -> CatCell("US"),
        "src_ip_class" -> CatCell("intA"),
        "hour" -> NumCell(14, 14),
        "src_port_band" -> NumCell(2000, 2000),
      )),
    )
    val layers = Seq(patterns, geoLayer)
    val df = SynthTable.buildLayered(spark, rows(30000L, sf), cols, layers, tag = "CY")
    (df, Meta("CY", layers.flatten, targets = Seq.empty))
  }

  // ---------------------------------------------------------------- SP ----
  /** Spotify (paper: 42K × 15, task "what makes songs popular"). */
  def spotify(spark: SparkSession, sf: Double = 1.0): (DataFrame, Meta) = {
    val cols = Seq[ColSpec](
      NumCol("danceability", 0, 1),
      NumCol("energy", 0, 1),
      NumCol("key", 0, 11),
      NumCol("loudness", -40, 0),
      CatCol("mode", Seq("major", "minor")),
      NumCol("speechiness", 0, 1),
      NumCol("acousticness", 0, 1),
      NumCol("instrumentalness", 0, 1),
      NumCol("liveness", 0, 1),
      NumCol("valence", 0, 1),
      NumCol("tempo", 60, 200),
      NumCol("duration_ms", 90000, 360000),
      CatCol("genre", Seq("pop", "rock", "hiphop", "jazz", "classical", "electro")),
      CatCol("artist_tier", Seq("A", "B", "C", "D")),
      NumCol("popularity", 0, 100),
    )
    val patterns = Seq(
      Pattern("dance_pop_hit", 0.15, Map(
        "danceability" -> NumCell(0.92, 0.92),
        "energy" -> NumCell(0.9, 0.9),
        "genre" -> CatCell("pop"),
        "popularity" -> NumCell(88, 88),
        "artist_tier" -> CatCell("A"),
      )),
      Pattern("acoustic_niche", 0.12, Map(
        "acousticness" -> NumCell(0.95, 0.95),
        "energy" -> NumCell(0.1, 0.1),
        "genre" -> CatCell("classical"),
        "popularity" -> NumCell(8, 8),
      )),
      Pattern("live_mid", 0.08, Map(
        "liveness" -> NumCell(0.9, 0.9),
        "speechiness" -> NumCell(0.8, 0.8),
        "popularity" -> NumCell(35, 35),
      )),
    )
    val moodLayer = Seq(
      Pattern("minor_slow", 0.15, Map(
        "mode" -> CatCell("minor"),
        "tempo" -> NumCell(75, 75),
        "valence" -> NumCell(0.15, 0.15),
      )),
      Pattern("major_fast", 0.15, Map(
        "mode" -> CatCell("major"),
        "tempo" -> NumCell(170, 170),
        "valence" -> NumCell(0.85, 0.85),
      )),
    )
    val formLayer = Seq(
      Pattern("long_instrumental", 0.15, Map(
        "instrumentalness" -> NumCell(0.9, 0.9),
        "duration_ms" -> NumCell(330000, 330000),
        "loudness" -> NumCell(-30, -30),
      )),
      Pattern("short_loud", 0.15, Map(
        "instrumentalness" -> NumCell(0.05, 0.05),
        "duration_ms" -> NumCell(115000, 115000),
        "loudness" -> NumCell(-4, -4),
      )),
    )
    val layers = Seq(patterns, moodLayer, formLayer)
    val df = SynthTable.buildLayered(spark, rows(42000L, sf), cols, layers, tag = "SP")
    (df, Meta("SP", layers.flatten, targets = Seq("popularity")))
  }

  // ---------------------------------------------------------------- CC ----
  /** Credit-card fraud (paper: 250K × 31, all numeric). */
  def creditcard(spark: SparkSession, sf: Double = 0.1): (DataFrame, Meta) = {
    val vcols = (1 to 28).map(i => NumCol(s"V$i", -5, 5))
    val cols: Seq[ColSpec] =
      NumCol("Time", 0, 172800) +: vcols :+ NumCol("Amount", 0, 500) :+ NumCol("Class", 0, 0)
    val patterns = Seq(
      Pattern("fraud", 0.12, Map(
        "Class" -> NumCell(1, 1),
        "V1" -> NumCell(-4.2, -4.2),
        "V3" -> NumCell(-4.0, -4.0),
        "V14" -> NumCell(-4.4, -4.4),
        "Amount" -> NumCell(420, 420),
      )),
      Pattern("bulk_retail", 0.1, Map(
        "V2" -> NumCell(3, 3),
        "V5" -> NumCell(3.2, 3.2),
        "Amount" -> NumCell(25, 25),
      )),
    )
    val pcaLayerA = Seq(
      Pattern("segmentA", 0.15, Map(
        "V7" -> NumCell(2.5, 2.5), "V8" -> NumCell(2.2, 2.2), "V9" -> NumCell(-2.0, -2.0))),
      Pattern("segmentB", 0.15, Map(
        "V7" -> NumCell(-2.5, -2.5), "V8" -> NumCell(-2.0, -2.0), "V9" -> NumCell(2.2, 2.2))),
    )
    val pcaLayerB = Seq(
      Pattern("segmentC", 0.15, Map(
        "V20" -> NumCell(3.0, 3.0), "V21" -> NumCell(2.4, 2.4), "V22" -> NumCell(-1.8, -1.8))),
      Pattern("segmentD", 0.15, Map(
        "V20" -> NumCell(-3.0, -3.0), "V21" -> NumCell(-2.4, -2.4), "V22" -> NumCell(1.8, 1.8))),
    )
    val layers = Seq(patterns, pcaLayerA, pcaLayerB)
    val df = SynthTable.buildLayered(spark, rows(250000L, sf), cols, layers, tag = "CC")
    (df, Meta("CC", layers.flatten, targets = Seq("Class")))
  }

  // --------------------------------------------------------------- USF ----
  /** US mutual funds (paper: 23.5K × 298, very wide). */
  def usfunds(spark: SparkSession, sf: Double = 1.0): (DataFrame, Meta) = {
    val metricCols = (1 to 294).map(i => NumCol(s"f_$i", 0, 1))
    val cols: Seq[ColSpec] = Seq(
      CatCol("fund_category", Seq("equity", "bond", "mixed", "money", "real_estate",
        "commodity", "alt", "index")),
      CatCol("fund_family", (1 to 10).map(i => s"fam$i")),
      NumCol("total_assets", 1e6, 1e10),
      NumCol("yield", 0, 0.15),
    ) ++ metricCols
    val patterns = Seq(
      Pattern("hot_equity", 0.12, Map(
        "fund_category" -> CatCell("equity"),
        "f_1" -> NumCell(0.9, 0.9),
        "f_2" -> NumCell(0.88, 0.88),
        "yield" -> NumCell(0.11, 0.11),
      )),
      Pattern("safe_bond", 0.1, Map(
        "fund_category" -> CatCell("bond"),
        "f_3" -> NumCell(0.1, 0.1),
        "f_4" -> NumCell(0.12, 0.12),
        "yield" -> NumCell(0.02, 0.02),
      )),
    )
    val metricLayer = Seq(
      Pattern("momentum", 0.15, Map(
        "f_10" -> NumCell(0.85, 0.85), "f_11" -> NumCell(0.8, 0.8),
        "f_12" -> NumCell(0.82, 0.82))),
      Pattern("value", 0.15, Map(
        "f_10" -> NumCell(0.15, 0.15), "f_11" -> NumCell(0.2, 0.2),
        "f_12" -> NumCell(0.18, 0.18))),
    )
    val layers = Seq(patterns, metricLayer)
    val df = SynthTable.buildLayered(spark, rows(23500L, sf), cols, layers, tag = "USF")
    (df, Meta("USF", layers.flatten, targets = Seq.empty))
  }

  // ---------------------------------------------------------------- BL ----
  /** Bank loans (paper: 110K × 19). */
  def bankloans(spark: SparkSession, sf: Double = 0.2): (DataFrame, Meta) = {
    val cols = Seq[ColSpec](
      CatCol("loan_status", Seq("FullyPaid", "ChargedOff"), weights = Some(Seq(0.75, 0.25))),
      NumCol("current_loan_amount", 1000, 800000),
      CatCol("term", Seq("ShortTerm", "LongTerm"), weights = Some(Seq(0.7, 0.3))),
      NumCol("credit_score", 580, 800, nullFrac = 0.05),
      NumCol("annual_income", 20000, 200000, nullFrac = 0.05),
      CatCol("years_in_job", Seq("<1", "1-3", "4-6", "7-9", "10+")),
      CatCol("home_ownership", Seq("Rent", "Mortgage", "Own", "Other")),
      CatCol("purpose", Seq("debt", "home", "car", "business", "medical", "other")),
      NumCol("monthly_debt", 0, 5000),
      NumCol("years_credit_history", 2, 40),
      NumCol("months_since_delinquent", 0, 80, nullFrac = 0.5),
      NumCol("open_accounts", 1, 30),
      NumCol("credit_problems", 0, 3),
      NumCol("credit_balance", 0, 500000),
      NumCol("max_open_credit", 0, 800000),
      NumCol("bankruptcies", 0, 2),
      NumCol("tax_liens", 0, 2),
      CatCol("income_band", Seq("low", "mid", "high")),
      NumCol("dti", 0, 1),
    )
    val patterns = Seq(
      Pattern("default_risk", 0.15, Map(
        "credit_score" -> NumCell(598, 598),
        "loan_status" -> CatCell("ChargedOff"),
        "credit_problems" -> NumCell(2.8, 2.8),
        "income_band" -> CatCell("low"),
        "months_since_delinquent" -> NumCell(6, 6),
      )),
      Pattern("prime", 0.15, Map(
        "credit_score" -> NumCell(785, 785),
        "loan_status" -> CatCell("FullyPaid"),
        "income_band" -> CatCell("high"),
        "dti" -> NumCell(0.08, 0.08),
        "bankruptcies" -> NumCell(0, 0),
      )),
    )
    val loanLayer = Seq(
      Pattern("longterm_big", 0.12, Map(
        "term" -> CatCell("LongTerm"),
        "current_loan_amount" -> NumCell(720000, 720000),
        "purpose" -> CatCell("business"),
      )),
      Pattern("small_car", 0.12, Map(
        "term" -> CatCell("ShortTerm"),
        "current_loan_amount" -> NumCell(9000, 9000),
        "purpose" -> CatCell("car"),
      )),
    )
    val housingLayer = Seq(
      Pattern("renter_debt", 0.15, Map(
        "home_ownership" -> CatCell("Rent"),
        "monthly_debt" -> NumCell(4200, 4200),
        "open_accounts" -> NumCell(25, 25),
      )),
      Pattern("owner_light", 0.15, Map(
        "home_ownership" -> CatCell("Own"),
        "monthly_debt" -> NumCell(400, 400),
        "open_accounts" -> NumCell(3, 3),
      )),
    )
    val layers = Seq(patterns, loanLayer, housingLayer)
    val df = SynthTable.buildLayered(spark, rows(110000L, sf), cols, layers, tag = "BL")
    (df, Meta("BL", layers.flatten, targets = Seq("loan_status")))
  }

  /** All six, keyed by paper name, at a per-dataset default scale chosen so
    * a full bench pass stays laptop-scale.
    */
  def all(spark: SparkSession, sf: Double): Seq[(DataFrame, Meta)] = Seq(
    flights(spark, sf * 0.01), // FL is 6M rows at sf=1; keep it the largest but bounded
    cyber(spark, sf),
    spotify(spark, sf),
    creditcard(spark, sf * 0.1),
    usfunds(spark, sf),
    bankloans(spark, sf * 0.2),
  )
}
