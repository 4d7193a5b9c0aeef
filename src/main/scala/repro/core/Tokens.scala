package repro.core

/** Coarse lexer of §2.1/§3: a value is scanned left-to-right, growing a token
  * until a character of a different class is encountered.
  *
  * Classes are Digit runs, Letter runs and Symbol runs. Following Potter's
  * Wheel style lexing, a symbol run only groups *identical* consecutive
  * symbol characters ("--" is one token, "-." is two), because delimiters in
  * machine-generated formats are literal.
  *
  * A second, *merged* granularity collapses maximal alphanumeric stretches
  * (adjacent digit/letter runs) into a single Alnum token — this is how
  * hex-like ids ("0a1b2c…") stay under the token budget τ and generalize to
  * `<alnum>` as in the paper's hierarchy (Fig. 4).
  */
object Tokens {

  /** Character class of a token (the coarse level of the hierarchy). */
  sealed trait Cls
  object Cls {
    /** A maximal run of ASCII digits. */
    case object Digit extends Cls
    /** A maximal run of letters (any case). */
    case object Letter extends Cls
    /** A run of one repeated non-alphanumeric character (incl. space). */
    case object Symbol extends Cls
    /** A merged run of digits and letters (merged granularity only). */
    case object Alnum extends Cls
  }

  /** One lexed token: its class and the exact matched text. */
  final case class Tok(cls: Cls, text: String) {
    def len: Int = text.length
    def isUpper: Boolean = cls == Cls.Letter && text.forall(_.isUpper)
    def isLower: Boolean = cls == Cls.Letter && text.forall(_.isLower)
  }

  private def clsOf(c: Char): Cls =
    if (c >= '0' && c <= '9') Cls.Digit
    else if (c.isLetter) Cls.Letter
    else Cls.Symbol

  /** Fine-grained tokenization into digit / letter / symbol runs. */
  def tokenize(s: String): Vector[Tok] = {
    if (s == null || s.isEmpty) return Vector.empty
    val out = Vector.newBuilder[Tok]
    var i = 0
    val n = s.length
    while (i < n) {
      val c = s.charAt(i)
      val cl = clsOf(c)
      var j = i + 1
      cl match {
        case Cls.Symbol =>
          // grow only over the identical symbol character
          while (j < n && s.charAt(j) == c) j += 1
        case _ =>
          while (j < n && clsOf(s.charAt(j)) == cl) j += 1
      }
      out += Tok(cl, s.substring(i, j))
      i = j
    }
    out.result()
  }

  /** Merged tokenization: adjacent Digit/Letter runs become one Alnum token.
    * Runs that do not touch another alphanumeric run keep their fine class,
    * so for values without mixed runs this equals [[tokenize]].
    */
  def tokenizeMerged(s: String): Vector[Tok] = {
    val fine = tokenize(s)
    if (fine.isEmpty) return fine
    val out = Vector.newBuilder[Tok]
    var i = 0
    while (i < fine.length) {
      val t = fine(i)
      if (t.cls == Cls.Symbol) { out += t; i += 1 }
      else {
        var j = i + 1
        val sb = new StringBuilder(t.text)
        while (j < fine.length && fine(j).cls != Cls.Symbol) {
          sb.append(fine(j).text); j += 1
        }
        if (j - i > 1) out += Tok(Cls.Alnum, sb.toString) else out += t
        i = j
      }
    }
    out.result()
  }

  /** Number of tokens t(v) (paper §2.4) — fine granularity. */
  def tokenCount(s: String): Int = tokenize(s).length

  /** Coarse signature used for horizontal grouping and MSA: the sequence of
    * classes, with symbol tokens kept literal (delimiters identify formats).
    */
  def signature(s: String): Vector[String] =
    tokenize(s).map {
      case Tok(Cls.Digit, _)  => "D"
      case Tok(Cls.Letter, _) => "L"
      case Tok(Cls.Alnum, _)  => "A"
      case Tok(Cls.Symbol, t) => s"'$t'"
    }

  /** Signature as one string key (for grouping). */
  def signatureKey(s: String): String = signature(s).mkString("|")

  /** Coarse signature at the merged granularity (hex-like ids collapse to a
    * single "A"), used for horizontal grouping of values.
    */
  def signatureMergedKey(s: String): String =
    tokenizeMerged(s).map {
      case Tok(Cls.Digit, _)  => "D"
      case Tok(Cls.Letter, _) => "L"
      case Tok(Cls.Alnum, _)  => "A"
      case Tok(Cls.Symbol, t) => s"'$t'"
    }.mkString("|")

  /** Effective token count: the smaller of the fine and merged counts — what
    * decides whether a value can be enumerated under a τ budget.
    */
  def effectiveTokenCount(s: String): Int = {
    val fine = tokenize(s).length
    val merged = tokenizeMerged(s).length
    math.min(fine, merged)
  }
}
