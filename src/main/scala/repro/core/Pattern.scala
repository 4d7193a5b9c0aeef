package repro.core

import java.util.regex.{Pattern => JPattern}

/** The pattern language of §2.1: a pattern is a sequence of tokens drawn from
  * the generalization hierarchy (Fig. 4). Leaves are literals; intermediate
  * nodes are `<digit>`, `<upper>`, `<lower>`, `<letter>`, `<alnum>`, each
  * either fixed-length (`{n}`) or variable-length (`+`).
  *
  * Patterns compile to anchored Java regexes for validation-time matching and
  * serialize to a stable canonical `key` used as the offline-index key. A
  * human-readable `display` form matches the paper's notation.
  */
object Pattern {

  /** Generalized character class of a pattern token. */
  sealed abstract class GClass(val order: Int, val regex: String, val name: String, val alphabetBits: Double)
  object GClass {
    case object Digit  extends GClass(0, "[0-9]", "digit", 3.33)       // log2(10)
    case object Upper  extends GClass(1, "[A-Z]", "upper", 4.70)       // log2(26)
    case object Lower  extends GClass(2, "[a-z]", "lower", 4.70)
    case object Letter extends GClass(3, "[A-Za-z]", "letter", 5.70)   // log2(52)
    case object Alnum  extends GClass(4, "[A-Za-z0-9]", "alnum", 5.95) // log2(62)
    val all: Seq[GClass] = Seq(Digit, Upper, Lower, Letter, Alnum)
    def byName(n: String): GClass = all.find(_.name == n).getOrElse(
      throw new IllegalArgumentException(s"unknown class $n"))
  }

  /** One token of a pattern. */
  sealed trait PTok {
    /** Regex fragment (unanchored). */
    def regex: String
    /** Human-readable form, paper style. */
    def display: String
    /** Specificity score used for tie-breaks and "most specific" profilers:
      * higher = narrower. Const > fixed-length > variable-length; narrower
      * classes beat wider ones.
      */
    def specificity: Int
  }

  /** A literal token (leaf of the hierarchy). */
  final case class ConstT(text: String) extends PTok {
    def regex: String = JPattern.quote(text)
    def display: String = text
    def specificity: Int = 100
  }

  /** `<cls>{n}` — exactly n characters of the class. */
  final case class FixLen(cls: GClass, n: Int) extends PTok {
    def regex: String = s"${cls.regex}{$n}"
    def display: String = s"<${cls.name}>{$n}"
    def specificity: Int = 50 + (GClass.all.size - cls.order)
  }

  /** `<cls>+` — one or more characters of the class. */
  final case class VarLen(cls: GClass) extends PTok {
    def regex: String = s"${cls.regex}+"
    def display: String = s"<${cls.name}>+"
    def specificity: Int = 10 + (GClass.all.size - cls.order)
  }

  /** A pattern: a non-empty token sequence. */
  final case class Pat(toks: Vector[PTok]) {
    /** Canonical index key (parseable, stable across JVMs). */
    lazy val key: String = toks.map(serializeTok).mkString(SEP.toString)
    /** Paper-style rendering. */
    def display: String = toks.map(_.display).mkString
    def specificity: Int = toks.map(_.specificity).sum
    def tokenLength: Int = toks.length
    @transient lazy val compiled: JPattern =
      JPattern.compile("^" + toks.map(_.regex).mkString + "$")
    /** Anchored match of a whole value. */
    def matches(v: String): Boolean = v != null && compiled.matcher(v).matches()
    override def toString: String = display
  }

  private val SEP = '\u0001'
  private val FLD = '\u0002'

  private def serializeTok(t: PTok): String = t match {
    case ConstT(s)     => s"C$FLD$s"
    case FixLen(c, n)  => s"F$FLD${c.name}$FLD$n"
    case VarLen(c)     => s"V$FLD${c.name}"
  }

  private def parseTok(s: String): PTok = {
    val parts = s.split(FLD.toString, -1)
    parts(0) match {
      case "C" => ConstT(parts.drop(1).mkString(FLD.toString)) // text may be empty
      case "F" => FixLen(GClass.byName(parts(1)), parts(2).toInt)
      case "V" => VarLen(GClass.byName(parts(1)))
      case x   => throw new IllegalArgumentException(s"bad token tag $x in '$s'")
    }
  }

  /** Parse a canonical `key` back into a pattern. */
  def parse(key: String): Pat =
    Pat(key.split(SEP.toString, -1).toVector.map(parseTok))

  /** Token count of a serialized key without parsing (index analytics). */
  def tokenLengthOfKey(key: String): Int = key.count(_ == SEP) + 1

  /** Concatenate segment patterns (vertical-cut composition). */
  def concat(ps: Seq[Pat]): Pat = Pat(ps.flatMap(_.toks).toVector)
}
