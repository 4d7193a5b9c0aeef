package repro.core

import repro.core.Pattern._
import repro.core.Tokens.{Cls, Tok}

/** The generalization hierarchy of Fig. 4, expressed as: for each lexed token,
  * the set of pattern tokens it can generalize into.
  *
  *  - digit run "2019"  → `2019`, `<digit>{4}`, `<digit>+`
  *  - letter run "Mar"  → `Mar`, `<letter>{3}`, `<letter>+`
  *    (plus `<upper>…`/`<lower>…` when the run is single-cased)
  *  - symbol run "/"    → literal only (delimiters in machine-generated
  *    formats are constants, as in every pattern shown in the paper)
  *  - merged alnum run  → `<alnum>{n}`, `<alnum>+`
  *
  * The trivial root `<all>`/".*" is excluded (paper: H(C) excludes ".*").
  */
object Hierarchy {

  /** Generalization options for one fine/merged token, most specific first.
    * Digit and letter runs also generalize to `<alnum>` (Fig. 4: alphanum sits
    * above both), so a hex-ish column mixing "1234" with "a3f0" still has a
    * non-empty hypothesis space.
    */
  def options(t: Tok): Vector[PTok] = t.cls match {
    case Cls.Digit =>
      Vector(ConstT(t.text), FixLen(GClass.Digit, t.len), VarLen(GClass.Digit),
        FixLen(GClass.Alnum, t.len), VarLen(GClass.Alnum))
    case Cls.Letter =>
      val base = Vector(ConstT(t.text))
      val cased =
        if (t.isUpper) Vector(FixLen(GClass.Upper, t.len), VarLen(GClass.Upper))
        else if (t.isLower) Vector(FixLen(GClass.Lower, t.len), VarLen(GClass.Lower))
        else Vector.empty
      base ++ cased ++ Vector(FixLen(GClass.Letter, t.len), VarLen(GClass.Letter),
        FixLen(GClass.Alnum, t.len), VarLen(GClass.Alnum))
    case Cls.Symbol =>
      Vector(ConstT(t.text))
    case Cls.Alnum =>
      Vector(FixLen(GClass.Alnum, t.len), VarLen(GClass.Alnum))
  }

  /** Graduated option reduction used when the full cross-product would
    * exceed the per-value cap. Each level keeps the patterns that matter
    * most for validation:
    *
    *  - level 1 drops literals (constants over-fit anyway and explode the
    *    product on wide values);
    *  - level 2 additionally drops `<alnum>` options on fine digit/letter
    *    runs (short values keep them at level 0 — that is where mixed
    *    hex-like columns need them);
    *  - level 3 keeps a single variable-length token of the narrowest class.
    */
  def optionsPruned(t: Tok, level: Int): Vector[PTok] = t.cls match {
    case Cls.Symbol => Vector(ConstT(t.text))
    case Cls.Alnum  => options(t) // merged runs: always just {n} and +
    case Cls.Digit => level match {
      case 0 => options(t)
      case 1 => Vector(FixLen(GClass.Digit, t.len), VarLen(GClass.Digit),
        FixLen(GClass.Alnum, t.len), VarLen(GClass.Alnum))
      case 2 => Vector(FixLen(GClass.Digit, t.len), VarLen(GClass.Digit))
      case _ => Vector(VarLen(GClass.Digit))
    }
    case Cls.Letter =>
      val cased =
        if (t.isUpper) GClass.Upper else if (t.isLower) GClass.Lower else GClass.Letter
      level match {
        case 0 => options(t)
        case 1 => options(t).filterNot(_.isInstanceOf[ConstT])
        case 2 => Vector(FixLen(cased, t.len), VarLen(cased), VarLen(GClass.Letter)).distinct
        case _ => Vector(VarLen(cased))
      }
  }
}
