package repro.shred

import scala.collection.immutable.ListMap
import repro.core._

/** The shredded representation of types (§4).
  *
  * A nested bag type `T` is encoded by a flat bag type `T^F` (bag-valued
  * attributes replaced by `Label`) plus one dictionary per nested level. We
  * use the paper's *relational* dictionary representation throughout the
  * runtime: the dictionary for path `p` is a flat bag whose first attribute
  * is `label` and whose remaining attributes are the flat element attributes
  * of the bag at `p` (inner bags again as labels).
  *
  * Naming convention binding a shredded relation together (used by the
  * shredder, the executors and the unshredder):
  *   - top bag:     `<name>__F`
  *   - dictionary:  `<name>__D_<a1>_<a2>_…` for the bag reached by the
  *     attribute path a1.a2.…
  */
object ShredTypes {

  val LabelCol = "label"

  /** `T^F` for a tuple element type: bag attributes become labels. */
  def flatElem(t: TupleTpe): TupleTpe =
    TupleTpe(t.fields.map {
      case (n, _: BagTpe) => n -> (LabelTpe: Tpe)
      case (n, s)         => n -> s
    })

  /** Element type of the relational dictionary at `path` inside `t`:
    * `label` followed by the flattened element attributes.
    */
  def dictElem(t: BagTpe, path: Seq[String]): TupleTpe = {
    val elem = elemAt(t, path)
    TupleTpe(ListMap((LabelCol -> (LabelTpe: Tpe)) +: flatElem(elem).fields.toSeq: _*))
  }

  /** The element tuple type of the bag reached by `path` from the root bag. */
  def elemAt(t: BagTpe, path: Seq[String]): TupleTpe =
    path.foldLeft(t.elem) { (cur, a) =>
      cur(a) match {
        case BagTpe(e) => e
        case other     => sys.error(s"path step $a is not a bag: ${other.render}")
      }
    }

  /** All nested-bag attribute paths of `t`, parents before children. */
  def bagPaths(t: BagTpe): Seq[Seq[String]] = {
    def walk(elem: TupleTpe, prefix: Seq[String]): Seq[Seq[String]] =
      elem.fields.toSeq.flatMap {
        case (n, BagTpe(inner)) => (prefix :+ n) +: walk(inner, prefix :+ n)
        case _                  => Seq.empty
      }
    walk(t.elem, Seq.empty)
  }

  def topName(name: String): String = s"${name}__F"
  def dictName(name: String, path: Seq[String]): String =
    s"${name}__D_${path.mkString("_")}"

  /** Names and element types of every component of the shredded form of a
    * relation `name : t` — the top bag first, then dictionaries in
    * parent-before-child order.
    */
  def components(name: String, t: BagTpe): Seq[(String, TupleTpe)] =
    (topName(name) -> flatElem(t.elem)) +:
      bagPaths(t).map(p => dictName(name, p) -> dictElem(t, p))
}
