package repro.baselines

import repro.core.TableData

/** Set-containment baselines in the style of LCJoin [9] / JOSIE [30]
  * (§6.4.2). Both treat data as *sets* and therefore cannot express table
  * containment — the paper explains (footnote 6) that column-wise set
  * containment loses row-tuple structure, and row-as-tuple sets cannot match
  * across tables with different column counts. These implementations exist
  * to demonstrate exactly those failure modes against ground truth.
  */
object SetContainment {

  /** LCJoin-style: treat every common column as a value set and claim table
    * containment when each of the child's column sets is contained in the
    * parent's same-named column set. Produces false positives (footnote 6).
    */
  def columnsAsSets(child: TableData, parent: TableData): Boolean = {
    val common = child.columns.filter(parent.columns.contains)
    common.nonEmpty && common.forall { c =>
      child.projectedKeys(Seq(c)).subsetOf(parent.projectedKeys(Seq(c)))
    }
  }

  /** JOSIE/LCJoin-style with whole rows as set elements: claims containment
    * only when full row tuples match — which is structurally impossible when
    * the parent has more columns, producing false negatives.
    */
  def rowsAsSets(child: TableData, parent: TableData): Boolean = {
    if (child.columns.size != parent.columns.size) false
    else if (child.columns.toSet != parent.columns.toSet) false
    else child.projectedKeys(child.columns.sorted).subsetOf(parent.projectedKeys(parent.columns.sorted))
  }
}
