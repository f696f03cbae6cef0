package repro.lake

import org.scalatest.funsuite.AnyFunSuite
import LakeGen._

/** Tests for the generator knobs added during benchmark bring-up:
  * confusion groups, shared-pool sizing, and qualifier vocabulary.
  */
class LakeGenKnobsSpec extends AnyFunSuite {

  private def cfg(groups: Int = 1, qualifiers: Int = 7,
                  sharedPool: Option[Int] = None) =
    LakeConfig(name = "knobs", nTemplates = 8, derivedPerTemplate = 4,
      arityMin = 4, arityMax = 5, sharedTypesPerTemplate = 2, nSharedSurfaces = 6,
      rowsPerDerived = 20, poolSize = 80, colKeepFraction = 1.0,
      nQueries = 0, noise = 0.0, seed = 5, confusionGroupSize = groups,
      textQualifiers = qualifiers, sharedPoolSize = sharedPool)

  private def sharedSurfacesOf(tpl: Template): Set[String] =
    tpl.types.map(_.surface).filter(_.startsWith("shared")).toSet

  test("confusionGroupSize=1: templates sample shared surfaces independently") {
    val tpls = LakeGen.makeTemplates(cfg(groups = 1))
    val sets = tpls.map(sharedSurfacesOf).distinct
    assert(sets.size > 2, "independent sampling should produce varied sets")
  }

  test("confusionGroupSize=4: group members share an identical surface set") {
    val tpls = LakeGen.makeTemplates(cfg(groups = 4))
    tpls.grouped(4).foreach { group =>
      val sets = group.map(sharedSurfacesOf).distinct
      assert(sets.size == 1, s"group should share one set, got $sets")
    }
  }

  test("different confusion groups get different surface sets (w.h.p.)") {
    val tpls = LakeGen.makeTemplates(cfg(groups = 4))
    val groupSets = tpls.grouped(4).map(g => sharedSurfacesOf(g.head)).toSeq
    assert(groupSets.distinct.size >= 2)
  }

  test("sharedPoolSize shrinks only the shared surfaces' pools") {
    val tpls = LakeGen.makeTemplates(cfg(sharedPool = Some(10)))
    tpls.flatMap(_.types).foreach { t =>
      if (t.surface.startsWith("shared")) assert(t.poolSize == 10)
      else assert(t.poolSize == 80)
    }
  }

  test("small shared pools make homograph columns near-identical in values") {
    val lake = LakeGen.generate(cfg(groups = 4, sharedPool = Some(10)))
    // two text columns of the same shared surface from different templates
    val shared = lake.colSurfaceType.toSeq
      .filter { case ((tid, ci), s) =>
        s.startsWith("shared") &&
          !lake.tables.find(_.id == tid).get.columns(ci).isNumeric
      }
      .groupBy(_._2)
      .values.find(cols => cols.map(c => lake.templateOf(c._1._1)).distinct.size > 1)
    shared.foreach { cols =>
      val byTpl = cols.groupBy(c => lake.templateOf(c._1._1)).values.toSeq
      val (t1, c1) = byTpl(0).head._1
      val (t2, c2) = byTpl(1).head._1
      val a = lake.tables.find(_.id == t1).get.columns(c1).tokenSet
      val b = lake.tables.find(_.id == t2).get.columns(c2).tokenSet
      val jaccard = a.intersect(b).size.toDouble / a.union(b).size
      assert(jaccard > 0.5, s"expected heavy overlap, jaccard=$jaccard")
    }
  }

  test("textQualifiers sizes the qualifier vocabulary") {
    val lakeSmall = LakeGen.generate(cfg(qualifiers = 3))
    val lakeBig   = LakeGen.generate(cfg(qualifiers = 40))
    def qualifierCount(lake: Lake): Int = {
      val textCols = lake.tables.flatMap(_.columns).filterNot(_.isNumeric)
      textCols.flatMap(_.tokens).filter(_.contains("q")).distinct.size
    }
    assert(qualifierCount(lakeBig) > qualifierCount(lakeSmall))
  }

  test("larger qualifier vocabulary lowers same-surface token overlap") {
    def overlapOf(q: Int): Double = {
      val lake = LakeGen.generate(cfg(qualifiers = q))
      val pairs = for {
        surface <- lake.colSurfaceType.values.toSeq.distinct.take(5)
        cols = lake.colSurfaceType.filter(_._2 == surface).keys.toSeq
        if cols.size >= 2
      } yield {
        val a = lake.tables.find(_.id == cols(0)._1).get.columns(cols(0)._2).tokenSet
        val b = lake.tables.find(_.id == cols(1)._1).get.columns(cols(1)._2).tokenSet
        a.intersect(b).size.toDouble / math.max(1, a.union(b).size)
      }
      pairs.sum / pairs.size
    }
    assert(overlapOf(40) < overlapOf(3))
  }
}
