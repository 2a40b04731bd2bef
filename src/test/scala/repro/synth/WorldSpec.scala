package repro.synth

import org.scalatest.funsuite.AnyFunSuite
import repro.TestFixtures

class WorldSpec extends AnyFunSuite {
  lazy val world: World = TestFixtures.world
  val cfg: SynthConfig = SynthConfig.tiny

  test("category taxonomy has the configured per-level counts") {
    val byLevel = world.categories.groupBy(_.level).view.mapValues(_.size).toMap
    assert(byLevel(1) === cfg.l1Categories)
    assert(byLevel(2) === cfg.l1Categories * cfg.l2PerL1)
    assert(byLevel(3) === cfg.nL3)
    assert(byLevel.getOrElse(4, 0) <= cfg.nL4)
  }

  test("every non-root category has an existing parent one level up") {
    world.categories.filter(_.level > 1).foreach { n =>
      val p = world.categoryById(n.parent)
      assert(p.level === n.level - 1, s"bad parent for ${n.id}")
    }
  }

  test("category leaves have no children") {
    val parents = world.categories.map(_.parent).toSet
    world.categoryLeaves.foreach(l => assert(!parents.contains(l.id)))
  }

  test("place taxonomy is a 5-level tree with consistent parents") {
    assert(world.places.count(_.level == 1) === cfg.nCountries)
    assert(world.places.count(_.level == 2) === cfg.nCountries * cfg.provincesPerCountry)
    val byId = world.places.map(p => p.id -> p).toMap
    world.places.filter(_.level > 1).foreach { p =>
      assert(byId(p.parent).level === p.level - 1)
    }
  }

  test("brand labels are unique") {
    assert(world.brands.map(_.label).distinct.size === world.brands.size)
  }

  test("brands have aliases that extend the canonical label") {
    world.brands.take(20).foreach { b =>
      assert(b.aliases.size === cfg.aliasesPerBrand)
      b.aliases.foreach(a => assert(a.startsWith(b.label + " ")))
    }
  }

  test("brand home places are cities") {
    val cityIds = world.cities.map(_.id).toSet
    world.brands.foreach(b => assert(cityIds.contains(b.homePlace)))
  }

  test("concept taxonomies have roots and typed leaves") {
    for (ct <- Seq("scene", "crowd", "theme", "time", "market")) {
      val leaves = world.conceptLeaves(ct)
      assert(leaves.nonEmpty)
      val rootIds = world.conceptsOf(ct).filter(_.level == 1).map(_.id).toSet
      leaves.foreach(l => assert(rootIds.contains(l.parent)))
    }
    assert(world.conceptLeaves("scene").size === cfg.nScene)
  }

  test("leaf profiles reference existing catalog entries") {
    val brandIds = world.brands.map(_.id).toSet
    val sceneIds = world.conceptLeaves("scene").map(_.id).toSet
    world.leafProfiles.foreach { p =>
      p.brandCands.foreach(b => assert(brandIds.contains(b)))
      (p.sceneShared ++ p.sceneOwn).foreach(s => assert(sceneIds.contains(s)))
      assert(p.attrs.size === cfg.attrsPerLeaf)
    }
  }

  test("sibling leaves share L2-level concept pools") {
    val byL2 = world.leafProfiles.groupBy(_.l2Idx)
    val multi = byL2.values.filter(_.size > 1)
    assert(multi.nonEmpty)
    multi.foreach { sibs =>
      assert(sibs.map(_.sceneShared).distinct.size === 1,
        "siblings must share the sceneShared pool")
    }
  }

  test("product generation is deterministic") {
    val a = world.product(7)
    val b = world.product(7)
    assert(a === b.copy(imageVec = a.imageVec)) // case class equality modulo array
    assert(a.imageVec.toSeq === b.imageVec.toSeq)
  }

  test("products are internally consistent") {
    (0L until 100L).map(world.product).foreach { p =>
      val prof = world.leafProfileById(p.leafId)
      assert(prof.brandCands.contains(p.brandId))
      assert(p.attrs.map(_._1) === prof.attrs.map(_.name))
      assert(p.titleTokens.size === p.titleTags.size)
      assert(p.titleTags.head === "B-Brand")
      assert(p.titleTags.contains("B-Category"))
      if (p.hasImage) assert(p.imageVec.length === cfg.imageDim)
      else assert(p.imageVec.isEmpty)
    }
  }

  test("title BIO tags are well-formed (I follows B/I of same type)") {
    (0L until 200L).map(world.product).foreach { p =>
      p.titleTags.zipWithIndex.foreach { case (tag, i) =>
        if (tag.startsWith("I-")) {
          val prev = p.titleTags(i - 1)
          assert(prev == s"B-${tag.drop(2)}" || prev == tag)
        }
      }
    }
  }

  test("product brand distribution is skewed toward the leaf's top brand") {
    val prods = (0L until 400L).map(world.product)
    val byLeaf = prods.groupBy(_.leafId).filter(_._2.size >= 20)
    assert(byLeaf.nonEmpty)
    byLeaf.foreach { case (leaf, ps) =>
      val top = ps.groupBy(_.brandId).values.map(_.size).max
      assert(top.toDouble / ps.size > 0.25, s"no dominant brand for $leaf")
    }
  }

  test("80% of products originate from their brand's home city") {
    val prods = (0L until 500L).map(world.product)
    val atHome = prods.count(p => world.brandById(p.brandId).homePlace == p.placeId)
    assert(atHome.toDouble / prods.size > 0.7)
  }

  test("reviews carry gold IE triples and concept mentions") {
    val p = world.product(3)
    val revs = world.reviews(p)
    assert(revs.size === cfg.reviewsPerProduct)
    revs.foreach { rv =>
      assert(rv.productId === p.id)
      assert(rv.goldTriples.nonEmpty)
      rv.goldTriples.foreach { case (asp, attr, op) =>
        assert(rv.text.contains(asp) && rv.text.contains(attr) && rv.text.contains(op))
      }
      rv.goldMentions.foreach { case (_, lbl) => assert(rv.text.contains(lbl)) }
    }
  }

  test("image features of same (leaf, brand) are closer than across leaves") {
    val prods = (0L until 600L).map(world.product).filter(_.hasImage)
    val byKey = prods.groupBy(p => (p.leafId, p.brandId)).filter(_._2.size >= 2)
    assert(byKey.nonEmpty)
    def dist(a: Array[Float], b: Array[Float]): Double =
      math.sqrt(a.zip(b).map { case (x, y) => (x - y) * (x - y) }.sum)
    val (sameKey, _) = byKey.head
    val same = byKey.head._2
    val other = prods.find(p => p.leafId != sameKey._1 && p.brandId != sameKey._2).get
    val dSame = dist(same(0).imageVec, same(1).imageVec)
    val dOther = dist(same(0).imageVec, other.imageVec)
    assert(dSame < dOther)
  }
}
