package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.kg.{KGGenerator, KGSchema}

class DatasetGenSpec extends AnyFunSuite {

  test("the four lite families have the paper's type shapes") {
    val sixType = Seq(DatasetGen.amazonLite(), DatasetGen.yelpLite())
    sixType.foreach { cfg =>
      assert(cfg.kg.sixType, cfg.name)
      assert(cfg.metaGraphs.size == 6, cfg.name)
    }
    val threeType = Seq(DatasetGen.doubanLite(), DatasetGen.gowallaLite())
    threeType.foreach { cfg =>
      assert(!cfg.kg.sixType, cfg.name)
      assert(cfg.metaGraphs.size == 3, cfg.name)
    }
  }

  test("douban-lite is the largest network (paper order by users)") {
    val all = DatasetGen.allLite()
    assert(all.last.name == "douban-lite")
    assert(all.map(_.nUsers) == all.map(_.nUsers).sorted, "allLite is ordered by user count")
  }

  test("douban-lite is complementary-heavy: tags shared widely, categories fragmented") {
    val douban = DatasetGen.doubanLite()
    val edges = KGGenerator.edgeList(douban.kg)
    val tagPairs = sharedPairs(edges, KGSchema.HasTag)
    val catPairs = sharedPairs(edges, KGSchema.BelongsTo)
    assert(tagPairs > 2 * catPairs, s"tag pairs $tagPairs vs category pairs $catPairs")
  }

  test("gowalla-lite uses uniform-random importance, others price-like") {
    assert(DatasetGen.gowallaLite().importanceMode == ImportanceMode.UniformRandom)
    assert(DatasetGen.amazonLite().importanceMode == ImportanceMode.Price)
    assert(DatasetGen.doubanLite().importanceMode == ImportanceMode.Price)
  }

  test("amazon-small is a 100-user sample (the Fig. 5 OPT setting)") {
    val cfg = DatasetGen.amazonSmall()
    assert(cfg.nUsers == 100)
    assert(cfg.nItems <= 10, "small item set keeps OPT brute force feasible")
  }

  test("scale parameter shrinks users and edges together") {
    val full = DatasetGen.amazonLite()
    val half = DatasetGen.amazonLite(scale = 0.5)
    assert(half.nUsers < full.nUsers && half.nEdges < full.nEdges)
    assert(half.nItems == full.nItems, "item catalog does not scale")
  }

  /** Count item pairs sharing at least one neighbor of the given edge type. */
  private def sharedPairs(edges: Seq[(Long, Long, String)], etype: String): Int = {
    val byItem = edges.filter(_._3 == etype).groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    val items = byItem.keys.toVector
    (for {
      i <- items.indices
      j <- (i + 1) until items.size
      if (byItem(items(i)) & byItem(items(j))).nonEmpty
    } yield 1).sum
  }
}
