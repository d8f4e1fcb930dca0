package repro.kg

import repro.core.RelKind

/** A meta-graph: a typed schema whose KG instances define the relevance
  * `s(x,y|m)` between the two end ITEMs (paper Sec. V-A, after [15]).
  *
  * Two shapes are supported, which together cover the paper's Fig. 1(b)
  * examples:
  *
  *  - [[MetaGraph.SharedNeighbor]] — `x -e-> n <-e- y`: the instance count
  *    is the number of common `e`-neighbors of x and y (e.g. m1 "two ITEMs
  *    SUPPORT the same FEATURE").
  *  - [[MetaGraph.Conjunction]] — `x -e1-> n1 <-e1- y` AND
  *    `x -e2-> n2 <-e2- y`: an instance is a pair (n1, n2), so the count is
  *    the product of the two common-neighbor counts (e.g. m3 "same FEATURE
  *    and same BRAND").
  *
  * `s(x,y|m)` = instance count normalized by the per-meta-graph maximum
  * count over all item pairs, so `s ∈ [0,1]` ("correlated to the number of
  * m's instances", Sec. V-A; the exact normalization is orthogonal).
  */
sealed trait MetaGraph {
  def name: String
  def kind: RelKind
}

object MetaGraph {
  final case class SharedNeighbor(name: String, kind: RelKind, etype: String) extends MetaGraph
  final case class Conjunction(name: String, kind: RelKind, etype1: String, etype2: String)
      extends MetaGraph

  import KGSchema._
  import RelKind._

  /** The six meta-graphs of the 6-type datasets (Amazon-lite, Yelp-lite).
    * Complementary: shared feature / brand (cross elasticity of demand);
    * substitutable: same category (items filling the same need).
    */
  val sixTypeSet: Vector[MetaGraph] = Vector(
    SharedNeighbor("mC1-feature", Complementary, Supports),
    SharedNeighbor("mC2-brand", Complementary, ProducedBy),
    Conjunction("mC3-feature-brand", Complementary, Supports, ProducedBy),
    SharedNeighbor("mS1-category", Substitutable, BelongsTo),
    Conjunction("mS2-category-brand", Substitutable, BelongsTo, ProducedBy),
    Conjunction("mS3-category-feature", Substitutable, BelongsTo, Supports),
  )

  /** The meta-graphs of the 3-type datasets (Douban-lite, Gowalla-lite). */
  val threeTypeSet: Vector[MetaGraph] = Vector(
    SharedNeighbor("mC1-tag", Complementary, HasTag),
    SharedNeighbor("mS1-category", Substitutable, BelongsTo),
    Conjunction("mS2-category-tag", Substitutable, BelongsTo, HasTag),
  )
}
