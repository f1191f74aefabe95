package repro.data

import scala.util.Random
import repro.graph.LabeledGraph

/** Synthetic RDF-ontology generator.
  *
  * The paper evaluates on 11 real OWL ontologies (skos … pizza), which are
  * not available offline; this generator reproduces the structural
  * features the evaluation queries actually traverse:
  *
  *   - a **layered** class hierarchy (`subClassOf` triples): classes live
  *     on layers and every parent sits exactly one layer up. Layering is
  *     what the same-generation queries measure — a down-k/up-k walk stays
  *     depth-synchronized, so layered DAGs produce the rich same-layer
  *     relations the paper reports;
  *   - **multiple inheritance**: extra `subClassOf` parents make the
  *     hierarchy a DAG. In a single-parent tree two distinct classes never
  *     share a descendant and `R_S` collapses to the diagonal, unlike any
  *     real ontology;
  *   - instance typing (`type` triples) with a *skewed* class choice
  *     (popular classes accumulate many instances, as in real ABoxes) and
  *     a share of multi-typed instances — two classes typing the same
  *     instance are the `type⁻¹·type` base pairs of Q1;
  *   - padding triples with labels outside the query alphabet (`other`),
  *     standing in for labels/comments/domain/range triples, which the
  *     queries ignore but which count toward `#triples`.
  *
  * The triple count is exact:
  * `(numClasses − 1) + numInstances + extraTriples`, with the extra budget
  * split into additional parents / additional types / `other` padding by
  * the two fraction knobs. Deterministic in `seed`. Inverse edges `p⁻¹`
  * are added separately via [[repro.graph.LabeledGraph.withInverses]],
  * matching the paper's RDF → graph conversion.
  */
object OntologyGen {

  val Other = "other"

  /** Generate ontology triples as a [[LabeledGraph]] (no inverse edges yet).
    *
    * @param numClasses      classes 0 … numClasses−1; class 0 is the root
    * @param numInstances    instances numbered after the classes
    * @param extraTriples    extra budget, split by the fraction knobs
    * @param layers          number of hierarchy layers below the root;
    *                        non-root classes are spread evenly across them
    * @param multiParentFrac fraction of the extra budget spent on second
    *                        `subClassOf` parents (multiple inheritance)
    * @param multiTypeFrac   fraction of the extra budget spent on second
    *                        `type` edges for instances
    * @param typeSkew        exponent of the class-popularity skew for
    *                        `type` targets: the class is drawn as
    *                        `C·u^typeSkew` for uniform u, so higher skew
    *                        concentrates instances on few classes
    * @param typesPerInst    average number of `type` triples per instance
    *                        *node*: the `numInstances` primary type triples
    *                        are spread over a pool of
    *                        `numInstances / typesPerInst` instance nodes.
    *                        Real ABoxes (wine, pizza) type each individual
    *                        with many classes — co-typed classes are Q1
    *                        same-generation base pairs, so this knob
    *                        controls Q1 density without touching the
    *                        sco-only Q2
    * @param classTypeFrac   fraction of the *extra type* triples whose
    *                        subject is a class rather than an instance
    *                        (metaclass typing / OWL punning, common in
    *                        terminology-derived ontologies). These couple
    *                        the `type` edges into the same-generation
    *                        recursion — classes typing same-generation
    *                        classes become related themselves — which
    *                        compounds Q1 density while leaving the
    *                        sco-only Q2 untouched
    * @param seed            RNG seed (fully deterministic)
    */
  def ontology(numClasses: Int,
               numInstances: Int,
               extraTriples: Int,
               layers: Int = 5,
               multiParentFrac: Double = 0.7,
               multiTypeFrac: Double = 0.2,
               typeSkew: Double = 2.0,
               typesPerInst: Double = 1.0,
               classTypeFrac: Double = 0.0,
               seed: Long = 42L): LabeledGraph = {
    require(numClasses >= 1 && numInstances >= 0 && extraTriples >= 0 && layers >= 1)
    require(multiParentFrac >= 0 && multiTypeFrac >= 0 && multiParentFrac + multiTypeFrac <= 1)
    require(typesPerInst >= 1.0)
    val rnd = new Random(seed)
    val instancePool = if (numInstances == 0) 0
                       else math.max(1, math.round(numInstances / typesPerInst).toInt)
    val numNodes = numClasses + instancePool
    val triples = Vector.newBuilder[(Int, String, Int)]

    // Layer assignment: class 0 is the root (layer 0); classes 1…C-1 are
    // dealt round-robin onto layers 1…layers, so class ids within a layer
    // are contiguous-by-stride and every layer has width ≈ (C-1)/layers.
    val layerOf = new Array[Int](numClasses)
    val layerMembers = Array.fill(layers + 1)(Vector.newBuilder[Int])
    layerMembers(0) += 0
    for (i <- 1 until numClasses) {
      val l = 1 + (i - 1) % layers
      layerOf(i) = l
      layerMembers(l) += i
    }
    val members: Array[Vector[Int]] = layerMembers.map(_.result())
    def randomFrom(layer: Int): Int = {
      val m = members(layer)
      m(rnd.nextInt(m.size))
    }

    // Primary parents: exactly one parent in the layer above.
    for (i <- 1 until numClasses) {
      triples += ((i, "subClassOf", if (layerOf(i) == 1) 0 else randomFrom(layerOf(i) - 1)))
    }

    def skewedClass(): Int =
      math.min(numClasses - 1, (numClasses * math.pow(rnd.nextDouble(), typeSkew)).toInt)

    // Primary instance typing (skewed towards popular classes): the
    // `numInstances` type triples are spread over the instance pool, so
    // each instance node carries ≈ typesPerInst types on average.
    for (k <- 0 until numInstances) {
      triples += ((numClasses + k % instancePool, "type", skewedClass()))
    }

    // Extra budget: multiple inheritance, multiple typing, padding.
    // Degenerate shapes (one class / no instances) fold their share back
    // into padding so the triple count stays exact.
    val nParents = if (numClasses > 1) (extraTriples * multiParentFrac).toInt else 0
    val nTypes   =
      if (numInstances > 0 || classTypeFrac > 0)
        math.min((extraTriples * multiTypeFrac).toInt, extraTriples - nParents)
      else 0
    val nOther   = extraTriples - nParents - nTypes
    for (_ <- 0 until nParents) {
      val c = 1 + rnd.nextInt(numClasses - 1)
      triples += ((c, "subClassOf", if (layerOf(c) == 1) 0 else randomFrom(layerOf(c) - 1)))
    }
    for (_ <- 0 until nTypes) {
      val subject =
        if (rnd.nextDouble() < classTypeFrac || instancePool == 0) rnd.nextInt(numClasses)
        else numClasses + rnd.nextInt(instancePool)
      triples += ((subject, "type", skewedClass()))
    }
    for (_ <- 0 until nOther) {
      triples += ((rnd.nextInt(numNodes), Other, rnd.nextInt(numNodes)))
    }
    LabeledGraph(numNodes, triples.result())
  }
}
