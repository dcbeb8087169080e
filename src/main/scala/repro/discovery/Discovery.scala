package repro.discovery

import repro.core.TuckerModel
import repro.linalg.{DenseMatrix, KMeans}

/** One discovered concept (Table V): a K-means cluster of factor-matrix
  * rows, with its dominant ground-truth label and within-cluster purity
  * (only computable here because the MovieLens substitute *plants* labels —
  * DESIGN.md §5).
  */
final case class Concept(clusterId: Int, size: Int, dominantLabel: Int,
                         purity: Double, sampleIndices: Seq[Int])

/** Section V, "Concept Discovery": each row of a factor matrix is the latent
  * feature vector of one attribute value (movie, user, …); K-means over the
  * rows reveals concepts such as genres.
  */
object ConceptDiscovery {

  def cluster(factor: DenseMatrix, k: Int, seed: Long = 7): Array[Int] =
    KMeans.fit(Array.tabulate(factor.rows)(factor.row), k, seed)._1

  /** Clusters rows and summarizes each cluster against ground-truth
    * `labels`, largest clusters first.
    */
  def concepts(factor: DenseMatrix, k: Int, labels: Array[Int],
               samplesPerCluster: Int = 3, seed: Long = 7): Seq[Concept] = {
    require(labels.length == factor.rows)
    val assign = cluster(factor, k, seed)
    assign.zipWithIndex.groupBy(_._1).toSeq.map { case (cid, members) =>
      val idxs = members.map(_._2)
      val byLabel = idxs.groupBy(labels).toSeq.sortBy(-_._2.length)
      val (dom, domMembers) = byLabel.head
      Concept(cid, idxs.length, dom, domMembers.length.toDouble / idxs.length,
        idxs.take(samplesPerCluster).toSeq)
    }.sortBy(-_.size)
  }

  /** Overall majority-label purity of the clustering. */
  def overallPurity(factor: DenseMatrix, k: Int, labels: Array[Int], seed: Long = 7): Double =
    KMeans.purity(cluster(factor, k, seed), labels)
}

/** One discovered relation (Table VI): a large-magnitude core cell
  * `G_(j_1…j_N)` links column `j_n` of every `A^(n)`; `topAttributes(n)`
  * lists the attribute indices with the largest loadings in that column.
  */
final case class Relation(coreIdx: Array[Int], value: Double,
                          topAttributes: Array[Array[Int]])

/** Section V, "Relation Discovery": examine the largest-magnitude core cells
  * and read off which attribute values load on the implicated columns.
  */
object RelationDiscovery {

  def topRelations(model: TuckerModel, topK: Int, attrsPerMode: Int = 5): Seq[Relation] = {
    model.core.entries
      .sortBy(e => -math.abs(e.value))
      .take(topK)
      .map { e =>
        val tops = Array.tabulate(model.order) { n =>
          val f = model.factors(n)
          val j = e.idx(n)
          (0 until f.rows).sortBy(i => -math.abs(f(i, j))).take(attrsPerMode).toArray
        }
        Relation(e.idx, e.value, tops)
      }.toSeq
  }
}
