package repro.core

/** Variance metric families compared in Section 4.2.2. `Tse` is the paper's
  * proposed metric (Eq. 6 + Eq. 7); `Dist1`/`Dist2` keep the variance
  * structure but drop one direction of Eq. 6; `AllPair` keeps Eq. 6 but
  * averages over all object pairs (Eq. 10); the `squared` flag yields the
  * S-variants (squared distances inside the variance sum).
  */
sealed abstract class VarianceMetric(val name: String, val squared: Boolean)
object VarianceMetric {
  case object Tse      extends VarianceMetric("tse", false)
  case object Dist1    extends VarianceMetric("dist1", false)
  case object Dist2    extends VarianceMetric("dist2", false)
  case object AllPair  extends VarianceMetric("allpair", false)
  case object STse     extends VarianceMetric("Stse", true)
  case object SDist1   extends VarianceMetric("Sdist1", true)
  case object SDist2   extends VarianceMetric("Sdist2", true)
  case object SAllPair extends VarianceMetric("Sallpair", true)

  val all: Vector[VarianceMetric] = Vector(Tse, Dist1, Dist2, AllPair, STse, SDist1, SDist2, SAllPair)
}

/** NDCG-based distance between segments (Section 4.1.3).
  *
  * A segment's top-explanation list is treated as a ranked document list; the
  * relevance of explanation E (ranked for segment P_j) towards segment P_i is
  * its diff score γ(E, P_i), *rectified to zero* when E's change effect
  * differs between the two segments (Table 2). NDCG normalizes by the DCG of
  * P_i's own list and is clamped to [0, 1].
  */
final class Ndcg(cube: ExplCube) {

  private val invLog: Array[Double] =
    Array.tabulate(64)(r => 1.0 / (math.log(r + 2.0) / math.log(2.0)))

  /** DCG of a segment's own list — rectification is trivially satisfied. */
  def dcgSelf(target: Segment, own: TopIds): Double = {
    var s = 0.0
    var r = 0
    while (r < own.size) { s += cube.gamma(own.ids(r), target) * invLog(r); r += 1 }
    s
  }

  /** DCG of `other`'s ranked list evaluated against `target` with rectified
    * relevance γ̄ (Eq. 3): zero when the effect flips between segments.
    */
  def dcgCross(target: Segment, other: TopIds): Double = {
    var s = 0.0
    var r = 0
    while (r < other.size) {
      val id = other.ids(r)
      if (cube.tau(id, target) == other.taus(r)) s += cube.gamma(id, target) * invLog(r)
      r += 1
    }
    s
  }

  /** NDCG(target, E*(other)) — how well `other`'s explanations explain
    * `target` (Eq. 5). A flat target (IDCG = 0 forces DCG = 0) scores 1.
    */
  def ndcg(target: Segment, targetTop: TopIds, other: TopIds): Double = {
    val idcg = dcgSelf(target, targetTop)
    if (idcg <= 0.0) 1.0
    else math.min(1.0, dcgCross(target, other) / idcg)
  }

  /** Symmetric explanation distance dist(P_i, P_j) (Eq. 6). */
  def dist(si: Segment, ti: TopIds, sj: Segment, tj: TopIds): Double =
    1.0 - (ndcg(si, ti, tj) + ndcg(sj, tj, ti)) / 2.0

  /** Directional variants used by the alternative metrics (Eq. 8 / Eq. 9):
    * dist1 keeps only how well the object's list explains the centroid;
    * dist2 keeps only how well the centroid's list explains the object.
    */
  def dist1(centroid: Segment, centroidTop: TopIds, objTop: TopIds): Double =
    1.0 - ndcg(centroid, centroidTop, objTop)

  def dist2(obj: Segment, objTop: TopIds, centroidTop: TopIds): Double =
    1.0 - ndcg(obj, objTop, centroidTop)
}
