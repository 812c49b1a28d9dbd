package repro.core

import scala.util.Random

/** Seeded random generators and paper fixtures shared by the test suites. */
object TestGen {

  /** Random strict partial order: random topological order, forward edges
    * with probability `p`, transitive closure.
    */
  def randomRelation(rng: Random, domainSize: Int, p: Double = 0.3): PrefRelation = {
    val perm = rng.shuffle((0 until domainSize).toVector)
    val edges = for {
      i <- 0 until domainSize; j <- i + 1 until domainSize
      if rng.nextDouble() < p
    } yield (perm(i), perm(j))
    PrefRelation.fromEdges(domainSize, edges)
  }

  /** A user relation "near" a base relation: drop each base tuple's Hasse
    * edge with probability `drop`, add a few random compatible edges —
    * models users in the same latent preference group.
    */
  def perturbedRelation(rng: Random, base: PrefRelation, drop: Double = 0.2,
                        addTries: Int = 3): PrefRelation = {
    val m = base.domainSize
    var edges = (for {
      x <- 0 until m; y <- base.hasseSuccessors(x)
      if rng.nextDouble() >= drop
    } yield (x, y)).toVector
    var rel = PrefRelation.fromEdges(m, edges)
    (0 until addTries).foreach { _ =>
      val x = rng.nextInt(m); val y = rng.nextInt(m)
      if (rel.canAdd(x, y)) rel = rel.add(x, y)
    }
    rel
  }

  def randomUsers(rng: Random, nUsers: Int, domains: Seq[Int], nGroups: Int = 3): Seq[UserPrefs] = {
    val bases = (0 until nGroups).map(_ => domains.map(m => randomRelation(rng, m)).toArray)
    (0 until nUsers).map { uid =>
      val base = bases(uid % nGroups)
      UserPrefs(uid, base.map(perturbedRelation(rng, _)))
    }
  }

  def randomObjects(rng: Random, n: Int, domains: Seq[Int], startTs: Long = 1): Seq[Obj] =
    (0 until n).map(i => Obj(startTs + i, domains.map(m => rng.nextInt(m)).toArray))

  /** Random clustering of users into contiguous groups (exact common
    * relations as filters) — for equivalence tests that don't care how
    * clusters were formed.
    */
  def randomExactClusters(rng: Random, users: Seq[UserPrefs], nClusters: Int): Seq[Cluster] = {
    val shuffled = rng.shuffle(users.toVector)
    val groups = shuffled.zipWithIndex.groupBy(_._2 % nClusters).toSeq.sortBy(_._1)
    groups.map { case (cid, pairs) =>
      val members = pairs.map(_._1)
      Cluster(cid, Clustering.commonRels(members), members)
    }
  }

  // ------------------------------------------------------- paper fixtures

  /** Table IV brand domain encoding. */
  val A = 0; val L = 1; val S = 2; val T = 3
  val BrandNames: Map[Int, String] = Map(A -> "Apple", L -> "Lenovo", S -> "Samsung", T -> "Toshiba")

  /** Table IV user preferences on brand (reconstructed — every similarity
    * value of Examples 6-9 and vector of Examples 13-14 is implied).
    */
  val tableIvC1: PrefRelation = PrefRelation.fromEdges(4, Seq((A, L), (L, S), (T, S)))
  val tableIvC2: PrefRelation = PrefRelation.fromEdges(4, Seq((A, L), (L, S), (T, L)))
  val tableIvC3: PrefRelation = PrefRelation.fromEdges(4, Seq((S, L), (L, A), (L, T)))
  val tableIvC4: PrefRelation = PrefRelation.fromEdges(4, Seq((S, L), (L, A), (A, T)))
  val tableIvC5: PrefRelation = PrefRelation.fromEdges(4, Seq((L, A), (L, T), (A, S), (T, S)))
  val tableIvC6: PrefRelation = PrefRelation.fromEdges(4, Seq((L, A), (A, T), (A, S)))

  val tableIvU1: PrefRelation = tableIvC1.intersect(tableIvC2)
  val tableIvU2: PrefRelation = tableIvC3.intersect(tableIvC4)
  val tableIvU3: PrefRelation = tableIvC5.intersect(tableIvC6)

  /** Example 3 CPU domain encoding. */
  val Single = 0; val Dual = 1; val Triple = 2; val Quad = 3

  val cpuC1: PrefRelation =
    PrefRelation.fromEdges(4, Seq((Dual, Triple), (Dual, Quad), (Triple, Single), (Quad, Single)))
  val cpuC2: PrefRelation =
    PrefRelation.fromEdges(4, Seq((Quad, Triple), (Triple, Dual), (Dual, Single)))

  /** Example 11 / Fig. 3a: three users' brand preferences whose tuple
    * frequencies reproduce Table V exactly.
    */
  val fig3aU1: PrefRelation = PrefRelation.fromEdges(4, Seq((A, T), (L, T), (T, S)))
  val fig3aU2: PrefRelation = PrefRelation.fromEdges(4, Seq((A, T), (T, S), (S, L)))
  val fig3aU3: PrefRelation = PrefRelation.fromEdges(4, Seq((S, L), (L, T), (A, T)))
}
