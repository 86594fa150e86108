package repro.data

import scala.util.Random

import repro.stream.{Op, Sgt}

/** Deterministic synthetic streaming-graph generators standing in for the
  * paper's datasets (substitutions documented in DESIGN.md §4). All streams
  * arrive in non-decreasing timestamp order, one time unit per tuple.
  */
object StreamGen {

  /** Zipf-ish sampler over `0 until n` (rank-weight 1/r^alpha). */
  final class Zipf(n: Int, alpha: Double, rnd: Random) {
    private val cdf: Array[Double] = {
      val w = Array.tabulate(n)(i => 1.0 / math.pow(i + 1.0, alpha))
      val c = w.scanLeft(0.0)(_ + _).tail
      val total = c.last
      c.map(_ / total)
    }
    def next(): Int = {
      val u = rnd.nextDouble()
      val i = java.util.Arrays.binarySearch(cdf, u)
      val idx = if (i >= 0) i else -i - 1
      math.min(idx, n - 1)
    }
  }

  /** Stackoverflow-like: one vertex type (users), three labels covering all
    * edges, zipf-skewed endpoints — dense and highly cyclic, the paper's most
    * challenging workload.
    */
  def soLike(nVertices: Int, nEdges: Int, seed: Long = 7): Vector[Sgt] = {
    val rnd = new Random(seed)
    val zipf = new Zipf(nVertices, 1.2, rnd)
    val labels = Vector(Queries.soLabels._1, Queries.soLabels._2, Queries.soLabels._3)
    Vector.tabulate(nEdges) { i =>
      val u = zipf.next().toLong
      var v = zipf.next().toLong
      if (v == u) v = (u + 1 + rnd.nextInt(nVertices - 1)) % nVertices
      Sgt(i + 1L, u, v, labels(rnd.nextInt(3)))
    }
  }

  /** LDBC-SNB-like update stream: persons `0 until nPersons`, posts from
    * `nPersons` upward, created incrementally. Labels: `knows` (person↔person,
    * sparse), `replyOf` (post→earlier post: reply *trees*, acyclic),
    * `hasCreator` (post→person), `likes` (person→post), plus low-frequency
    * filler interactions for the 8-type mix. Sparse and heterogeneous.
    */
  def ldbcLike(nPersons: Int, nEdges: Int, seed: Long = 11): Vector[Sgt] = {
    val rnd = new Random(seed)
    val out = Vector.newBuilder[Sgt]
    var ts = 0L
    var nextPost = nPersons.toLong
    var posts = 0
    def person(): Long = rnd.nextInt(nPersons).toLong
    def post(): Long = nPersons + rnd.nextInt(posts).toLong

    while (ts < nEdges) {
      val r = rnd.nextDouble()
      ts += 1
      if (r < 0.15 || posts == 0) {
        // new post (with creator, possibly a reply)
        val p = nextPost; nextPost += 1; posts += 1
        out += Sgt(ts, p, person(), "hasCreator")
        if (posts > 1 && rnd.nextDouble() < 0.7 && ts < nEdges) {
          ts += 1
          out += Sgt(ts, p, nPersons + rnd.nextInt(posts - 1).toLong, "replyOf")
        }
      } else if (r < 0.35) {
        val (p1, p2) = (person(), person())
        out += Sgt(ts, p1, if (p2 == p1) (p1 + 1) % nPersons else p2, "knows")
      } else if (r < 0.75) {
        out += Sgt(ts, person(), post(), "likes")
      } else if (r < 0.85) {
        out += Sgt(ts, person(), post(), "hasModerator")
      } else if (r < 0.95) {
        out += Sgt(ts, post(), person(), "hasMember")
      } else {
        out += Sgt(ts, post(), post(), "hasTag")
      }
    }
    out.result()
  }

  /** Yago2s-like RDF stream: typed entities — persons, events, places — and a
    * rich schema (~100 labels, most of them filler outside every query
    * alphabet). The query-relevant core: `participatedIn` (person→event),
    * `happenedIn` (event→place), `hasCapital` (place→earlier place, acyclic).
    * Timestamps are assigned at a fixed rate, exactly as the paper does to
    * emulate a stream over the static Yago2s graph.
    */
  def yagoLike(nEntities: Int, nEdges: Int, seed: Long = 13): Vector[Sgt] = {
    val rnd = new Random(seed)
    val nPersons = nEntities * 3 / 10
    val nEvents  = nEntities * 3 / 10
    val nPlaces  = nEntities - nPersons - nEvents
    def person(): Long = rnd.nextInt(nPersons).toLong
    def event(): Long  = (nPersons + rnd.nextInt(nEvents)).toLong
    def place(): Long  = (nPersons + nEvents + rnd.nextInt(nPlaces)).toLong
    val filler = Vector.tabulate(97)(i => f"p$i%02d")

    Vector.tabulate(nEdges) { i =>
      val ts = i + 1L
      val r = rnd.nextDouble()
      if (r < 0.30) Sgt(ts, person(), event(), "participatedIn")
      else if (r < 0.55) Sgt(ts, event(), place(), "happenedIn")
      else if (r < 0.75) {
        // acyclic place hierarchy: capital edges point to lower place ids
        val p = nPersons + nEvents + 1 + rnd.nextInt(math.max(1, nPlaces - 1))
        val q = nPersons + nEvents + rnd.nextInt(p - nPersons - nEvents)
        Sgt(ts, p.toLong, q.toLong, "hasCapital")
      } else {
        Sgt(ts, rnd.nextInt(nEntities).toLong, rnd.nextInt(nEntities).toLong,
            filler(rnd.nextInt(filler.length)))
      }
    }
  }

  /** Mix explicit deletions into an append-only stream: with probability
    * `ratio`, a previously inserted edge is re-issued as a negative tuple
    * (the paper's §5.4 methodology).
    */
  def withDeletions(stream: Vector[Sgt], ratio: Double, seed: Long = 17): Vector[Sgt] = {
    val rnd = new Random(seed)
    val inserted = scala.collection.mutable.ArrayBuffer.empty[Sgt]
    val out = Vector.newBuilder[Sgt]
    var ts = 0L
    stream.foreach { t =>
      ts = math.max(ts + 1, t.ts)
      out += t.copy(ts = ts)
      inserted += t
      if (rnd.nextDouble() < ratio && inserted.nonEmpty) {
        val victim = inserted(rnd.nextInt(inserted.length))
        ts += 1
        out += Sgt(ts, victim.src, victim.dst, victim.label, Op.Delete)
      }
    }
    out.result()
  }
}
