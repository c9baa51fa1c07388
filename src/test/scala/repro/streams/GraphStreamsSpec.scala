package repro.streams

import repro.SparkSpec
import repro.streams.GraphStreams._

class GraphStreamsSpec extends SparkSpec {

  test("soSim is deterministic in its seed") {
    val s1 = soSim(spark, nUsers = 50, nEdges = 500, seed = 3)
    val s2 = soSim(spark, nUsers = 50, nEdges = 500, seed = 3)
    assert(s1 == s2)
  }

  test("soSim different seeds differ") {
    val s1 = soSim(spark, nUsers = 50, nEdges = 500, seed = 3)
    val s2 = soSim(spark, nUsers = 50, nEdges = 500, seed = 4)
    assert(s1 != s2)
  }

  test("soSim streams are ordered by timestamp and span the requested days") {
    val s = soSim(spark, nUsers = 50, nEdges = 500, spanDays = 10)
    assert(s.map(_.ts) == s.map(_.ts).sorted)
    assert(s.last.ts < 10 * SecondsPerDay)
    assert(s.size == 500)
  }

  test("soSim uses the three SO interaction labels and user vertices") {
    val s = soSim(spark, nUsers = 40, nEdges = 400)
    assert(s.map(_.label).toSet == Set("ans", "cmt", "c2a"))
    assert(s.forall(e => e.src >= 0 && e.src < 40 && e.trg >= 0 && e.trg < 40))
  }

  test("soSim endpoint skew produces a dense core (cyclic stress data)") {
    val s = soSim(spark, nUsers = 100, nEdges = 2000, skew = 2.0)
    val hot = s.count(e => e.src < 25)
    assert(hot > s.size / 2, s"expected >50% of sources in the hot quartile, got $hot/${s.size}")
  }

  test("ldbcSim is deterministic and ordered") {
    val s1 = ldbcSim(spark, nPersons = 30, nPosts = 200, nKnows = 100, nLikes = 300)
    val s2 = ldbcSim(spark, nPersons = 30, nPosts = 200, nKnows = 100, nLikes = 300)
    assert(s1 == s2)
    assert(s1.map(_.ts) == s1.map(_.ts).sorted)
  }

  test("ldbcSim labels and endpoint typing") {
    val nPersons = 30L; val nPosts = 200L
    val s = ldbcSim(spark, nPersons = nPersons, nPosts = nPosts, nKnows = 100, nLikes = 300)
    assert(s.map(_.label).toSet == Set("knows", "likes", "hasCreator", "replyOf"))
    for (e <- s) e.label match {
      case "knows"      => assert(e.src < nPersons && e.trg < nPersons)
      case "likes"      => assert(e.src < nPersons && e.trg >= nPersons)
      case "hasCreator" => assert(e.src >= nPersons && e.trg < nPersons)
      case "replyOf"    => assert(e.src >= nPersons && e.trg >= nPersons)
    }
  }

  test("ldbcSim replyOf is a forest over earlier posts (paper §7.2.2)") {
    val s = ldbcSim(spark, nPersons = 30, nPosts = 300, nKnows = 50, nLikes = 100)
    val replies = s.filter(_.label == "replyOf")
    assert(replies.nonEmpty)
    // Tree-shaped: each post replies to at most one strictly earlier post.
    assert(replies.forall(e => e.trg < e.src))
    val outDegree = replies.groupBy(_.src).values.map(_.size)
    assert(outDegree.forall(_ == 1))
  }

  test("ldbcSim posts have exactly one creator") {
    val s = ldbcSim(spark, nPersons = 30, nPosts = 150, nKnows = 50, nLikes = 100)
    val creators = s.filter(_.label == "hasCreator").groupBy(_.src)
    assert(creators.size == 150 && creators.values.forall(_.size == 1))
  }

  test("ldbcSim likes target posts that already exist") {
    val nPersons = 30L
    val s = ldbcSim(spark, nPersons = nPersons, nPosts = 200, nKnows = 50, nLikes = 400,
                    spanDays = 100)
    val creationTs = s.filter(_.label == "hasCreator").map(e => e.src -> e.ts).toMap
    for (like <- s.filter(_.label == "likes"))
      assert(creationTs.get(like.trg).forall(_ <= like.ts),
        s"like at ${like.ts} targets post ${like.trg} created at ${creationTs.get(like.trg)}")
  }
}
