package repro.eval

import repro.SparkSpec
import repro.core.FedexConfig
import repro.data.{DataScale, Frames, Queries}

class UserProxySpec extends SparkSpec {

  private lazy val frames  = new Frames(spark, DataScale.Test)
  private lazy val queries = Queries.all(frames)
  private val cfg = FedexConfig(nSets = Seq(5), topKColumns = 3)

  test("grade maps credit [0,1] onto the study's 1-7 scale") {
    assert(UserProxy.grade(0.0) === 1.0)
    assert(UserProxy.grade(1.0) === 7.0)
    assert(UserProxy.grade(0.5) === 4.0)
  }

  test("planted insights reference only queries that exist") {
    val nums = queries.map(_.num).toSet
    UserProxy.planted.foreach(p => assert(nums.contains(p.queryNum), p.queryNum.toString))
  }

  test("EXPERT is an oracle except on join steps (the paper's blind spot)") {
    val qJoin   = queries.find(_.num == 1).get
    val qFilter = queries.find(_.num == 6).get
    val ins     = UserProxy.planted.head
    assert(UserProxy.credit("EXPERT", qJoin, ins, cfg) < 0.5)
    assert(UserProxy.credit("EXPERT", qFilter, ins, cfg) === 1.0)
  }

  test("FEDEX recovers the planted q6 insight (right column AND set)") {
    val q   = queries.find(_.num == 6).get
    val ins = UserProxy.planted.find(_.queryNum == 6).get
    assert(UserProxy.credit("FEDEX", q, ins, cfg) >= 0.5)
  }

  test("IO is capped at half credit (column only, never the rows)") {
    val q   = queries.find(_.num == 6).get
    val ins = UserProxy.planted.find(_.queryNum == 6).get
    assert(UserProxy.credit("IO", q, ins, cfg) <= 0.5)
  }

  test("SEEDB gets no credit on group-by queries (not applicable)") {
    val q   = queries.find(_.num == 21).get
    val ins = UserProxy.planted.find(_.queryNum == 21).get
    assert(UserProxy.credit("SEEDB", q, ins, cfg) === 0.0)
  }

  test("unknown methods are rejected") {
    val q   = queries.find(_.num == 6).get
    val ins = UserProxy.planted.head
    intercept[RuntimeException] { UserProxy.credit("NOPE", q, ins, cfg) }
  }

  test("unassistedHits is deterministic and bounded by the insight count") {
    val cols = Seq("a", "decade", "year", "b", "c")
    val ins  = UserProxy.planted.take(3)
    val h1   = UserProxy.unassistedHits(cols, ins, probes = 10, seed = 3)
    val h2   = UserProxy.unassistedHits(cols, ins, probes = 10, seed = 3)
    assert(h1 === h2)
    assert(h1 >= 0 && h1 <= ins.size)
  }

  test("unassistedHits grows with the probe budget") {
    val cols = ('a' to 'z').map(_.toString) ++ Seq("decade")
    val ins  = UserProxy.planted.take(5)
    val few  = UserProxy.unassistedHits(cols, ins, probes = 1, seed = 3)
    val many = UserProxy.unassistedHits(cols, ins, probes = 500, seed = 3)
    assert(many >= few)
  }
}
