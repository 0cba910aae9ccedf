package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec

class EquivalentClassSpec extends AnyFunSuite {

  test("classesLocal groups items by identical owner sets") {
    val owners = Map(0 -> Set(1), 1 -> Set(1, 2), 2 -> Set(1), 3 -> Set(2), 4 -> Set(1, 2))
    val cls = EquivalentClass.classesLocal(owners)
    assert(cls(Set(1)) == Vector(0, 2))
    assert(cls(Set(1, 2)) == Vector(1, 4))
    assert(cls(Set(2)) == Vector(3))
    assert(cls.size == 3)
  }

  test("classesLocal of empty ownership is empty") {
    assert(EquivalentClass.classesLocal(Map.empty).isEmpty)
  }

  test("classesLocal: every item appears in exactly one class") {
    val owners = (0 until 50).map(i => i -> Set(i % 3, i % 4)).toMap
    val cls = EquivalentClass.classesLocal(owners)
    val all = cls.values.flatten.toVector
    assert(all.sorted == (0 until 50).toVector)
  }
}

/** Spark path checked against the driver-side implementation. */
class EquivalentClassSparkSpec extends SparkSpec {

  test("classesSpark matches classesLocal on a random ownership relation") {
    import spark.implicits._
    val owners: Map[Int, Set[Int]] =
      (0 until 200).map(i => i -> Set(1 + i % 4, 1 + i % 5)).toMap
    val rows = owners.toSeq.flatMap { case (i, ts) => ts.map(t => (i.toLong, t.toLong)) }
    val df = rows.toDF("item", "tensorId")
    val got = EquivalentClass.classesSpark(spark, df).collect().map { r =>
      r.getString(0) -> r.getSeq[Long](1).map(_.toInt).toVector
    }.toMap
    val expected = EquivalentClass.classesLocal(owners).map { case (ts, items) =>
      ts.toVector.sorted.mkString(",") -> items
    }
    assert(got == expected)
  }

  test("classesSpark handles a single-tensor relation") {
    import spark.implicits._
    val df = Seq((1L, 9L), (2L, 9L)).toDF("item", "tensorId")
    val got = EquivalentClass.classesSpark(spark, df).collect()
    assert(got.length == 1)
    assert(got.head.getSeq[Long](1).toVector == Vector(1L, 2L))
  }
}
