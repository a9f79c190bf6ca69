package repro.lake

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class EntitiesSpec extends AnyFunSuite {
  import Entities._

  test("pools are deterministic in the seed") {
    val a = pool(DomainType.Person, 20, 1L)
    val b = pool(DomainType.Person, 20, 1L)
    val c = pool(DomainType.Person, 20, 2L)
    assert(a == b)
    assert(a != c)
  }

  test("pools contain distinct entities of the requested size") {
    DomainType.all.foreach { tpe =>
      val p = pool(tpe, 50, 7L)
      assert(p.size == 50, tpe.toString)
      assert(p.toSet.size == 50, tpe.toString)
    }
  }

  test("street entities look like addresses") {
    val p = pool(DomainType.Street, 20, 3L)
    p.foreach { s =>
      assert(s.matches("""\d+ (East|West|North|South) \d+(st|nd|rd|th) (Street|Avenue|Road|Boulevard), \d+[A-F]"""), s)
    }
  }

  test("company entities end with a corporate suffix") {
    val p = pool(DomainType.Company, 20, 4L)
    p.foreach { s =>
      assert(Seq("Incorporated", "Corporation", "Company", "Limited", "Group")
        .exists(s.endsWith), s)
    }
  }

  test("misspell changes at most a local neighborhood of the string") {
    val rng = new Random(5)
    (1 to 50).foreach { _ =>
      val s = "Castle Hill Apartments"
      val m = misspell(s, rng)
      assert(m != null && m.nonEmpty)
      assert(math.abs(m.length - s.length) <= 1)
    }
  }

  test("misspell leaves very short strings untouched") {
    val rng = new Random(6)
    assert(misspell("ab", rng) == "ab")
  }

  test("dirty produces a non-empty transformed string") {
    val rng = new Random(7)
    (1 to 100).foreach { _ =>
      val d = dirty("616 East 9th Street, 4W", rng)
      assert(d.nonEmpty)
    }
  }

  test("dirty abbreviation rewrites full forms") {
    val rng = new Random(8)
    // transform 1 is the abbreviation branch; run until we hit it
    val outs = (1 to 200).map(_ => dirty("100 East 1st Street, 2A", rng))
    assert(outs.exists(_.contains("St.")), "abbreviation branch never produced St.")
  }

  test("channel with noise=0 is the identity") {
    val rng = new Random(9)
    (1 to 20).foreach { _ =>
      assert(channel("Cozy Clean", 0.0, rng) == "Cozy Clean")
    }
  }

  test("channel with noise=1 always transforms") {
    val rng = new Random(10)
    val outs = (1 to 100).map(_ => channel("616 East 9th Street, 4W", 1.0, rng))
    // most outputs differ from the input (case-change may hit the same string rarely)
    assert(outs.count(_ != "616 East 9th Street, 4W") > 80)
  }

  test("channel noise controls the dirty fraction") {
    val rng = new Random(11)
    val outs = (1 to 1000).map(_ => channel("616 East 9th Street, 4W", 0.3, rng))
    val dirtyCount = outs.count(_ != "616 East 9th Street, 4W")
    assert(dirtyCount > 200 && dirtyCount < 400, s"dirty fraction $dirtyCount/1000")
  }
}
