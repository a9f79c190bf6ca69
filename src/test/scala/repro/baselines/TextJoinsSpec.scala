package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.TextJoins._

class TextJoinsSpec extends AnyFunSuite {

  test("editDistance basics") {
    assert(editDistance("", "") == 0)
    assert(editDistance("abc", "abc") == 0)
    assert(editDistance("abc", "") == 3)
    assert(editDistance("", "abc") == 3)
    assert(editDistance("kitten", "sitting") == 3)
    assert(editDistance("street", "st") == 4)
  }

  test("editDistance is symmetric and satisfies triangle inequality") {
    val ws = Seq("tom", "tomy", "tyke", "jerry", "jerr", "")
    for (a <- ws; b <- ws) assert(editDistance(a, b) == editDistance(b, a))
    for (a <- ws; b <- ws; c <- ws)
      assert(editDistance(a, c) <= editDistance(a, b) + editDistance(b, c))
  }

  test("editSimilarity in [0,1], 1 iff equal") {
    assert(editSimilarity("tom", "tom") == 1.0)
    assert(editSimilarity("tom", "tim") == 1.0 - 1.0 / 3)
    assert(editSimilarity("", "") == 1.0)
    assert(editSimilarity("abc", "xyz") == 0.0)
  }

  test("tokens lowercases and splits") {
    assert(tokens("616 East 9th St.") == Set("616", "east", "9th", "st"))
    assert(tokens("") == Set.empty)
  }

  test("jaccard basics") {
    assert(jaccard("a b c", "a b c") == 1.0)
    assert(jaccard("a b", "b c") == 1.0 / 3)
    assert(jaccard("a", "b") == 0.0)
    assert(jaccard("", "") == 1.0)
  }

  test("jaccard ignores word order") {
    assert(jaccard("cozy clean", "clean cozy") == 1.0)
  }

  test("fuzzyJaccard tolerates token-level misspellings") {
    // "streeet" ~ "street" at edit sim 6/7 >= 0.8
    assert(fuzzyJaccard("616 east streeet", "616 east street") == 1.0)
    // plain jaccard does not
    assert(jaccard("616 east streeet", "616 east street") < 1.0)
  }

  test("fuzzyJaccard bounded by 1 and 0 for disjoint") {
    assert(fuzzyJaccard("aaa bbb", "xxxxx yyyyy") == 0.0)
    assert(fuzzyJaccard("a b", "") == 0.0)
    assert(fuzzyJaccard("", "") == 1.0)
  }

  test("equi joinability counts exactly-matching query values") {
    val q = Seq("Tom", "Jerry", "Tyke", "Spike")
    val s = Seq("Tom", "Tyke", "Butch")
    assert(equiJoinability(q, s) == 0.5)
  }

  test("equi joinability trims whitespace") {
    assert(equiJoinability(Seq(" Tom "), Seq("Tom")) == 1.0)
  }

  test("jaccard joinability with threshold") {
    val q = Seq("cozy clean flat", "central manhattan")
    val s = Seq("clean cozy flat", "west village")
    assert(jaccardJoinability(q, s, 0.9) == 0.5)
    assert(jaccardJoinability(q, s, 0.1) == 0.5)
  }

  test("fuzzy joinability exceeds jaccard joinability on misspelled data") {
    val q = Seq("616 east 9th street", "414 east 10th street")
    val s = Seq("616 east 9th streeet", "414 esat 10th street")
    val fj = fuzzyJoinability(q, s, theta = 0.8)
    val jj = jaccardJoinability(q, s, theta = 0.8)
    assert(fj > jj, s"fuzzy=$fj jaccard=$jj")
  }

  test("search returns columns whose joinability reaches T") {
    val cols = Seq(
      StringColumn(0, "a", IndexedSeq("tom", "jerry", "tyke")),
      StringColumn(1, "b", IndexedSeq("tom", "butch", "quacker")),
      StringColumn(2, "c", IndexedSeq("nothing", "here", "else")),
    )
    val q = Seq("tom", "jerry", "spike")
    assert(search(cols, q, 0.6, Method.Equi) == Set(0))
    assert(search(cols, q, 0.3, Method.Equi) == Set(0, 1))
    assert(search(cols, q, 0.9, Method.Equi) == Set.empty)
  }

  test("search with Jaccard and Fuzzy methods") {
    val cols = Seq(
      StringColumn(0, "a", IndexedSeq("toom cat", "jerry mouse")),
      StringColumn(1, "b", IndexedSeq("unrelated words", "entirely different")),
    )
    val q = Seq("tom cat", "jerry mouse")
    // "tom" vs "toom" has edit similarity 0.75, so delta must be <= 0.75
    assert(search(cols, q, 0.9, Method.Fuzzy(0.5, delta = 0.7)) == Set(0))
    assert(search(cols, q, 0.9, Method.Fuzzy(0.5, delta = 0.8)) == Set.empty)
    // jaccard("tom cat","toom cat") = 1/3, so theta must be <= 1/3
    assert(search(cols, q, 0.9, Method.Jaccard(0.3)) == Set(0))
    assert(search(cols, q, 0.9, Method.Jaccard(0.4)) == Set.empty)
    assert(search(cols, q, 0.9, Method.Jaccard(0.9)) == Set.empty)
  }

  test("empty query yields zero joinability") {
    assert(equiJoinability(Seq.empty, Seq("x")) == 0.0)
    assert(jaccardJoinability(Seq.empty, Seq("x"), 0.5) == 0.0)
  }
}
