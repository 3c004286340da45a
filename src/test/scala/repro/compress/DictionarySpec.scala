package repro.compress

import repro.SparkSpec

class DictionarySpec extends SparkSpec {

  private val dict = Dictionary(Seq("cherry", "apple", "banana", "apple", "apricot"))

  test("codes are dense, sorted, and round-trip") {
    assert(dict.size == 4)
    assert(dict.words.toSeq == Seq("apple", "apricot", "banana", "cherry"))
    (0 until dict.size).foreach(c => assert(dict.encode(dict.decode(c)) == c))
  }

  test("encodeOpt on unknown word") {
    assert(dict.encodeOpt("durian").isEmpty)
    assert(dict.encodeOpt("apple").contains(0))
  }

  test("codesWhere supports contains/startsWith/order predicates") {
    assert(dict.codesWhere(_.contains("ap")) == Set(0L, 1L))
    assert(dict.codesWhere(_.startsWith("b")) == Set(2L))
    // Sorted dictionary => lexicographic order == code order.
    assert(dict.codesWhere(_ > "banana") == Set(3L))
  }

  test("codeWidth reflects domain size") {
    assert(dict.codeWidth == 1)
    val big = Dictionary.fromValues((0 until 300).map(i => s"w$i").iterator)
    assert(big.codeWidth == 2)
  }

  test("fromValues skips nulls") {
    val d = Dictionary.fromValues(Iterator("a", null, "b", null))
    assert(d.size == 2)
  }

  test("sorted dictionary makes code comparisons order-preserving") {
    val words = (0 until 50).map(i => f"v$i%02d")
    val d = Dictionary(scala.util.Random.shuffle(words))
    words.sliding(2).foreach { case Seq(a, b) => assert(d.encode(a) < d.encode(b)) }
  }
}
