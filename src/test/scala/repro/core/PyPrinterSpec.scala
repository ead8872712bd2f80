package repro.core

import repro.SparkSpec
import repro.deathstar.HotelApp
import repro.examples.Shop

/** The unparser back to the paper's input language (annotated Python). */
class PyPrinterSpec extends SparkSpec {

  private lazy val shopSrc = PyPrinter.render(Shop.program)

  test("classes render with @stateflow, __init__ and __key__ (Listing 1 shape)") {
    assert(shopSrc.contains("@stateflow"))
    assert(shopSrc.contains("class User:"))
    assert(shopSrc.contains("def __key__(self):"))
    assert(shopSrc.contains("return self.userid"))
    assert(shopSrc.contains("self.balance: int = 1000"))
  }

  test("methods carry full type annotations (the static pass requires them)") {
    assert(shopSrc.contains("def add_to_basket(self, items: List[Item]) -> bool:"))
    assert(shopSrc.contains("def remove_stock(self, amount: int) -> bool:"))
  }

  test("remote calls render as method calls on entity references") {
    assert(shopSrc.contains("item.enough_stock()"))
    assert(shopSrc.contains("item.remove_stock(amount)"))
  }

  test("control flow renders with python indentation") {
    assert(shopSrc.contains("for item in items:"))
    assert(shopSrc.contains("if self.balance < total_price:"))
    assert(shopSrc.contains("        return False") || shopSrc.contains("return False"))
  }

  test("entity-reference construction renders as indexing") {
    val hotelSrc = PyPrinter.render(HotelApp.program)
    assert(hotelSrc.contains("Geo[self.region]"))
    assert(hotelSrc.contains("Profile[self.region]"))
  }

  test("values render pythonically") {
    import Value._
    assert(PyPrinter.value(bool(true)) == "True")
    assert(PyPrinter.value(VUnit) == "None")
    assert(PyPrinter.value(str("a\"b")) == "\"a\\\"b\"")
    assert(PyPrinter.value(list(EType.TInt, int(1), int(2))) == "[1, 2]")
  }

  test("LOC metric counts non-blank lines and is deterministic") {
    val n1 = PyPrinter.locOf(HotelApp.program)
    val n2 = PyPrinter.locOf(HotelApp.program)
    assert(n1 == n2)
    assert(n1 > 80 && n1 < 250, s"hotel app renders to $n1 python LOC")
  }

  test("rendering is total over every construct in both example programs") {
    // Just exercising render on all classes must not throw.
    assert(PyPrinter.render(Shop.program).nonEmpty)
    assert(PyPrinter.render(HotelApp.program).nonEmpty)
  }
}
