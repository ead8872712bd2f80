package repro.deathstar

import repro.core.Json
import repro.core.Json._
import repro.faas.SimKV

/** The comparison implementation for the paper's LOC experiment (§4):
  * DeathStar's hotel service written the conventional microservice way —
  * the architecture of the original Go implementation. DeathStar splits the
  * hotel application into separate services (geo, rate, profile, user,
  * reservation, search, recommendation), each owning its data types, its
  * serialization code, its state-store access layer, and an RPC surface;
  * services call each other through typed client stubs that marshal
  * requests and responses.
  *
  * All of that is infrastructure a StateFlow program never writes, and it
  * is fenced with `// infra:begin` / `// infra:end` markers so [[Loc]] can
  * attribute lines — mirroring the paper's "around 30% of these LOC in Go
  * cover infrastructure code rather than business logic [...] switching
  * from database or serialization technique requires heavy refactoring".
  *
  * It is a *working* implementation (against [[SimKV]], with an in-process
  * RPC bus standing in for gRPC) and is behaviour-tested against the
  * StateFlow version — the LOC numbers compare two functioning ports of
  * the same service.
  */
object BaselineHotel {

  // infra:begin -- the RPC substrate: service registry, request dispatch,
  // envelope encode/decode. The Go original configures a gRPC server and
  // consul registry per service; this is the in-process equivalent.
  trait Rpc {
    def call(service: String, method: String, body: JObj): J
  }

  final class Bus extends Rpc {
    private var services = Map.empty[String, (String, JObj) => J]
    def register(name: String)(handler: (String, JObj) => J): Unit =
      services += (name -> handler)
    def call(service: String, method: String, body: JObj): J =
      services.getOrElse(service,
        throw new NoSuchElementException(s"no service $service"))(method, body)
  }

  private def jStr(j: J): String = j.asInstanceOf[JStr].v
  private def jInt(j: J): Long = j.asInstanceOf[JInt].v
  private def jArr(j: J): Vector[J] = j.asInstanceOf[JArr].items
  private def strArr(j: J): Vector[String] = jArr(j).map(jStr)
  private def toArr(xs: Seq[String]): J = JArr(xs.map(JStr.apply).toVector)
  // infra:end

  // ======================================================== geo service

  final class GeoService(kv: SimKV, bus: Bus) {
    // infra:begin -- geo's record type, JSON codec, and store accessors
    // (the Go service keeps points in MongoDB with its own bson mapping).
    final case class GeoData(hotels: Vector[String])
    private def key(region: String) = s"geo/$region"
    private def enc(g: GeoData): String =
      Json.render(JObj.of("hotels" -> toArr(g.hotels)))
    private def dec(s: String): GeoData =
      GeoData(strArr(Json.parse(s).asInstanceOf[JObj]("hotels")))
    private def load(region: String): GeoData =
      kv.get(key(region)).map(dec).getOrElse(GeoData(Vector.empty))
    private def store(region: String, g: GeoData): Unit = kv.put(key(region), enc(g))
    bus.register("geo") {
      case ("nearby", b) => toArr(nearby(jStr(b("region"))))
      case (m, _)        => throw new NoSuchElementException(s"geo.$m")
    }
    // infra:end

    def nearby(region: String): Vector[String] = load(region).hotels
    def addHotels(region: String, ids: Vector[String]): Unit =
      store(region, GeoData(load(region).hotels ++ ids))
  }

  // infra:begin -- geo client stub (generated from proto in the original).
  final class GeoClient(rpc: Rpc) {
    def nearby(region: String): Vector[String] =
      strArr(rpc.call("geo", "nearby", JObj.of("region" -> JStr(region))))
  }
  // infra:end

  // ======================================================= rate service

  final class RateService(kv: SimKV, bus: Bus) {
    // infra:begin -- rate's index type, codec, and store accessors.
    private def key(region: String) = s"rate/$region"
    private def enc(byRate: Vector[String]): String =
      Json.render(JObj.of("byRate" -> toArr(byRate)))
    private def dec(s: String): Vector[String] =
      strArr(Json.parse(s).asInstanceOf[JObj]("byRate"))
    private def load(region: String): Vector[String] =
      kv.get(key(region)).map(dec).getOrElse(Vector.empty)
    bus.register("rate") {
      case ("order_by_rate", b) => toArr(orderByRate(jStr(b("region")), strArr(b("hotels"))))
      case ("top_rated", b)     => toArr(topRated(jStr(b("region")), jInt(b("k")).toInt))
      case (m, _)               => throw new NoSuchElementException(s"rate.$m")
    }
    // infra:end

    def orderByRate(region: String, hotels: Vector[String]): Vector[String] =
      load(region).filter(hotels.contains)
    def topRated(region: String, k: Int): Vector[String] = load(region).take(k)
    def setIndex(region: String, byRate: Vector[String]): Unit =
      kv.put(key(region), enc(byRate))
  }

  // infra:begin -- rate client stub.
  final class RateClient(rpc: Rpc) {
    def orderByRate(region: String, hotels: Vector[String]): Vector[String] =
      strArr(rpc.call("rate", "order_by_rate",
        JObj.of("region" -> JStr(region), "hotels" -> toArr(hotels))))
    def topRated(region: String, k: Int): Vector[String] =
      strArr(rpc.call("rate", "top_rated",
        JObj.of("region" -> JStr(region), "k" -> JInt(k))))
  }
  // infra:end

  // ==================================================== profile service

  final class ProfileService(kv: SimKV, bus: Bus) {
    // infra:begin -- profile blob codec and store accessors.
    private def key(region: String) = s"profile/$region"
    private def enc(ps: Map[String, String]): String =
      Json.render(JObj(ps.toVector.sortBy(_._1).map { case (k, v) => k -> JStr(v) }))
    private def dec(s: String): Map[String, String] =
      Json.parse(s).asInstanceOf[JObj].fields.map { case (k, v) => k -> jStr(v) }.toMap
    private def load(region: String): Map[String, String] =
      kv.get(key(region)).map(dec).getOrElse(Map.empty)
    bus.register("profile") {
      case ("get_profiles", b) => toArr(getProfiles(jStr(b("region")), strArr(b("hotels"))))
      case (m, _)              => throw new NoSuchElementException(s"profile.$m")
    }
    // infra:end

    def getProfiles(region: String, hotels: Vector[String]): Vector[String] = {
      val ps = load(region)
      hotels.flatMap(ps.get)
    }
    def setProfiles(region: String, ps: Map[String, String]): Unit =
      kv.put(key(region), enc(ps))
  }

  // infra:begin -- profile client stub.
  final class ProfileClient(rpc: Rpc) {
    def getProfiles(region: String, hotels: Vector[String]): Vector[String] =
      strArr(rpc.call("profile", "get_profiles",
        JObj.of("region" -> JStr(region), "hotels" -> toArr(hotels))))
  }
  // infra:end

  // ====================================================== hotel service

  final class HotelService(kv: SimKV, bus: Bus) {
    // infra:begin -- hotel record, codec, store accessors.
    final case class Hotel(id: String, capacity: Long, reserved: Long,
                           rate: Double, price: Long, profile: String)
    private def key(id: String) = s"hotel/$id"
    private def enc(h: Hotel): String = Json.render(JObj.of(
      "id" -> JStr(h.id), "capacity" -> JInt(h.capacity), "reserved" -> JInt(h.reserved),
      "rate" -> JNum(h.rate), "price" -> JInt(h.price), "profile" -> JStr(h.profile)))
    private def dec(s: String): Hotel = {
      val o = Json.parse(s).asInstanceOf[JObj]
      Hotel(jStr(o("id")), jInt(o("capacity")), jInt(o("reserved")),
        o("rate") match { case JNum(d) => d; case JInt(i) => i.toDouble; case x => sys.error(s"$x") },
        jInt(o("price")), jStr(o("profile")))
    }
    def load(id: String): Hotel =
      kv.get(key(id)).map(dec).getOrElse(Hotel(id, 10, 0, 0.0, 100, ""))
    def store(h: Hotel): Unit = kv.put(key(h.id), enc(h))
    bus.register("hotel") {
      case ("available", b) => JBool(available(jStr(b("id"))))
      case ("reserve", b)   => JBool(reserve(jStr(b("id"))))
      case (m, _)           => throw new NoSuchElementException(s"hotel.$m")
    }
    // infra:end

    def available(id: String): Boolean = {
      val h = load(id)
      h.reserved < h.capacity
    }
    def reserve(id: String): Boolean = {
      val h = load(id)
      if (h.reserved >= h.capacity) false
      else { store(h.copy(reserved = h.reserved + 1)); true }
    }
  }

  // infra:begin -- hotel client stub.
  final class HotelClient(rpc: Rpc) {
    def available(id: String): Boolean =
      rpc.call("hotel", "available", JObj.of("id" -> JStr(id))).asInstanceOf[JBool].v
    def reserve(id: String): Boolean =
      rpc.call("hotel", "reserve", JObj.of("id" -> JStr(id))).asInstanceOf[JBool].v
  }
  // infra:end

  // ======================================================= user service

  final class UserService(kv: SimKV, bus: Bus) {
    // infra:begin -- user record, codec, store accessors.
    final case class User(password: String, reservations: Vector[String])
    private def key(u: String) = s"user/$u"
    private def enc(u: User): String = Json.render(JObj.of(
      "password" -> JStr(u.password), "reservations" -> toArr(u.reservations)))
    private def dec(s: String): User = {
      val o = Json.parse(s).asInstanceOf[JObj]
      User(jStr(o("password")), strArr(o("reservations")))
    }
    def load(u: String): User = kv.get(key(u)).map(dec).getOrElse(User("", Vector.empty))
    def store(name: String, u: User): Unit = kv.put(key(name), enc(u))
    bus.register("user") {
      case ("login", b)           => JBool(login(jStr(b("user")), jStr(b("password"))))
      case ("add_reservation", b) => JBool(addReservation(jStr(b("user")), jStr(b("hotel"))))
      case (m, _)                 => throw new NoSuchElementException(s"user.$m")
    }
    // infra:end

    def login(user: String, password: String): Boolean =
      load(user).password == password
    def addReservation(user: String, hotel: String): Boolean = {
      val u = load(user)
      store(user, u.copy(reservations = u.reservations :+ hotel))
      true
    }
  }

  // infra:begin -- user client stub.
  final class UserClient(rpc: Rpc) {
    def login(user: String, password: String): Boolean =
      rpc.call("user", "login",
        JObj.of("user" -> JStr(user), "password" -> JStr(password))).asInstanceOf[JBool].v
    def addReservation(user: String, hotel: String): Boolean =
      rpc.call("user", "add_reservation",
        JObj.of("user" -> JStr(user), "hotel" -> JStr(hotel))).asInstanceOf[JBool].v
  }
  // infra:end

  // ================================================ search orchestrator

  final class SearchService(rpc: Rpc, bus: Bus) {
    private val geo = new GeoClient(rpc)
    private val rate = new RateClient(rpc)
    private val hotel = new HotelClient(rpc)
    private val profile = new ProfileClient(rpc)
    // infra:begin -- search RPC surface.
    bus.register("search") {
      case ("search", b) => toArr(search(jStr(b("region")), jInt(b("in")), jInt(b("out"))))
      case (m, _)        => throw new NoSuchElementException(s"search.$m")
    }
    // infra:end

    def search(region: String, inDate: Long, outDate: Long): Vector[String] = {
      val nearby = geo.nearby(region)
      val ranked = rate.orderByRate(region, nearby)
      val top = ranked.take(5)
      val avail = top.filter(hotel.available)
      profile.getProfiles(region, avail)
    }
  }

  // ======================================== recommendation orchestrator

  final class RecommendationService(rpc: Rpc, bus: Bus) {
    private val rate = new RateClient(rpc)
    private val profile = new ProfileClient(rpc)
    // infra:begin -- recommendation RPC surface.
    bus.register("recommendation") {
      case ("recommend", b) => toArr(recommend(jStr(b("region")), jInt(b("k")).toInt))
      case (m, _)           => throw new NoSuchElementException(s"recommendation.$m")
    }
    // infra:end

    def recommend(region: String, k: Int): Vector[String] =
      profile.getProfiles(region, rate.topRated(region, k))
  }

  // =========================================== reservation orchestrator

  final class ReservationService(rpc: Rpc, bus: Bus) {
    private val hotel = new HotelClient(rpc)
    private val user = new UserClient(rpc)
    // infra:begin -- reservation RPC surface.
    bus.register("reservation") {
      case ("reserve", b) => JBool(reserve(jStr(b("region")), jStr(b("user")), jStr(b("hotel"))))
      case (m, _)         => throw new NoSuchElementException(s"reservation.$m")
    }
    // infra:end

    def reserve(region: String, username: String, hotelId: String): Boolean = {
      val ok = hotel.reserve(hotelId)
      if (ok) user.addReservation(username, hotelId)
      ok
    }
  }
}

/** The assembled baseline cluster + HTTP-style frontend. */
final class BaselineHotel(kv: SimKV) {
  import BaselineHotel._

  // infra:begin -- cluster wiring and the HTTP frontend's request routing
  // (the Go original's main() per service plus the frontend mux).
  private val bus = new Bus
  private val geoSvc = new GeoService(kv, bus)
  private val rateSvc = new RateService(kv, bus)
  private val profileSvc = new ProfileService(kv, bus)
  private val hotelSvc = new HotelService(kv, bus)
  private val userSvc = new UserService(kv, bus)
  new SearchService(bus, bus)
  new RecommendationService(bus, bus)
  new ReservationService(bus, bus)

  def handle(request: String): String = {
    val o = Json.parse(request).asInstanceOf[JObj]
    def s(k: String) = o(k).asInstanceOf[JStr].v
    def i(k: String) = o(k).asInstanceOf[JInt].v
    val body: J = s("endpoint") match {
      case "login"     => bus.call("user", "login", JObj.of(
        "user" -> JStr(s("user")), "password" -> JStr(s("password"))))
      case "search"    => bus.call("search", "search", JObj.of(
        "region" -> JStr(s("region")), "in" -> JInt(i("in")), "out" -> JInt(i("out"))))
      case "recommend" => bus.call("recommendation", "recommend", JObj.of(
        "region" -> JStr(s("region")), "k" -> JInt(i("k"))))
      case "reserve"   => bus.call("reservation", "reserve", JObj.of(
        "region" -> JStr(s("region")), "user" -> JStr(s("user")), "hotel" -> JStr(s("hotel"))))
      case other       => JObj.of("error" -> JStr(s"unknown endpoint $other"))
    }
    Json.render(JObj.of("status" -> JStr("ok"), "result" -> body))
  }
  // infra:end

  def login(username: String, password: String): Boolean = userSvc.login(username, password)
  def search(region: String, inDate: Long, outDate: Long): Vector[String] =
    new SearchService(bus, new Bus).search(region, inDate, outDate)
  def recommend(region: String, k: Int): Vector[String] =
    new RecommendationService(bus, new Bus).recommend(region, k)
  def reserve(region: String, username: String, hotelId: String,
              inDate: Long, outDate: Long): Boolean =
    new ReservationService(bus, new Bus).reserve(region, username, hotelId)

  def seed(nRegions: Int, hotelsPerRegion: Int, nUsers: Int, capacity: Int = 10): Unit = {
    for (r <- 0 until nRegions) {
      val ids = (0 until hotelsPerRegion).map(i => s"h-$r-$i").toVector
      ids.zipWithIndex.foreach { case (id, i) =>
        hotelSvc.store(hotelSvc.Hotel(id, capacity, 0, 5.0 - (i % 50) * 0.1,
          80 + 7 * i % 200, s"profile-of-$id"))
      }
      val byRate = ids.sortBy(id => -(5.0 - (id.split("-")(2).toInt % 50) * 0.1))
      geoSvc.addHotels(s"reg-$r", ids)
      rateSvc.setIndex(s"reg-$r", byRate)
      profileSvc.setProfiles(s"reg-$r", ids.map(id => id -> s"profile-of-$id").toMap)
    }
    for (u <- 0 until nUsers)
      userSvc.store(s"u-$u", userSvc.User(s"pw-$u", Vector.empty))
  }
}
