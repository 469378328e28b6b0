"""Explicit (non-StateFlow) hotel service — the "original DeathStar
implementation" substitute for the abstraction/LOC experiment (T5).

The paper reports the original Go implementation at ±500 LOC with ~30%
infrastructure code (serialization, data access, routing, metrics) that
needs heavy refactoring when the database or serialization technique
changes. This module is the equivalent in Python: the same hotel
service written *directly* against the external KV store with explicit
per-entity codecs, a data-access layer, an endpoint router and metrics
— everything StateFlow generates or outsources to the runtime.

Sections are fenced with ``# === infrastructure: ... ===`` /
``# === business logic ===`` markers; the LOC bench (``repro.bench.loc``)
classifies lines by those fences.

It is also an *independent semantic oracle*: tests run identical request
streams against this service and against compiled StateFlow runtimes
and require identical responses and final states.
"""
from __future__ import annotations

import json
import time
from typing import Any, Dict, List, Optional, Tuple

from repro.runtimes.kvstore import KVStore

# === infrastructure: serialization ===================================
# Hand-written codec per entity type. Adding a field, changing the
# store, or switching to another wire format means touching every codec
# below — the refactoring cost the paper attributes to infra code.


class CodecError(Exception):
    pass


class UserCodec:
    KIND = "user"

    @staticmethod
    def encode(rec: Dict[str, Any]) -> str:
        if "username" not in rec or "password" not in rec:
            raise CodecError("user record missing required fields")
        return json.dumps(
            {
                "username": rec["username"],
                "password": rec["password"],
                "reservations": rec.get("reservations", []),
            }
        )

    @staticmethod
    def decode(raw: str) -> Dict[str, Any]:
        obj = json.loads(raw)
        if "username" not in obj:
            raise CodecError("corrupt user record")
        obj.setdefault("reservations", [])
        return obj


class HotelCodec:
    KIND = "hotel"
    FIELDS = (
        "hotel_id",
        "lat",
        "lon",
        "rate",
        "price",
        "capacity",
        "name",
        "phone",
        "bookings",
    )

    @staticmethod
    def encode(rec: Dict[str, Any]) -> str:
        missing = [f for f in HotelCodec.FIELDS if f not in rec]
        if missing:
            raise CodecError(f"hotel record missing {missing}")
        return json.dumps({f: rec[f] for f in HotelCodec.FIELDS})

    @staticmethod
    def decode(raw: str) -> Dict[str, Any]:
        obj = json.loads(raw)
        for f in HotelCodec.FIELDS:
            if f not in obj:
                raise CodecError(f"corrupt hotel record: missing {f}")
        return obj


class RegionIndexCodec:
    """Per-region service records: geo points, rates, profiles."""

    KIND = "region"

    @staticmethod
    def encode(rec: Dict[str, Any]) -> str:
        if "region" not in rec:
            raise CodecError("region record missing region id")
        return json.dumps(
            {
                "region": rec["region"],
                "locations": rec.get("locations", {}),
                "rates": rec.get("rates", {}),
                "profiles": rec.get("profiles", {}),
                "reservation_count": rec.get("reservation_count", 0),
            }
        )

    @staticmethod
    def decode(raw: str) -> Dict[str, Any]:
        obj = json.loads(raw)
        if "region" not in obj:
            raise CodecError("corrupt region record")
        obj.setdefault("locations", {})
        obj.setdefault("rates", {})
        obj.setdefault("profiles", {})
        obj.setdefault("reservation_count", 0)
        return obj


# === infrastructure: data access =====================================
# Explicit table abstraction over the KV store, with key namespacing,
# existence checks and a retry wrapper (the kind of plumbing DynamoDB
# clients accumulate).


class NotFound(Exception):
    pass


class Table:
    def __init__(self, store: KVStore, kind: str, codec) -> None:
        self.store = store
        self.kind = kind
        self.codec = codec

    def _namespaced(self, key: str) -> str:
        return f"baseline/{self.kind}/{key}"

    def load(self, key: str) -> Dict[str, Any]:
        raw = self._with_retry(
            lambda: self.store.get(self.kind, self._namespaced(key))
        )
        if raw is None:
            raise NotFound(f"{self.kind}/{key}")
        return self.codec.decode(raw)

    def save(self, key: str, rec: Dict[str, Any]) -> None:
        raw = self.codec.encode(rec)
        self._with_retry(
            lambda: self.store.put(self.kind, self._namespaced(key), raw)
        )

    def exists(self, key: str) -> bool:
        return (
            self._with_retry(
                lambda: self.store.get(self.kind, self._namespaced(key))
            )
            is not None
        )

    @staticmethod
    def _with_retry(op, attempts: int = 3, backoff_s: float = 0.01):
        last: Optional[Exception] = None
        for i in range(attempts):
            try:
                return op()
            except Exception as e:  # noqa: BLE001 - retry any store error
                last = e
                time.sleep(backoff_s * (2**i))
        raise last


# === infrastructure: routing & metrics ===============================
# Endpoint dispatch table plus request counters/latency accumulators —
# in the Go original this is HTTP handler wiring and tracing hooks.


class Metrics:
    def __init__(self) -> None:
        self.requests: Dict[str, int] = {}
        self.errors: Dict[str, int] = {}
        self.latency_ms: Dict[str, float] = {}

    def observe(self, endpoint: str, ms: float, ok: bool) -> None:
        self.requests[endpoint] = self.requests.get(endpoint, 0) + 1
        self.latency_ms[endpoint] = self.latency_ms.get(endpoint, 0.0) + ms
        if not ok:
            self.errors[endpoint] = self.errors.get(endpoint, 0) + 1


class Router:
    def __init__(self, service: "BaselineHotelService") -> None:
        self._routes = {
            "login": service.login,
            "search": service.search,
            "recommend": service.recommend,
            "reserve": service.reserve,
        }
        self._metrics = service.metrics

    def dispatch(self, endpoint: str, *args: Any) -> Any:
        handler = self._routes.get(endpoint)
        if handler is None:
            raise KeyError(f"no route for endpoint {endpoint!r}")
        t0 = time.perf_counter()
        ok = True
        try:
            return handler(*args)
        except Exception:
            ok = False
            raise
        finally:
            self._metrics.observe(
                endpoint, (time.perf_counter() - t0) * 1000.0, ok
            )


# === business logic ==================================================
# The actual hotel service. Semantically identical to
# repro.deathstar.entities; tests enforce the equivalence. The explicit
# request-validation and response-assembly code mirrors the Go
# original's handler bodies (parameter checking, DTO building, error
# paths) which StateFlow programs simply do not need to write.


class BadRequest(Exception):
    pass


def _require_str(value: Any, name: str) -> str:
    if not isinstance(value, str) or not value:
        raise BadRequest(f"parameter '{name}' must be a non-empty string")
    return value


def _require_float(value: Any, name: str) -> float:
    if isinstance(value, bool) or not isinstance(value, (int, float)):
        raise BadRequest(f"parameter '{name}' must be a number")
    return float(value)


def _require_day(value: Any, name: str) -> int:
    if isinstance(value, bool) or not isinstance(value, int):
        raise BadRequest(f"parameter '{name}' must be an integer day index")
    if value < 0 or value > 365:
        raise BadRequest(f"parameter '{name}' out of range: {value}")
    return value


def _require_window(in_day: Any, out_day: Any) -> Tuple[int, int]:
    lo = _require_day(in_day, "in_day")
    hi = _require_day(out_day, "out_day")
    if hi <= lo:
        raise BadRequest(f"empty stay window: [{lo}, {hi})")
    return lo, hi


def _profile_dto(profile: Dict[str, Any]) -> Dict[str, Any]:
    dto = {
        "hotel_id": profile.get("hotel_id"),
        "name": profile.get("name"),
        "phone": profile.get("phone"),
        "price": profile.get("price"),
    }
    if dto["hotel_id"] is None:
        raise CodecError("profile record without hotel_id")
    return dto


class BaselineHotelService:
    def __init__(self, store: Optional[KVStore] = None) -> None:
        self.store = store or KVStore()
        self.users = Table(self.store, UserCodec.KIND, UserCodec)
        self.hotels = Table(self.store, HotelCodec.KIND, HotelCodec)
        self.regions = Table(self.store, RegionIndexCodec.KIND, RegionIndexCodec)
        self.metrics = Metrics()
        self.router = Router(self)

    # -- bootstrap --

    def register_user(self, username: str, password: str) -> None:
        self.users.save(
            username,
            {"username": username, "password": password, "reservations": []},
        )

    def register_hotel(self, rec: Dict[str, Any]) -> None:
        rec = dict(rec)
        rec.setdefault("bookings", {})
        self.hotels.save(rec["hotel_id"], rec)
        region = rec["region"] if "region" in rec else None
        if region is None:
            raise ValueError("hotel record must carry its region")
        try:
            idx = self.regions.load(region)
        except NotFound:
            idx = RegionIndexCodec.decode(
                RegionIndexCodec.encode({"region": region})
            )
        idx["locations"][rec["hotel_id"]] = [rec["lat"], rec["lon"]]
        idx["rates"][rec["hotel_id"]] = rec["rate"]
        idx["profiles"][rec["hotel_id"]] = {
            "hotel_id": rec["hotel_id"],
            "name": rec["name"],
            "phone": rec["phone"],
            "price": rec["price"],
        }
        self.regions.save(region, idx)

    # -- endpoints --

    def login(self, username: str, password: str) -> bool:
        username = _require_str(username, "username")
        password = _require_str(password, "password")
        user = self.users.load(username)
        return user["password"] == password

    def _nearby(self, idx: Dict[str, Any], lat: float, lon: float, k: int) -> List[str]:
        dists: List[Tuple[float, str]] = []
        for hid in sorted(idx["locations"]):
            loc = idx["locations"][hid]
            d = (loc[0] - lat) ** 2 + (loc[1] - lon) ** 2
            dists.append((d, hid))
        dists.sort()
        return [hid for _, hid in dists[:k]]

    def _check_availability(
        self, hotel: Dict[str, Any], in_day: int, out_day: int
    ) -> bool:
        day = in_day
        while day < out_day:
            if hotel["bookings"].get(str(day), 0) >= hotel["capacity"]:
                return False
            day += 1
        return True

    def search(
        self, region: str, lat: float, lon: float, in_day: int, out_day: int
    ) -> List[Dict[str, Any]]:
        region = _require_str(region, "region")
        lat = _require_float(lat, "lat")
        lon = _require_float(lon, "lon")
        in_day, out_day = _require_window(in_day, out_day)
        idx = self.regions.load(region)
        nearby_ids = self._nearby(idx, lat, lon, 5)
        _rates = [idx["rates"].get(h, 0.0) for h in nearby_ids]
        available: List[str] = []
        for hid in nearby_ids:
            hotel = self.hotels.load(hid)
            if self._check_availability(hotel, in_day, out_day):
                available.append(hid)
        results: List[Dict[str, Any]] = []
        for hid in available:
            if hid not in idx["profiles"]:
                continue
            results.append(_profile_dto(idx["profiles"][hid]))
        return results

    def recommend(
        self, region: str, require: str, lat: float, lon: float
    ) -> List[Dict[str, Any]]:
        region = _require_str(region, "region")
        require = _require_str(require, "require")
        if require not in ("dist", "rate", "price"):
            raise BadRequest(f"unknown recommendation criterion {require!r}")
        lat = _require_float(lat, "lat")
        lon = _require_float(lon, "lon")
        idx = self.regions.load(region)
        if require == "dist":
            ids = self._nearby(idx, lat, lon, 5)
        else:
            pairs = sorted(
                idx["rates"].items(), key=lambda kv: (-kv[1], kv[0])
            )
            ids = [hid for hid, _ in pairs[:5]]
        results: List[Dict[str, Any]] = []
        for hid in ids:
            if hid not in idx["profiles"]:
                continue
            results.append(_profile_dto(idx["profiles"][hid]))
        return results

    def reserve(
        self,
        region: str,
        username: str,
        hotel_id: str,
        in_day: int,
        out_day: int,
    ) -> bool:
        region = _require_str(region, "region")
        username = _require_str(username, "username")
        hotel_id = _require_str(hotel_id, "hotel_id")
        in_day, out_day = _require_window(in_day, out_day)
        if not self.users.exists(username):
            raise NotFound(f"user/{username}")
        hotel = self.hotels.load(hotel_id)
        if not self._check_availability(hotel, in_day, out_day):
            return False
        day = in_day
        while day < out_day:
            hotel["bookings"][str(day)] = (
                hotel["bookings"].get(str(day), 0) + 1
            )
            day += 1
        self.hotels.save(hotel_id, hotel)
        user = self.users.load(username)
        user["reservations"] = user["reservations"] + [
            [hotel_id, in_day, out_day]
        ]
        self.users.save(username, user)
        idx = self.regions.load(region)
        idx["reservation_count"] += 1
        self.regions.save(region, idx)
        return True

    def close(self) -> None:
        self.store.close()
