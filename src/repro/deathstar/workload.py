"""DeathStar hotel workload (paper §4 "Setup" / "Throughput").

Synthetic substitute for the DeathStarBench workload generator
(DESIGN.md substitutions): a seeded dataset of hotels/users plus seeded
request streams with the paper's endpoint mix — *search 60%, recommend
39%, login 0.5%, reserve 0.5%*. Hotel/user selection supports uniform
or zipfian skew (reusing the same zipf construction as
``repro.synth_data.zipf_keys``).

``seed_rows`` produces direct-state rows for ``Runtime.seed_many``
(fast bootstrap); ``create_calls`` produces ``__init__`` invocations for
bootstrapping through the event bus (exercised in tests).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Dict, List, Optional, Tuple

import numpy as np

from repro.core.entities import Ref

#: the paper's endpoint mix for the throughput experiment
PAPER_MIX = {"search": 0.60, "recommend": 0.39, "login": 0.005, "reserve": 0.005}

#: search window used when generating requests
N_DAYS = 30


@dataclass
class HotelRecord:
    hotel_id: str
    region: str
    lat: float
    lon: float
    rate: float
    price: float
    capacity: int
    name: str
    phone: str


@dataclass
class Dataset:
    hotels: List[HotelRecord]
    users: List[Tuple[str, str]]  # (username, password)
    regions: List[str]

    def hotels_in(self, region: str) -> List[HotelRecord]:
        return [h for h in self.hotels if h.region == region]


def generate_dataset(
    *,
    n_hotels: int = 80,
    n_users: int = 100,
    n_regions: int = 4,
    capacity: int = 10,
    seed: int = 7,
) -> Dataset:
    g = np.random.default_rng(seed)
    regions = [f"region-{r}" for r in range(n_regions)]
    hotels = [
        HotelRecord(
            hotel_id=f"hotel-{i}",
            region=regions[i % n_regions],
            lat=float(g.uniform(-90, 90)),
            lon=float(g.uniform(-180, 180)),
            rate=float(np.round(g.uniform(1.0, 5.0), 2)),
            price=float(np.round(g.uniform(50, 500), 2)),
            capacity=capacity,
            name=f"Hotel {i}",
            phone=f"+1-555-{i:04d}",
        )
        for i in range(n_hotels)
    ]
    users = [(f"user-{i}", f"pass-{i}") for i in range(n_users)]
    return Dataset(hotels=hotels, users=users, regions=regions)


# -- state bootstrap ----------------------------------------------------


def seed_rows(ds: Dataset) -> List[Tuple[str, str, Dict[str, Any]]]:
    """(class_name, key, state) rows for Runtime.seed_many."""
    rows: List[Tuple[str, str, Dict[str, Any]]] = []
    for u, p in ds.users:
        rows.append(("User", u, {"username": u, "password": p, "reservations": []}))
    for h in ds.hotels:
        rows.append(
            (
                "Hotel",
                h.hotel_id,
                {
                    "hotel_id": h.hotel_id,
                    "lat": h.lat,
                    "lon": h.lon,
                    "rate": h.rate,
                    "price": h.price,
                    "capacity": h.capacity,
                    "name": h.name,
                    "phone": h.phone,
                    "bookings": {},
                },
            )
        )
    for region in ds.regions:
        hs = ds.hotels_in(region)
        locations = {h.hotel_id: [h.lat, h.lon] for h in hs}
        rates = {h.hotel_id: h.rate for h in hs}
        profiles = {
            h.hotel_id: {
                "hotel_id": h.hotel_id,
                "name": h.name,
                "phone": h.phone,
                "price": h.price,
            }
            for h in hs
        }
        refs = {h.hotel_id: Ref("Hotel", h.hotel_id) for h in hs}
        rows.append(("Geo", region, {"region": region, "locations": locations}))
        rows.append(("Rate", region, {"region": region, "rates": rates}))
        rows.append(
            ("Profile", region, {"region": region, "profiles": profiles})
        )
        rows.append(
            (
                "Search",
                region,
                {
                    "region": region,
                    "geo": Ref("Geo", region),
                    "rate": Ref("Rate", region),
                    "profile": Ref("Profile", region),
                    "hotels": refs,
                },
            )
        )
        rows.append(
            (
                "Recommend",
                region,
                {
                    "region": region,
                    "geo": Ref("Geo", region),
                    "rate": Ref("Rate", region),
                    "profile": Ref("Profile", region),
                },
            )
        )
        rows.append(("Reservation", region, {"region": region, "count": 0}))
    return rows


def create_calls(ds: Dataset) -> List[Tuple[str, str, List[Any]]]:
    """(class_name, key, __init__ args) — bootstrap through the bus."""
    calls: List[Tuple[str, str, List[Any]]] = []
    for u, p in ds.users:
        calls.append(("User", u, [u, p]))
    for h in ds.hotels:
        calls.append(
            (
                "Hotel",
                h.hotel_id,
                [h.hotel_id, h.lat, h.lon, h.rate, h.price, h.capacity,
                 h.name, h.phone],
            )
        )
    for region in ds.regions:
        hs = ds.hotels_in(region)
        locations = {h.hotel_id: [h.lat, h.lon] for h in hs}
        rates = {h.hotel_id: h.rate for h in hs}
        profiles = {
            h.hotel_id: {
                "hotel_id": h.hotel_id,
                "name": h.name,
                "phone": h.phone,
                "price": h.price,
            }
            for h in hs
        }
        refs = {h.hotel_id: Ref("Hotel", h.hotel_id) for h in hs}
        g, r, pr = Ref("Geo", region), Ref("Rate", region), Ref("Profile", region)
        calls.append(("Geo", region, [region, locations]))
        calls.append(("Rate", region, [region, rates]))
        calls.append(("Profile", region, [region, profiles]))
        calls.append(("Search", region, [region, g, r, pr, refs]))
        calls.append(("Recommend", region, [region, g, r, pr]))
        calls.append(("Reservation", region, [region]))
    return calls


# -- request stream -----------------------------------------------------


@dataclass
class Request:
    endpoint: str  # login | search | recommend | reserve
    class_name: str
    key: str
    method: str
    args: List[Any]


@dataclass
class RequestGenerator:
    """Seeded request stream with the paper's endpoint mix."""

    ds: Dataset
    mix: Dict[str, float] = field(default_factory=lambda: dict(PAPER_MIX))
    seed: int = 11
    zipf_alpha: Optional[float] = None  # None = uniform entity selection

    def __post_init__(self) -> None:
        self._g = np.random.default_rng(self.seed)
        self._endpoints = list(self.mix)
        w = np.array([self.mix[e] for e in self._endpoints], dtype=float)
        self._weights = w / w.sum()
        n_u = len(self.ds.users)
        if self.zipf_alpha is not None:
            ranks = np.arange(1, n_u + 1)
            uw = 1.0 / ranks**self.zipf_alpha
            self._user_weights = uw / uw.sum()
        else:
            self._user_weights = None

    def _pick_user(self) -> Tuple[str, str]:
        i = self._g.choice(len(self.ds.users), p=self._user_weights)
        return self.ds.users[int(i)]

    def _pick_region(self) -> str:
        return self.ds.regions[int(self._g.integers(len(self.ds.regions)))]

    def _days(self) -> Tuple[int, int]:
        in_day = int(self._g.integers(0, N_DAYS - 3))
        return in_day, in_day + int(self._g.integers(1, 4))

    def next_request(self, endpoint: Optional[str] = None) -> Request:
        if endpoint is None:
            endpoint = str(
                self._g.choice(self._endpoints, p=self._weights)
            )
        region = self._pick_region()
        if endpoint == "login":
            u, p = self._pick_user()
            return Request("login", "User", u, "check_password", [p])
        if endpoint == "search":
            in_day, out_day = self._days()
            return Request(
                "search",
                "Search",
                region,
                "search",
                [
                    float(self._g.uniform(-90, 90)),
                    float(self._g.uniform(-180, 180)),
                    in_day,
                    out_day,
                ],
            )
        if endpoint == "recommend":
            require = str(self._g.choice(["dist", "rate"]))
            return Request(
                "recommend",
                "Recommend",
                region,
                "recommend",
                [
                    require,
                    float(self._g.uniform(-90, 90)),
                    float(self._g.uniform(-180, 180)),
                ],
            )
        if endpoint == "reserve":
            u, _ = self._pick_user()
            hotels = self.ds.hotels_in(region)
            h = hotels[int(self._g.integers(len(hotels)))]
            in_day, out_day = self._days()
            return Request(
                "reserve",
                "Reservation",
                region,
                "reserve",
                [
                    Ref("User", u),
                    Ref("Hotel", h.hotel_id),
                    in_day,
                    out_day,
                ],
            )
        raise ValueError(f"unknown endpoint {endpoint}")

    def batch(self, n: int, endpoint: Optional[str] = None) -> List[Request]:
        return [self.next_request(endpoint) for _ in range(n)]
