"""DeathStar hotel-reservation service as stateful entities (paper §4).

The paper ports DeathStarBench's hotel service to StateFlow and drives
four endpoints — *login*, *search*, *recommend*, *reserve*. The paper
counts **nine** stateful-entity calls for search: "three to search, to
retrieve the geoinformation and rating of hotels, five to check for the
hotel availability, and one to get the profiles of the available
hotels". Our :class:`Search.search` reproduces that exactly:
1 (Search itself) + Geo + Rate + 5× Hotel.check_availability + Profile.

Dates are integer day indices; per-day booking counts live in a dict
keyed by ``str(day)`` (JSON object keys are strings).

These classes are plain Python — directly executable (that is the
semantic oracle in the tests) and compiled by StateFlow into the
dataflow IR.
"""
from __future__ import annotations

from repro.core.entities import stateflow


@stateflow
class User:
    """A user account (login + reservation history)."""

    def __init__(self, username: str, password: str):
        self.username: str = username
        self.password: str = password
        self.reservations: list = []

    def __key__(self):
        return self.username

    def check_password(self, password: str) -> bool:
        return self.password == password

    def add_reservation(self, hotel_id: str, in_day: int, out_day: int) -> int:
        self.reservations = self.reservations + [
            [hotel_id, in_day, out_day]
        ]
        return len(self.reservations)


@stateflow
class Hotel:
    """One hotel: geo position, rating, price, per-day availability."""

    def __init__(
        self,
        hotel_id: str,
        lat: float,
        lon: float,
        rate: float,
        price: float,
        capacity: int,
        name: str,
        phone: str,
    ):
        self.hotel_id: str = hotel_id
        self.lat: float = lat
        self.lon: float = lon
        self.rate: float = rate
        self.price: float = price
        self.capacity: int = capacity
        self.name: str = name
        self.phone: str = phone
        self.bookings: dict = {}

    def __key__(self):
        return self.hotel_id

    def get_geo(self) -> list:
        return [self.lat, self.lon]

    def get_rate(self) -> float:
        return self.rate

    def get_profile(self) -> dict:
        return {
            "hotel_id": self.hotel_id,
            "name": self.name,
            "phone": self.phone,
            "price": self.price,
        }

    def check_availability(self, in_day: int, out_day: int) -> bool:
        day = in_day
        while day < out_day:
            if self.bookings.get(str(day), 0) >= self.capacity:
                return False
            day += 1
        return True

    def reserve(self, in_day: int, out_day: int) -> bool:
        day = in_day
        while day < out_day:
            if self.bookings.get(str(day), 0) >= self.capacity:
                return False
            day += 1
        day = in_day
        while day < out_day:
            self.bookings[str(day)] = self.bookings.get(str(day), 0) + 1
            day += 1
        return True


@stateflow
class Geo:
    """Geo service: nearest hotels for a region."""

    def __init__(self, region: str, locations: dict):
        self.region: str = region
        self.locations: dict = locations  # hotel_id -> [lat, lon]

    def __key__(self):
        return self.region

    def nearby(self, lat: float, lon: float, k: int) -> list:
        dists = []
        for hid in sorted(self.locations):
            loc = self.locations[hid]
            d = (loc[0] - lat) ** 2 + (loc[1] - lon) ** 2
            dists.append([d, hid])
        dists.sort()
        return [pair[1] for pair in dists[:k]]


@stateflow
class Rate:
    """Rate service: hotel ratings for a region."""

    def __init__(self, region: str, rates: dict):
        self.region: str = region
        self.rates: dict = rates  # hotel_id -> rating

    def __key__(self):
        return self.region

    def get_rates(self, hotel_ids: list) -> list:
        return [self.rates.get(h, 0.0) for h in hotel_ids]

    def top_rated(self, k: int) -> list:
        pairs = sorted(
            self.rates.items(), key=lambda kv: (-kv[1], kv[0])
        )
        return [hid for hid, _ in pairs[:k]]


@stateflow
class Profile:
    """Profile service: hotel profiles for a region."""

    def __init__(self, region: str, profiles: dict):
        self.region: str = region
        self.profiles: dict = profiles  # hotel_id -> profile dict

    def __key__(self):
        return self.region

    def get_profiles(self, hotel_ids: list) -> list:
        return [
            self.profiles[h] for h in hotel_ids if h in self.profiles
        ]


@stateflow
class Search:
    """Search endpoint orchestrator — the paper's nine-call fan-out."""

    def __init__(
        self,
        region: str,
        geo: Geo,
        rate: Rate,
        profile: Profile,
        hotels: dict,
    ):
        self.region: str = region
        self.geo: Geo = geo
        self.rate: Rate = rate
        self.profile: Profile = profile
        self.hotels: dict = hotels  # hotel_id -> Hotel ref

    def __key__(self):
        return self.region

    def search(self, lat: float, lon: float, in_day: int, out_day: int) -> list:
        nearby_ids: list = self.geo.nearby(lat, lon, 5)
        rates: list = self.rate.get_rates(nearby_ids)
        available: list = []
        for hid in nearby_ids:
            h: Hotel = self.hotels[hid]
            ok: bool = h.check_availability(in_day, out_day)
            if ok:
                available.append(hid)
        profiles: list = self.profile.get_profiles(available)
        return profiles


@stateflow
class Recommend:
    """Recommend endpoint: by distance or by rating."""

    def __init__(self, region: str, geo: Geo, rate: Rate, profile: Profile):
        self.region: str = region
        self.geo: Geo = geo
        self.rate: Rate = rate
        self.profile: Profile = profile

    def __key__(self):
        return self.region

    def recommend(self, require: str, lat: float, lon: float) -> list:
        if require == "dist":
            ids: list = self.geo.nearby(lat, lon, 5)
        else:
            ids: list = self.rate.top_rated(5)
        profiles: list = self.profile.get_profiles(ids)
        return profiles


@stateflow
class Reservation:
    """Reserve endpoint: book a hotel and record it on the user."""

    def __init__(self, region: str):
        self.region: str = region
        self.count: int = 0

    def __key__(self):
        return self.region

    def reserve(self, user: User, hotel: Hotel, in_day: int, out_day: int) -> bool:
        ok: bool = hotel.reserve(in_day, out_day)
        if ok:
            hid: str = hotel.hotel_id
            n: int = user.add_reservation(hid, in_day, out_day)
            self.count += 1
        return ok


ALL_ENTITIES = [
    User,
    Hotel,
    Geo,
    Rate,
    Profile,
    Search,
    Recommend,
    Reservation,
]
