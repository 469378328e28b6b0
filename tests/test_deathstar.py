"""DeathStar hotel-service tests (paper §4): direct-Python unit tests of
every entity, compiled-vs-direct endpoint parity, the nine-call search
fan-out, and workload-generator properties."""
import collections

import pytest

from repro.core.entities import Ref
from repro.core.ir import build_ir
from repro.deathstar.entities import (
    ALL_ENTITIES,
    Geo,
    Hotel,
    Profile,
    Rate,
    Recommend,
    Reservation,
    Search,
    User,
)
from repro.deathstar.workload import (
    PAPER_MIX,
    RequestGenerator,
    create_calls,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.local import LocalRuntime


@pytest.fixture(scope="module")
def ir():
    return build_ir(ALL_ENTITIES)


@pytest.fixture(scope="module")
def ds():
    return generate_dataset(n_hotels=16, n_users=10, n_regions=2)


def seeded_runtime(ir, ds) -> LocalRuntime:
    rt = LocalRuntime()
    rt.deploy(ir)
    for c, k, s in seed_rows(ds):
        rt.seed(c, k, s)
    return rt


class TestEntitiesDirect:
    """Plain-Python semantics of each entity."""

    def test_user_login(self):
        u = User("u", "pw")
        assert u.check_password("pw") is True
        assert u.check_password("no") is False

    def test_user_reservations(self):
        u = User("u", "pw")
        assert u.add_reservation("h1", 1, 3) == 1
        assert u.add_reservation("h2", 2, 4) == 2
        assert u.reservations == [["h1", 1, 3], ["h2", 2, 4]]

    def _hotel(self, capacity=2):
        return Hotel("h1", 1.0, 2.0, 4.5, 100.0, capacity, "H", "+1")

    def test_hotel_availability_empty(self):
        assert self._hotel().check_availability(0, 3) is True

    def test_hotel_reserve_decrements(self):
        h = self._hotel(capacity=2)
        assert h.reserve(0, 2) is True
        assert h.reserve(0, 2) is True
        assert h.reserve(0, 2) is False  # full
        assert h.bookings == {"0": 2, "1": 2}

    def test_hotel_partial_overlap(self):
        h = self._hotel(capacity=1)
        assert h.reserve(0, 2) is True
        assert h.check_availability(1, 3) is False
        assert h.check_availability(2, 4) is True

    def test_hotel_reserve_all_or_nothing(self):
        h = self._hotel(capacity=1)
        assert h.reserve(1, 2)
        assert h.reserve(0, 3) is False
        assert h.bookings == {"1": 1}  # day 0/2 untouched

    def test_hotel_profile(self):
        p = self._hotel().get_profile()
        assert p == {
            "hotel_id": "h1",
            "name": "H",
            "phone": "+1",
            "price": 100.0,
        }

    def test_geo_nearby_orders_by_distance(self):
        g = Geo("r", {"a": [0, 0], "b": [10, 10], "c": [1, 1]})
        assert g.nearby(0.0, 0.0, 2) == ["a", "c"]

    def test_geo_nearby_k_larger_than_n(self):
        g = Geo("r", {"a": [0, 0]})
        assert g.nearby(5.0, 5.0, 5) == ["a"]

    def test_geo_deterministic_ties(self):
        g = Geo("r", {"b": [1, 0], "a": [0, 1]})
        assert g.nearby(0.0, 0.0, 2) == ["a", "b"]  # sorted id breaks tie

    def test_rate_get_rates(self):
        r = Rate("r", {"a": 4.0, "b": 2.0})
        assert r.get_rates(["a", "x", "b"]) == [4.0, 0.0, 2.0]

    def test_rate_top_rated(self):
        r = Rate("r", {"a": 4.0, "b": 5.0, "c": 4.0})
        assert r.top_rated(2) == ["b", "a"]

    def test_profile_get_profiles_skips_unknown(self):
        p = Profile("r", {"a": {"hotel_id": "a"}})
        assert p.get_profiles(["a", "zz"]) == [{"hotel_id": "a"}]

    def test_search_direct(self):
        """Direct Python execution of the 9-call orchestration."""
        hotels = {
            hid: Hotel(hid, float(i), 0.0, 3.0, 50.0, 1, hid, "+1")
            for i, hid in enumerate(["h0", "h1", "h2", "h3", "h4", "h5"])
        }
        geo = Geo("r", {h: [hotels[h].lat, hotels[h].lon] for h in hotels})
        rate = Rate("r", {h: hotels[h].rate for h in hotels})
        prof = Profile("r", {h: hotels[h].get_profile() for h in hotels})
        s = Search("r", geo, rate, prof, hotels)
        res = s.search(0.0, 0.0, 0, 2)
        assert [p["hotel_id"] for p in res] == ["h0", "h1", "h2", "h3", "h4"]
        hotels["h1"].reserve(0, 2)
        res = s.search(0.0, 0.0, 0, 2)
        assert [p["hotel_id"] for p in res] == ["h0", "h2", "h3", "h4"]

    def test_recommend_direct_by_rate(self):
        geo = Geo("r", {"a": [0, 0]})
        rate = Rate("r", {"a": 1.0, "b": 5.0})
        prof = Profile("r", {"a": {"hotel_id": "a"}, "b": {"hotel_id": "b"}})
        rec = Recommend("r", geo, rate, prof)
        assert [p["hotel_id"] for p in rec.recommend("rate", 0.0, 0.0)] == [
            "b",
            "a",
        ]

    def test_reservation_direct(self):
        u = User("u", "pw")
        h = Hotel("h1", 0.0, 0.0, 3.0, 50.0, 1, "H", "+1")
        r = Reservation("r")
        assert r.reserve(u, h, 0, 2) is True
        assert r.count == 1
        assert u.reservations == [["h1", 0, 2]]
        assert r.reserve(u, h, 0, 2) is False
        assert r.count == 1


class TestCompiledParity:
    """Compiled endpoints (Local runtime) == direct Python endpoints."""

    @pytest.mark.parametrize("endpoint_seed", range(5))
    def test_search_parity(self, ir, ds, endpoint_seed):
        rt = seeded_runtime(ir, ds)
        gen = RequestGenerator(ds, seed=100 + endpoint_seed)
        req = gen.next_request("search")
        got = rt.call(req.class_name, req.key, req.method, *req.args)
        expect = self._direct_world(ds, req.key).search(*req.args)
        assert got == expect

    @pytest.mark.parametrize("endpoint_seed", range(5))
    def test_recommend_parity(self, ir, ds, endpoint_seed):
        rt = seeded_runtime(ir, ds)
        gen = RequestGenerator(ds, seed=200 + endpoint_seed)
        req = gen.next_request("recommend")
        got = rt.call(req.class_name, req.key, req.method, *req.args)
        region = req.key
        world = self._direct_region(ds, region)
        expect = Recommend(
            region, world["geo"], world["rate"], world["profile"]
        ).recommend(*req.args)
        assert got == expect

    def test_login_parity(self, ir, ds):
        rt = seeded_runtime(ir, ds)
        assert rt.call("User", "user-0", "check_password", "pass-0") is True
        assert rt.call("User", "user-0", "check_password", "nope") is False

    def test_reserve_parity(self, ir, ds):
        rt = seeded_runtime(ir, ds)
        region = ds.regions[0]
        h = ds.hotels_in(region)[0]
        ok = rt.call(
            "Reservation",
            region,
            "reserve",
            Ref("User", "user-1"),
            Ref("Hotel", h.hotel_id),
            3,
            5,
        )
        assert ok is True
        assert rt.get_state("Hotel", h.hotel_id)["bookings"] == {
            "3": 1,
            "4": 1,
        }
        assert rt.get_state("User", "user-1")["reservations"] == [
            [h.hotel_id, 3, 5]
        ]
        assert rt.get_state("Reservation", region)["count"] == 1

    def _direct_region(self, ds, region):
        hs = ds.hotels_in(region)
        hotels = {
            h.hotel_id: Hotel(
                h.hotel_id, h.lat, h.lon, h.rate, h.price, h.capacity,
                h.name, h.phone,
            )
            for h in hs
        }
        geo = Geo(region, {k: [v.lat, v.lon] for k, v in hotels.items()})
        rate = Rate(region, {k: v.rate for k, v in hotels.items()})
        prof = Profile(
            region, {k: v.get_profile() for k, v in hotels.items()}
        )
        return {"hotels": hotels, "geo": geo, "rate": rate, "profile": prof}

    def _direct_world(self, ds, region) -> Search:
        w = self._direct_region(ds, region)
        return Search(region, w["geo"], w["rate"], w["profile"], w["hotels"])


class TestNineCallFanout:
    def test_search_makes_nine_entity_calls(self, ir, ds):
        """Paper §4: the search endpoint consists of nine stateful
        entity calls (1 search + geo + rate + 5 availability + 1
        profiles)."""
        rt = seeded_runtime(ir, ds)
        gen = RequestGenerator(ds, seed=5)
        req = gen.next_request("search")
        before = len(rt.event_log)
        rt.call(req.class_name, req.key, req.method, *req.args)
        calls = [
            e
            for e in rt.event_log[before:]
            if e.kind == "CALL"
        ]
        assert len(calls) == 9
        by_class = collections.Counter(c.class_name for c in calls)
        assert by_class == {
            "Search": 1,
            "Geo": 1,
            "Rate": 1,
            "Hotel": 5,
            "Profile": 1,
        }


class TestBootstrapPaths:
    def test_create_calls_equal_seed_rows(self, ir, ds):
        """Bootstrapping through __init__ events must yield exactly the
        states that seed_rows injects directly."""
        rt_seed = seeded_runtime(ir, ds)
        rt_create = LocalRuntime()
        rt_create.deploy(ir)
        for cls, key, args in create_calls(ds):
            rt_create.call(cls, key, "__init__", *args)
        assert set(rt_seed.state) == set(rt_create.state)
        for k in rt_seed.state:
            assert rt_seed.get_state(*k) == rt_create.get_state(*k), k


class TestWorkload:
    def test_dataset_deterministic(self):
        a = generate_dataset(seed=1)
        b = generate_dataset(seed=1)
        assert [h.lat for h in a.hotels] == [h.lat for h in b.hotels]

    def test_dataset_seed_changes_data(self):
        a = generate_dataset(seed=1)
        b = generate_dataset(seed=2)
        assert [h.lat for h in a.hotels] != [h.lat for h in b.hotels]

    def test_regions_partition_hotels(self, ds):
        total = sum(len(ds.hotels_in(r)) for r in ds.regions)
        assert total == len(ds.hotels)

    def test_generator_deterministic(self, ds):
        a = RequestGenerator(ds, seed=3).batch(20)
        b = RequestGenerator(ds, seed=3).batch(20)
        assert [(r.endpoint, r.key, r.method) for r in a] == [
            (r.endpoint, r.key, r.method) for r in b
        ]

    def test_paper_mix_proportions(self, ds):
        gen = RequestGenerator(ds, seed=4)
        n = 4000
        counts = collections.Counter(r.endpoint for r in gen.batch(n))
        assert abs(counts["search"] / n - PAPER_MIX["search"]) < 0.05
        assert abs(counts["recommend"] / n - PAPER_MIX["recommend"]) < 0.05
        assert counts["login"] + counts["reserve"] < 0.05 * n

    def test_forced_endpoint(self, ds):
        gen = RequestGenerator(ds, seed=4)
        assert all(r.endpoint == "login" for r in gen.batch(10, "login"))

    def test_zipf_skews_user_selection(self, ds):
        gen = RequestGenerator(ds, seed=4, zipf_alpha=1.5)
        users = collections.Counter(
            r.key for r in gen.batch(400, "login")
        )
        top = users.most_common(1)[0][1]
        assert top > 400 / len(ds.users) * 3  # far above uniform share

    def test_request_days_in_window(self, ds):
        gen = RequestGenerator(ds, seed=6)
        for r in gen.batch(50, "search"):
            in_day, out_day = r.args[2], r.args[3]
            assert 0 <= in_day < out_day <= 30

    def test_seed_rows_cover_all_classes(self, ds):
        classes = {c for c, _, _ in seed_rows(ds)}
        assert classes == {
            "User",
            "Hotel",
            "Geo",
            "Rate",
            "Profile",
            "Search",
            "Recommend",
            "Reservation",
        }

    def test_unknown_endpoint_rejected(self, ds):
        gen = RequestGenerator(ds, seed=4)
        with pytest.raises(ValueError):
            gen.next_request("teleport")
