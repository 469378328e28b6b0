"""Baseline explicit-implementation tests (experiment T5's comparator):
correctness of the hand-rolled service and *equivalence* with the
StateFlow-compiled entities on identical request streams — the baseline
is an independent oracle, so a divergence means one of the two
implementations is wrong."""
import pytest

from repro.core.entities import Ref
from repro.core.ir import build_ir
from repro.deathstar.baseline_explicit import (
    BaselineHotelService,
    CodecError,
    HotelCodec,
    NotFound,
    RegionIndexCodec,
    UserCodec,
)
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.local import LocalRuntime


@pytest.fixture()
def svc():
    s = BaselineHotelService()
    yield s
    s.close()


def bootstrap(svc: BaselineHotelService, ds) -> None:
    for u, p in ds.users:
        svc.register_user(u, p)
    for h in ds.hotels:
        svc.register_hotel(
            {
                "hotel_id": h.hotel_id,
                "region": h.region,
                "lat": h.lat,
                "lon": h.lon,
                "rate": h.rate,
                "price": h.price,
                "capacity": h.capacity,
                "name": h.name,
                "phone": h.phone,
            }
        )


class TestCodecs:
    def test_user_roundtrip(self):
        rec = {"username": "u", "password": "p", "reservations": [["h", 1, 2]]}
        assert UserCodec.decode(UserCodec.encode(rec)) == rec

    def test_user_missing_field_rejected(self):
        with pytest.raises(CodecError):
            UserCodec.encode({"username": "u"})

    def test_hotel_roundtrip(self):
        rec = {
            "hotel_id": "h",
            "lat": 1.0,
            "lon": 2.0,
            "rate": 3.0,
            "price": 4.0,
            "capacity": 5,
            "name": "n",
            "phone": "p",
            "bookings": {"0": 1},
        }
        assert HotelCodec.decode(HotelCodec.encode(rec)) == rec

    def test_hotel_corrupt_rejected(self):
        with pytest.raises(CodecError):
            HotelCodec.decode('{"hotel_id": "h"}')

    def test_region_defaults(self):
        obj = RegionIndexCodec.decode('{"region": "r"}')
        assert obj["locations"] == {} and obj["reservation_count"] == 0


class TestService:
    def test_login(self, svc):
        svc.register_user("u", "pw")
        assert svc.login("u", "pw") is True
        assert svc.login("u", "x") is False

    def test_login_unknown_user(self, svc):
        with pytest.raises(NotFound):
            svc.login("ghost", "pw")

    def test_reserve_caps(self, svc):
        svc.register_user("u", "pw")
        svc.register_hotel(
            {
                "hotel_id": "h",
                "region": "r",
                "lat": 0.0,
                "lon": 0.0,
                "rate": 3.0,
                "price": 10.0,
                "capacity": 1,
                "name": "H",
                "phone": "+1",
            }
        )
        assert svc.reserve("r", "u", "h", 0, 2) is True
        assert svc.reserve("r", "u", "h", 1, 3) is False

    def test_router_dispatch_and_metrics(self, svc):
        svc.register_user("u", "pw")
        assert svc.router.dispatch("login", "u", "pw") is True
        assert svc.metrics.requests == {"login": 1}
        with pytest.raises(KeyError):
            svc.router.dispatch("teleport")

    def test_router_metrics_count_errors(self, svc):
        with pytest.raises(NotFound):
            svc.router.dispatch("login", "ghost", "pw")
        assert svc.metrics.errors == {"login": 1}


class TestEquivalenceWithStateflow:
    """Identical request streams through the baseline and the compiled
    entities must produce identical responses and final states."""

    @pytest.fixture(scope="class")
    def ir(self):
        return build_ir(ALL_ENTITIES)

    @pytest.mark.parametrize("seed", [1, 2, 3])
    def test_response_stream_equal(self, ir, seed):
        ds = generate_dataset(n_hotels=12, n_users=8, n_regions=2, seed=seed)
        svc = BaselineHotelService()
        bootstrap(svc, ds)
        rt = LocalRuntime()
        rt.deploy(ir)
        for c, k, s in seed_rows(ds):
            rt.seed(c, k, s)
        gen = RequestGenerator(
            ds,
            seed=seed * 10,
            mix={"search": 0.4, "recommend": 0.3, "login": 0.1, "reserve": 0.2},
        )
        try:
            for req in gen.batch(60):
                sf = rt.call(req.class_name, req.key, req.method, *req.args)
                if req.endpoint == "login":
                    bl = svc.router.dispatch("login", req.key, req.args[0])
                elif req.endpoint == "search":
                    bl = svc.router.dispatch("search", req.key, *req.args)
                elif req.endpoint == "recommend":
                    bl = svc.router.dispatch("recommend", req.key, *req.args)
                else:
                    user, hotel, in_day, out_day = req.args
                    bl = svc.router.dispatch(
                        "reserve", req.key, user.key, hotel.key, in_day, out_day
                    )
                assert sf == bl, f"divergence on {req}"
            # final hotel states must agree too
            for h in ds.hotels:
                sf_state = rt.get_state("Hotel", h.hotel_id)
                bl_state = svc.hotels.load(h.hotel_id)
                assert sf_state["bookings"] == bl_state["bookings"], h.hotel_id
            for u, _ in ds.users:
                assert (
                    rt.get_state("User", u)["reservations"]
                    == svc.users.load(u)["reservations"]
                )
        finally:
            svc.close()
