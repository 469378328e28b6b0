"""Cross-runtime integration: the same mixed DeathStar workload must
produce identical responses and final entity states on the local,
FaaS (single-driver) and — spot-checked elsewhere — Spark runtimes.
Also covers the file bus (Kafka substitute)."""
import os

import pytest

from repro.core.events import Event
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.faas import FaasRuntime
from repro.runtimes.filebus import FileTopic
from repro.runtimes.local import LocalRuntime


class TestFileTopic:
    def test_publish_read_roundtrip(self, tmp_path):
        t = FileTopic(str(tmp_path / "topic"))
        evs = [
            Event.call("A", f"k{i}", "m", [i], request_id=f"r{i}")
            for i in range(5)
        ]
        assert t.publish(evs) == 5
        back = t.read_all()
        assert [e.request_id for e in back] == [f"r{i}" for i in range(5)]
        assert back[3].args == [3]

    def test_publish_empty_is_noop(self, tmp_path):
        t = FileTopic(str(tmp_path / "topic"))
        assert t.publish([]) == 0
        assert t.file_count() == 0

    def test_batches_are_separate_files(self, tmp_path):
        t = FileTopic(str(tmp_path / "topic"))
        t.publish([Event.response("a")])
        t.publish([Event.response("b")])
        assert t.file_count() == 2

    def test_no_tmp_files_left(self, tmp_path):
        t = FileTopic(str(tmp_path / "topic"))
        t.publish([Event.response("a")])
        assert not [f for f in os.listdir(t.path) if f.endswith(".tmp")]

    def test_files_sort_in_publish_order(self, tmp_path):
        t = FileTopic(str(tmp_path / "topic"))
        for i in range(12):
            t.publish([Event.response(f"r{i}")])
        back = t.read_all()
        assert [e.request_id for e in back] == [f"r{i}" for i in range(12)]


class TestCrossRuntime:
    @pytest.fixture(scope="class")
    def ir(self):
        return build_ir(ALL_ENTITIES)

    @pytest.fixture(scope="class")
    def ds(self):
        return generate_dataset(n_hotels=12, n_users=8, n_regions=2)

    def _run(self, rt, ds, n=80, seed=23):
        for c, k, s in seed_rows(ds):
            rt.seed(c, k, s)
        gen = RequestGenerator(
            ds,
            seed=seed,
            mix={"search": 0.4, "recommend": 0.3, "login": 0.1, "reserve": 0.2},
        )
        reqs = gen.batch(n)
        out = [
            (r.endpoint, rt.call(r.class_name, r.key, r.method, *r.args))
            for r in reqs
        ]
        states = {
            ("Hotel", h.hotel_id): rt.get_state("Hotel", h.hotel_id)
            for h in ds.hotels
        }
        states.update(
            {("User", u): rt.get_state("User", u) for u, _ in ds.users}
        )
        return out, states

    def test_local_vs_faas_identical(self, ir, ds):
        local = LocalRuntime()
        local.deploy(ir)
        res_local, st_local = self._run(local, ds)
        faas = FaasRuntime(max_concurrency=1)  # sequential => deterministic
        faas.deploy(ir)
        try:
            res_faas, st_faas = self._run(faas, ds)
        finally:
            faas.close()
        assert res_local == res_faas
        assert st_local == st_faas

    def test_faas_invocations_exceed_requests(self, ir, ds):
        """Split functions cost one invocation per hop — the FaaS bill
        the paper's Lambda target pays."""
        faas = FaasRuntime(max_concurrency=1)
        faas.deploy(ir)
        try:
            self._run(faas, ds, n=20)
            assert faas.invocations > 20 * 2
        finally:
            faas.close()

    def test_search_hop_count_on_faas(self, ir, ds):
        faas = FaasRuntime(max_concurrency=1)
        faas.deploy(ir)
        try:
            for c, k, s in seed_rows(ds):
                faas.seed(c, k, s)
            gen = RequestGenerator(ds, seed=3)
            req = gen.next_request("search")
            before = faas.invocations
            faas.call(req.class_name, req.key, req.method, *req.args)
            hops = faas.invocations - before
            # 9 entity calls: 1 client CALL + 8 remote CALLs + 8 RETURNs
            assert hops == 17
        finally:
            faas.close()
