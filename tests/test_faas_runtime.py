"""FaaS (Lambda+DynamoDB substitute) runtime tests: semantic parity with
plain Python, the KV store, and the paper's documented no-locking
consistency gap ("state access can be locked ... however, locking was
found to deteriorate performance significantly and therefore it was
disabled")."""
import pytest

from repro.core.entities import Ref
from repro.core.ir import build_ir
from repro.runtimes.base import EntityError
from repro.runtimes.faas import FaasRuntime
from repro.runtimes.kvstore import KVStore

from tests.zoo import (
    SCENARIO_IDS,
    SCENARIOS,
    ZOO_CLASSES,
    assert_same_world,
    run_oracle,
    run_runtime,
)


@pytest.fixture(scope="module")
def zoo_ir():
    return build_ir(ZOO_CLASSES)


@pytest.fixture()
def rt(zoo_ir):
    r = FaasRuntime(max_concurrency=8)
    r.deploy(zoo_ir)
    yield r
    r.close()


class TestKVStore:
    def test_get_put(self):
        kv = KVStore()
        assert kv.get("A", "k") is None
        kv.put("A", "k", "v1")
        assert kv.get("A", "k") == "v1"
        kv.put("A", "k", "v2")
        assert kv.get("A", "k") == "v2"
        kv.close()

    def test_delete(self):
        kv = KVStore()
        kv.put("A", "k", "v")
        kv.delete("A", "k")
        assert kv.get("A", "k") is None
        kv.close()

    def test_namespacing_by_class(self):
        kv = KVStore()
        kv.put("A", "k", "va")
        kv.put("B", "k", "vb")
        assert kv.get("A", "k") == "va"
        assert kv.get("B", "k") == "vb"
        assert kv.count() == 2
        kv.close()

    def test_items(self):
        kv = KVStore()
        kv.put("A", "k1", "1")
        kv.put("A", "k2", "2")
        got = sorted(kv.items())
        assert got == [("A", "k1", "1"), ("A", "k2", "2")]
        kv.close()

    def test_threaded_access(self):
        import threading

        kv = KVStore()
        errs = []

        def work(i):
            try:
                for j in range(20):
                    kv.put("T", f"k{i}", str(j))
                    kv.get("T", f"k{i}")
            except Exception as e:  # noqa: BLE001
                errs.append(e)

        ts = [threading.Thread(target=work, args=(i,)) for i in range(8)]
        [t.start() for t in ts]
        [t.join() for t in ts]
        assert not errs
        assert kv.count() == 8
        kv.close()


@pytest.mark.parametrize(("method", "args"), SCENARIOS, ids=SCENARIO_IDS)
def test_parity_with_plain_python(zoo_ir, method, args):
    r = FaasRuntime(max_concurrency=4)
    r.deploy(zoo_ir)
    try:
        assert_same_world(run_oracle(method, args), run_runtime(r, method, args))
    finally:
        r.close()


class TestFaasBehaviour:
    def test_invocation_counting(self, rt):
        rt.create("Acc", "a1")
        before = rt.invocations
        rt.call("Acc", "a1", "add", 1)
        assert rt.invocations == before + 1  # simple call = one hop
        rt.create("Driver", "d1", Ref("Acc", "a1"))
        before = rt.invocations
        rt.call("Driver", "d1", "seq", 1, 2)
        # client CALL + 2x(CALL+RETURN) = 5 hops
        assert rt.invocations == before + 5

    def test_error_propagates(self, rt):
        rt.create("Acc", "a1")
        with pytest.raises(EntityError, match="ValueError"):
            rt.call("Acc", "a1", "fail", "x")

    def test_concurrent_disjoint_keys_all_succeed(self, rt):
        rids = []
        for i in range(20):
            rids.append(rt.submit_call("Acc", f"c{i}", "__init__", [f"c{i}"]))
        for rid in rids:
            rt.result(rid)
        rids = [rt.submit_call("Acc", f"c{i}", "add", [i]) for i in range(20)]
        got = [rt.result(r) for r in rids]
        assert got == list(range(20))

    def test_seed_and_get_state(self, rt):
        rt.seed("Acc", "s1", {"accid": "s1", "total": 5})
        assert rt.call("Acc", "s1", "add", 1) == 6
        assert rt.get_state("Acc", "s1")["total"] == 6

    def test_response_time_recorded(self, rt):
        rt.create("Acc", "a2")
        rid = rt.submit_call("Acc", "a2", "add", [1])
        rt.result(rid)
        assert rt.response_time_ms(rid) is not None

    def test_no_locking_loses_updates_under_contention(self, zoo_ir):
        """The paper's consistency gap: concurrent read-modify-write on
        the same key without locks loses updates. Retried a few times to
        keep the test deterministic in practice."""
        n = 200
        lost_seen = False
        for _ in range(3):
            r = FaasRuntime(max_concurrency=16)
            r.deploy(zoo_ir)
            try:
                r.seed("Acc", "hot", {"accid": "hot", "total": 0})
                rids = [
                    r.submit_call("Acc", "hot", "add", [1]) for _ in range(n)
                ]
                for rid in rids:
                    r.result(rid, timeout=60)
                final = r.get_state("Acc", "hot")["total"]
            finally:
                r.close()
            assert final <= n  # can never exceed
            if final < n:
                lost_seen = True
                break
        assert lost_seen, (
            "no lost updates in 3 rounds of 200 concurrent increments — "
            "the no-locking FaaS path appears to serialize writes"
        )
