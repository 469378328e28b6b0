"""Structured Streaming runtime tests — the core reproduction target
(applyInPandasWithState + file-bus loop-back). Streaming micro-batches
make each bus hop cost ~a second, so scenarios share one deployed query
via key namespaces."""
import time

import pytest

from repro.core.entities import Ref
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.runtimes.base import EntityError
from repro.runtimes.local import LocalRuntime
from repro.runtimes.spark_dataflow import SparkDataflowRuntime

from tests.zoo import (
    SCENARIOS,
    ZOO_CLASSES,
    assert_same_world,
    run_oracle,
    run_runtime,
)

SUBSET = ["seq", "cond_remote", "loop_entities", "while_remote", "make_acc"]
SUBSET_SCENARIOS = [(m, a) for m, a in SCENARIOS if m in SUBSET][:6]


@pytest.fixture(scope="module")
def zoo_rt(spark):
    rt = SparkDataflowRuntime(spark, name="test-zoo")
    rt.deploy(build_ir(ZOO_CLASSES))
    yield rt
    rt.close()


@pytest.mark.parametrize(
    ("method", "args"),
    SUBSET_SCENARIOS,
    ids=[f"{m}-{i}" for i, (m, _) in enumerate(SUBSET_SCENARIOS)],
)
def test_parity_with_plain_python(zoo_rt, method, args):
    i = SUBSET_SCENARIOS.index((method, args))
    ns = f"s{i}-"
    assert_same_world(
        run_oracle(method, args), run_runtime(zoo_rt, method, args, ns=ns)
    )


def test_error_propagates_through_stream(zoo_rt):
    zoo_rt.create("Acc", "err-a1")
    with pytest.raises(EntityError, match="ValueError"):
        zoo_rt.call("Acc", "err-a1", "fail", "stream-boom")


def test_seed_and_state_roundtrip(zoo_rt):
    zoo_rt.seed("Acc", "seeded", {"accid": "seeded", "total": 41})
    assert zoo_rt.call("Acc", "seeded", "add", 1) == 42
    assert zoo_rt.get_state("Acc", "seeded")["total"] == 42


def test_state_survives_across_micro_batches(zoo_rt):
    zoo_rt.create("Acc", "persist")
    for i in range(3):
        assert zoo_rt.call("Acc", "persist", "add", 1) == i + 1


def test_concurrent_requests_share_batches(zoo_rt):
    """Independent requests ride the same micro-batches; 10 requests
    must not take 10x one request's wall time."""
    rids = [
        zoo_rt.submit_call("Acc", f"batch-{i}", "__init__", [f"batch-{i}"])
        for i in range(10)
    ]
    zoo_rt.drain(rids, timeout=120)
    t0 = time.time()
    rids = [
        zoo_rt.submit_call("Acc", f"batch-{i}", "add", [i]) for i in range(10)
    ]
    payloads = zoo_rt.drain(rids, timeout=120)
    elapsed = time.time() - t0
    assert [payloads[r]["value"] for r in rids] == list(range(10))
    assert elapsed < 60


def test_response_time_recorded(zoo_rt):
    zoo_rt.create("Acc", "timed")
    rid = zoo_rt.submit_call("Acc", "timed", "add", [1])
    zoo_rt.result(rid, timeout=60)
    assert zoo_rt.response_time_ms(rid) is not None


def test_deathstar_on_streaming_matches_local(spark):
    """End-to-end: seed the hotel dataset, run a few mixed requests
    through the streaming dataflow, compare responses and final states
    with the local runtime."""
    ir = build_ir(ALL_ENTITIES)
    ds = generate_dataset(n_hotels=8, n_users=4, n_regions=1)
    rows = seed_rows(ds)

    local = LocalRuntime()
    local.deploy(ir)
    for c, k, s in rows:
        local.seed(c, k, s)

    rt = SparkDataflowRuntime(spark, name="test-deathstar")
    rt.deploy(ir)
    try:
        rt.seed_many(rows)
        reqs = [
            RequestGenerator(ds, seed=9).next_request(e)
            for e in ["search", "recommend", "login", "reserve"]
        ]
        expected = [
            local.call(r.class_name, r.key, r.method, *r.args) for r in reqs
        ]
        rids = [
            rt.submit_call(r.class_name, r.key, r.method, r.args)
            for r in reqs
        ]
        payloads = rt.drain(rids, timeout=240)
        got = [rt.unwrap_response(payloads[rid]) for rid in rids]
        assert got == expected
        # a reserve happened: hotel state must match local's
        hotel_key = reqs[3].args[1].key
        assert (
            rt.get_state("Hotel", hotel_key)["bookings"]
            == local.get_state("Hotel", hotel_key)["bookings"]
        )
    finally:
        rt.close()
