"""Batch BSP runtime tests (the Beam stand-in): semantic parity on
representative zoo scenarios, batch execution of many requests in one
flush, and state audits."""
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
from repro.runtimes.spark_superstep import SparkSuperstepRuntime

from tests.zoo import (
    SCENARIOS,
    ZOO_CLASSES,
    assert_same_world,
    run_oracle,
    run_runtime,
)

# representative subset (supersteps are Spark jobs — keep runtime sane)
SUBSET = [
    "seq",
    "branch",
    "loop_entities",
    "while_remote",
    "early_return",
    "augment",
    "make_acc",
    "nested",
]
SUBSET_SCENARIOS = [
    (m, a) for m, a in SCENARIOS if m in SUBSET
][:10]


@pytest.fixture(scope="module")
def zoo_ir():
    return build_ir(ZOO_CLASSES)


@pytest.mark.parametrize(
    ("method", "args"),
    SUBSET_SCENARIOS,
    ids=[f"{m}-{i}" for i, (m, _) in enumerate(SUBSET_SCENARIOS)],
)
def test_parity_with_plain_python(spark, zoo_ir, method, args):
    rt = SparkSuperstepRuntime(spark)
    rt.deploy(zoo_ir)
    assert_same_world(run_oracle(method, args), run_runtime(rt, method, args))


def test_batch_flush_processes_many_requests(spark, zoo_ir):
    """The batch-dataflow sweet spot: many requests, one BSP run."""
    rt = SparkSuperstepRuntime(spark)
    rt.deploy(zoo_ir)
    rt.seed_many(
        [("Acc", f"a{i}", {"accid": f"a{i}", "total": 0}) for i in range(10)]
    )
    rt.seed_many(
        [
            (
                "Driver",
                f"d{i}",
                {"did": f"d{i}", "acc": Ref("Acc", f"a{i}"), "note": ""},
            )
            for i in range(10)
        ]
    )
    rids = [
        rt.submit_call("Driver", f"d{i}", "seq", [i, i]) for i in range(10)
    ]
    steps = rt.flush()
    assert [rt.result(r) for r in rids] == [3 * i for i in range(10)]
    # independent requests ride the same supersteps: the BSP depth is
    # the per-request hop count, not requests x hops
    assert steps <= 6
    for i in range(10):
        assert rt.get_state("Acc", f"a{i}")["total"] == 2 * i


def test_seed_overwrites(spark, zoo_ir):
    rt = SparkSuperstepRuntime(spark)
    rt.deploy(zoo_ir)
    rt.seed("Acc", "a1", {"accid": "a1", "total": 1})
    rt.seed("Acc", "a1", {"accid": "a1", "total": 5})
    assert rt.get_state("Acc", "a1")["total"] == 5
    assert rt.state_df.count() == 1


def test_error_propagates(spark, zoo_ir):
    rt = SparkSuperstepRuntime(spark)
    rt.deploy(zoo_ir)
    rt.seed("Acc", "a1", {"accid": "a1", "total": 0})
    with pytest.raises(EntityError, match="ValueError"):
        rt.call("Acc", "a1", "fail", "x")


def test_superstep_limit_guards_loops(spark, zoo_ir):
    rt = SparkSuperstepRuntime(spark, max_supersteps=1)
    rt.deploy(zoo_ir)
    rt.seed("Acc", "a1", {"accid": "a1", "total": 0})
    rt.seed(
        "Driver", "d1", {"did": "d1", "acc": Ref("Acc", "a1"), "note": ""}
    )
    rt.submit_call("Driver", "d1", "seq", [1, 2])
    with pytest.raises(RuntimeError, match="superstep limit"):
        rt.flush()


def test_deathstar_batch_matches_local(spark):
    """A mixed DeathStar workload in one BSP flush must equal the local
    runtime's results request-for-request, and end in identical states."""
    ir = build_ir(ALL_ENTITIES)
    ds = generate_dataset(n_hotels=12, n_users=8, n_regions=2)
    rows = seed_rows(ds)

    local = LocalRuntime()
    local.deploy(ir)
    for c, k, s in rows:
        local.seed(c, k, s)

    rt = SparkSuperstepRuntime(spark)
    rt.deploy(ir)
    rt.seed_many(rows)

    reqs = RequestGenerator(
        ds,
        seed=42,
        mix={"search": 0.4, "recommend": 0.3, "login": 0.1, "reserve": 0.2},
    ).batch(24)
    expected = [
        local.call(r.class_name, r.key, r.method, *r.args) for r in reqs
    ]
    rids = [
        rt.submit_call(r.class_name, r.key, r.method, r.args) for r in reqs
    ]
    rt.flush()
    got = [rt.result(rid) for rid in rids]
    assert got == expected
    for h in ds.hotels:
        assert (
            rt.get_state("Hotel", h.hotel_id)["bookings"]
            == local.get_state("Hotel", h.hotel_id)["bookings"]
        )
