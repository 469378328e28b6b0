"""DuckDB-oracle audits: every query-result check goes through
``repro.oracle.assert_equivalent`` so a broken Spark aggregation (or a
broken dataflow that mis-routes/mis-counts events) is caught against an
independent engine."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.ir import build_ir
from repro.deathstar.entities import ALL_ENTITIES
from repro.deathstar.workload import (
    RequestGenerator,
    generate_dataset,
    seed_rows,
)
from repro.oracle import assert_equivalent
from repro.runtimes.local import LocalRuntime


@pytest.fixture(scope="module")
def world():
    """A completed 120-request mixed workload on the local runtime."""
    ir = build_ir(ALL_ENTITIES)
    ds = generate_dataset(n_hotels=16, n_users=10, n_regions=2)
    rt = LocalRuntime()
    rt.deploy(ir)
    for c, k, s in seed_rows(ds):
        rt.seed(c, k, s)
    gen = RequestGenerator(
        ds,
        seed=17,
        mix={"search": 0.4, "recommend": 0.3, "login": 0.1, "reserve": 0.2},
    )
    reqs = gen.batch(120)
    results = [
        (r, rt.call(r.class_name, r.key, r.method, *r.args)) for r in reqs
    ]
    return ir, ds, rt, results


def _events_pdf(rt: LocalRuntime) -> pd.DataFrame:
    return pd.DataFrame(
        [
            {
                "event_id": e.event_id,
                "request_id": e.request_id,
                "kind": e.kind,
                "class_name": e.class_name,
                "method": e.method,
            }
            for e in rt.event_log
        ]
    )


class TestEventLogAudits:
    def test_calls_per_class_and_method(self, spark, world):
        _, _, rt, _ = world
        pdf = _events_pdf(rt)
        df = (
            spark.createDataFrame(pdf)
            .filter(F.col("kind") == "CALL")
            .groupBy("class_name", "method")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            df,
            """
            SELECT class_name, method, COUNT(*) AS n
            FROM events WHERE kind = 'CALL'
            GROUP BY class_name, method
            """,
            events=pdf,
        )

    def test_one_response_per_request(self, spark, world):
        _, _, rt, results = world
        pdf = _events_pdf(rt)
        df = (
            spark.createDataFrame(pdf)
            .filter(F.col("kind") == "RESPONSE")
            .groupBy("request_id")
            .agg(F.count("*").alias("n"))
            .agg(
                F.count("*").alias("requests"),
                F.max("n").alias("max_responses"),
            )
        )
        assert_equivalent(
            df,
            """
            SELECT COUNT(*) AS requests, MAX(n) AS max_responses FROM (
                SELECT request_id, COUNT(*) AS n FROM events
                WHERE kind = 'RESPONSE' GROUP BY request_id
            )
            """,
            events=pdf,
        )
        row = df.collect()[0]
        # every client request (plus seeding acks if any) got exactly one
        assert row["max_responses"] == 1
        assert row["requests"] >= len(results)

    def test_search_fanout_via_oracle(self, spark, world):
        """9 entity calls per search request, audited as a query."""
        _, _, rt, results = world
        pdf = _events_pdf(rt)
        search_rids = pd.DataFrame(
            {
                "request_id": [
                    rt_req_id
                    for (req, _), rt_req_id in zip(
                        results, _response_ids(rt, results)
                    )
                    if req.endpoint == "search"
                ]
            }
        )
        df = (
            spark.createDataFrame(pdf)
            .join(
                spark.createDataFrame(search_rids),
                on="request_id",
                how="semi",
            )
            .filter(F.col("kind") == "CALL")
            .groupBy("request_id")
            .agg(F.count("*").alias("calls"))
            .groupBy("calls")
            .agg(F.count("*").alias("n_requests"))
        )
        assert_equivalent(
            df,
            """
            SELECT calls, COUNT(*) AS n_requests FROM (
                SELECT e.request_id, COUNT(*) AS calls
                FROM events e
                WHERE e.kind = 'CALL'
                  AND e.request_id IN (SELECT request_id FROM rids)
                GROUP BY e.request_id
            ) GROUP BY calls
            """,
            events=pdf,
            rids=search_rids,
        )
        rows = df.collect()
        assert len(rows) == 1 and rows[0]["calls"] == 9


def _response_ids(rt, results):
    """request ids in completion order (the local runtime logs them)."""
    return [
        e.request_id for e in rt.event_log if e.kind == "RESPONSE"
    ][-len(results):]


class TestStateAudits:
    def test_bookings_match_successful_reserves(self, spark, world):
        """Cross-check: per-day hotel bookings in final entity state ==
        day-exploded successful reserve requests (computed in Spark,
        verified by DuckDB)."""
        _, ds, rt, results = world
        reserves = pd.DataFrame(
            [
                {
                    "hotel_id": req.args[1].key,
                    "in_day": req.args[2],
                    "out_day": req.args[3],
                    "ok": bool(res),
                }
                for req, res in results
                if req.endpoint == "reserve"
            ]
        )
        if reserves.empty or not reserves["ok"].any():
            pytest.skip("workload produced no successful reserves")
        expected_df = (
            spark.createDataFrame(reserves)
            .filter(F.col("ok"))
            .withColumn(
                "day",
                F.explode(F.sequence("in_day", F.col("out_day") - 1)),
            )
            .groupBy("hotel_id", "day")
            .agg(F.count("*").alias("booked"))
        )
        assert_equivalent(
            expected_df,
            """
            SELECT hotel_id, CAST(u.d AS BIGINT) AS day,
                   COUNT(*) AS booked
            FROM reserves, UNNEST(range(in_day, out_day)) AS u(d)
            WHERE ok
            GROUP BY hotel_id, day
            """,
            reserves=reserves,
        )
        # and it matches the actual operator state
        actual = {}
        for h in ds.hotels:
            st = rt.get_state("Hotel", h.hotel_id)
            for day, n in st["bookings"].items():
                actual[(h.hotel_id, int(day))] = n
        expected = {
            (r["hotel_id"], r["day"]): r["booked"]
            for r in expected_df.collect()
        }
        assert actual == expected

    def test_reservation_counts_match(self, spark, world):
        _, ds, rt, results = world
        per_region = pd.DataFrame(
            [
                {"region": req.key, "ok": bool(res)}
                for req, res in results
                if req.endpoint == "reserve"
            ]
        )
        if per_region.empty:
            pytest.skip("no reserve requests in workload")
        df = (
            spark.createDataFrame(per_region)
            .filter(F.col("ok"))
            .groupBy("region")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            df,
            "SELECT region, COUNT(*) AS n FROM r WHERE ok GROUP BY region",
            r=per_region,
        )
        for row in df.collect():
            assert (
                rt.get_state("Reservation", row["region"])["count"] == row["n"]
            )


class TestSynthDataOracle:
    """Provided generators + oracle wired together (harness sanity)."""

    def test_lineitem_aggregate(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        df = li.groupBy("l_returnflag").agg(
            F.count("*").alias("n"),
            F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
        )
        assert_equivalent(
            df,
            """
            SELECT l_returnflag, COUNT(*) AS n,
                   ROUND(SUM(l_quantity), 2) AS sum_qty
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_orders_join(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        o = synth_data.orders(spark, sf=0.001)
        df = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            df,
            """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM lineitem JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=o,
        )

    def test_zipf_keys_are_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5)
        top = (
            df.groupBy("k").agg(F.count("*").alias("n"))
            .orderBy(F.desc("n"))
            .first()
        )
        assert top["n"] > 5000 / 100 * 5
