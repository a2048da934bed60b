"""Window assignment (Spark vs pandas twins), the oracle SQL builder,
and Section 7.3 (repeated event types in a pattern) end to end."""
import pandas as pd
import pytest

from repro.core.model import Query, Workload
from repro.oracle import assert_equivalent
from repro.oracle_sql import seq_count_sql, workload_count_sql
from repro.runtime.windows import (
    explode_windows,
    explode_windows_pandas,
    n_windows,
)
from repro.synth_data import event_stream, stream_to_spark


class TestWindowMath:
    @pytest.mark.parametrize(
        "t,within,slide,expected",
        [
            (0, 100, 50, [0]),
            (49, 100, 50, [0]),
            (50, 100, 50, [0, 1]),
            (149, 100, 50, [1, 2]),
            (150, 100, 50, [2, 3]),
            (0, 100, 100, [0]),  # tumbling
            (99, 100, 100, [0]),
            (100, 100, 100, [1]),
        ],
    )
    def test_single_event_windows(self, t, within, slide, expected):
        pdf = pd.DataFrame({"time": [t], "key": [0], "type": ["A"]})
        out = explode_windows_pandas(pdf, within=within, slide=slide)
        assert sorted(out["wid"].tolist()) == expected

    def test_replication_factor(self):
        pdf = event_stream(n_events=500, types=["A"], duration=1000, seed=0)
        out = explode_windows_pandas(pdf, within=100, slide=50)
        # Interior events belong to exactly within/slide = 2 windows.
        assert len(out) <= 2 * len(pdf)
        interior = pdf[pdf["time"] >= 50]
        assert len(out) == 2 * len(interior) + (len(pdf) - len(interior))

    def test_n_windows(self):
        assert n_windows(1000, within=100, slide=50) == 20
        assert n_windows(0, within=100, slide=50) == 0
        assert n_windows(1, within=100, slide=50) == 1

    def test_spark_matches_pandas(self, spark):
        pdf = event_stream(n_events=300, types=["A", "B"], duration=500, seed=2)
        got = (
            explode_windows(stream_to_spark(spark, pdf), within=120, slide=60)
            .toPandas()
            .sort_values(["wid", "key", "time", "type"])
            .reset_index(drop=True)
        )
        want = (
            explode_windows_pandas(pdf, within=120, slide=60)
            .sort_values(["wid", "key", "time", "type"])
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(
            got[["time", "key", "type", "wid"]],
            want[["time", "key", "type", "wid"]],
            check_dtype=False,
        )


class TestOracleSqlBuilder:
    def test_two_types(self):
        sql = seq_count_sql(("A", "B"))
        assert "e0.type = 'A'" in sql and "e1.type = 'B'" in sql
        assert "e0.time < e1.time" in sql
        assert "GROUP BY e0.wid, e0.key" in sql

    def test_qid_column(self):
        assert seq_count_sql(("A", "B"), qid=7).startswith("SELECT 7 AS qid")

    def test_workload_union(self):
        sql = workload_count_sql({0: ("A", "B"), 1: ("B", "C")})
        assert sql.count("UNION ALL") == 1

    def test_single_type_pattern(self):
        sql = seq_count_sql(("A",))
        assert "e0.type = 'A'" in sql and "UNION" not in sql


class TestRepeatedTypes:
    """Section 7.3: an event type occurring k times in a pattern."""

    def test_kernel_engine_against_oracle(self, spark):
        wl = Workload.from_patterns(
            [("A", "B", "A"), ("B", "A", "B"), ("A", "A")],
            within=120,
            slide=60,
        )
        pdf = event_stream(
            n_events=200, types=["A", "B", "C"], n_keys=3, duration=400, seed=9
        )
        from repro.runtime.sharon import run_plan

        got = run_plan(stream_to_spark(spark, pdf), wl, None).select(
            "qid", "wid", "key", "cnt"
        )
        exploded = explode_windows_pandas(pdf, within=120, slide=60)
        assert_equivalent(
            got,
            workload_count_sql({q.qid: q.pattern for q in wl}),
            ev=exploded,
        )

    def test_streaming_with_repeated_types(self):
        from repro.runtime.aseq import run_aseq_pandas
        from repro.runtime.streaming import MicroBatchExecutor, time_chunks

        wl = Workload.from_patterns([("A", "A", "B")], within=100, slide=50)
        pdf = event_stream(
            n_events=150, types=["A", "B"], n_keys=2, duration=300, seed=4
        )
        ex = MicroBatchExecutor(wl)
        for chunk in time_chunks(pdf, 4):
            ex.process_batch(chunk)
        want, _ = run_aseq_pandas(pdf, wl)
        got = ex.results()
        pd.testing.assert_frame_equal(
            got.sort_values(["wid", "key"]).reset_index(drop=True)[
                ["wid", "key", "cnt"]
            ],
            want.sort_values(["wid", "key"]).reset_index(drop=True)[
                ["wid", "key", "cnt"]
            ],
            check_dtype=False,
        )


class TestQueryModel:
    def test_invalid_window(self):
        with pytest.raises(ValueError):
            Query(qid=0, pattern=("A",), within=0)

    def test_empty_pattern(self):
        with pytest.raises(ValueError):
            Query(qid=0, pattern=())

    def test_workload_event_types(self):
        wl = Workload.from_patterns([("A", "B"), ("B", "C")])
        assert wl.event_types == {"A", "B", "C"}

    def test_find_leftmost(self):
        q = Query(qid=0, pattern=("A", "B", "A", "B"))
        assert q.find(("A", "B")) == 0
        assert q.find(("B", "A")) == 1
        assert q.find(("X",)) == -1
