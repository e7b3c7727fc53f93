"""Watchdog tests: real timeouts via Spark job-group cancellation."""
import time

import pytest

from repro.timeout import CellResult, TimeoutError_, run_with_timeout


def test_returns_value(spark):
    assert run_with_timeout(spark, lambda: 42, 10.0) == 42


def test_propagates_exception(spark):
    def boom():
        raise RuntimeError("inner")

    with pytest.raises(RuntimeError, match="inner"):
        run_with_timeout(spark, boom, 10.0)


def test_times_out_on_slow_body(spark):
    def slow():
        time.sleep(8)
        return 1

    t0 = time.time()
    with pytest.raises(TimeoutError_):
        run_with_timeout(spark, slow, 1.0)
    assert time.time() - t0 < 7


def test_times_out_on_slow_spark_job(spark):
    def slow_job():
        return (
            spark.range(0, 200)
            .rdd.map(lambda x: time.sleep(1.0) or x)
            .count()
        )

    with pytest.raises(TimeoutError_):
        run_with_timeout(spark, slow_job, 2.0)


def test_cell_result_defaults():
    r = CellResult(status="ok", value=7, seconds=0.5)
    assert r.status == "ok" and r.value == 7 and r.detail == ""
