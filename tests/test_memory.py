"""Device-memory model tests."""
import pytest

from repro.memory import (
    CPU_MEM_BYTES,
    GPU_MEM_BYTES,
    MemoryMeter,
    OutOfMemoryError,
)


def test_budgets_scaled_like_paper():
    # 190 GB / 32 GB host-to-device ratio preserved.
    assert abs(CPU_MEM_BYTES / GPU_MEM_BYTES - 190 / 32) < 0.01


def test_alloc_free_cycle():
    m = MemoryMeter(1000)
    m.alloc("a", 400)
    m.alloc("b", 500)
    assert m.resident == 900 and m.peak == 900
    m.free("a")
    assert m.resident == 500
    m.free("b")
    assert m.resident == 0 and m.peak == 900


def test_oom_raised_and_described():
    m = MemoryMeter(100)
    m.alloc("graph", 60)
    with pytest.raises(OutOfMemoryError) as ei:
        m.alloc("subgraph_list", 50)
    assert "subgraph_list" in str(ei.value)
    assert ei.value.meter.peak == 110


def test_free_unknown_is_noop():
    m = MemoryMeter(100)
    m.free("never")
    assert m.resident == 0


def test_repeated_alloc_accumulates():
    m = MemoryMeter(1000)
    m.alloc("x", 100)
    m.alloc("x", 100)
    assert m.resident == 200
    m.free("x")
    assert m.resident == 0
