"""Unit tests for the pricing and performance models (paper SII-B, SVI)."""
import pytest

from repro.costmodel.perf import PerfModel, Phase
from repro.costmodel.pricing import GB, CostBreakdown, Pricing
from repro.s3sim.usage import Usage

P = Pricing()
M = PerfModel()


# -- pricing ---------------------------------------------------------------

def test_scan_price_per_gb():
    c = P.cost(Usage(bytes_scanned=GB), 0.0)
    assert c.scan == pytest.approx(0.002)


def test_return_price_per_gb():
    c = P.cost(Usage(bytes_returned=2 * GB), 0.0)
    assert c.transfer == pytest.approx(0.0014)


def test_transfer_within_region_free():
    c = P.cost(Usage(bytes_transferred=10 * GB), 0.0)
    assert c.transfer == 0.0


def test_request_price_per_thousand():
    c = P.cost(Usage(get_requests=1000), 0.0)
    assert c.requests == pytest.approx(0.0004)


def test_compute_price_prorated_hourly():
    c = P.cost(Usage(), 3600.0)
    assert c.compute == pytest.approx(2.128)


def test_total_sums_components():
    c = CostBreakdown(compute=1.0, requests=0.25, scan=0.5, transfer=0.25)
    assert c.total == 2.0


def test_cost_breakdown_add():
    a = CostBreakdown(1, 2, 3, 4)
    b = CostBreakdown(10, 20, 30, 40)
    assert (a + b).total == a.total + b.total


def test_paper_example_server_vs_s3_filter():
    """The paper's qualitative cost story for Fig 1 at 10 GB.

    Server-side: ~27s of compute, no S3 Select charges.
    S3-side: 10 GB scanned + small return + a few seconds of compute.
    S3-side ends up somewhat more expensive (paper: +24%).
    """
    server = P.cost(Usage(get_requests=16, bytes_transferred=10 * GB), 27.0)
    s3 = P.cost(
        Usage(select_requests=16, bytes_scanned=10 * GB, bytes_returned=GB // 100),
        3.0,
    )
    assert s3.total > server.total
    assert s3.total / server.total < 2.0


# -- perf model ------------------------------------------------------------

def _scan_phase(bytes_scanned, n_objects=16, **kw):
    return Phase(
        "t", usage=Usage(select_requests=n_objects, bytes_scanned=bytes_scanned),
        n_objects=n_objects, **kw,
    )


def test_scan_time_scales_with_bytes():
    small = M.phase_time(_scan_phase(GB))
    big = M.phase_time(_scan_phase(10 * GB))
    assert big > small


def test_scan_parallelism_caps_at_max():
    def phase(n_objects):
        # Fixed request count so only scan parallelism varies.
        return Phase(
            "t", usage=Usage(select_requests=16, bytes_scanned=10 * GB),
            n_objects=n_objects,
        )

    few = M.phase_time(phase(4))
    many = M.phase_time(phase(16))
    over = M.phase_time(phase(64))
    assert few > many
    assert over == pytest.approx(many)  # parallelism saturates at the cap


def test_network_can_bottleneck():
    p = Phase("t", usage=Usage(bytes_returned=10 * GB), n_objects=16)
    t = M.phase_time(p)
    assert t >= 10 * GB / M.net_bw


def test_case_columns_slow_the_scan():
    plain = M.phase_time(_scan_phase(GB))
    casey = M.phase_time(_scan_phase(GB, case_columns=40))
    assert casey > 2 * plain


def test_request_storm_dominates():
    """Fig 1's indexing collapse: per-request CPU at 100k+ GETs."""
    storm = Phase(
        "fetch", usage=Usage(get_requests=600_000, bytes_transferred=60_000_000),
        n_objects=16,
    )
    assert M.phase_time(storm) > 30.0


def test_heap_slower_than_agg():
    heap = Phase("t", heap_rows=10_000_000)
    agg = Phase("t", agg_rows=10_000_000)
    assert M.phase_time(heap) > M.phase_time(agg)


def test_hash_join_rows_cost():
    t = M.phase_time(Phase("t", hash_rows=25_000_000))
    assert t >= 1.0


def test_runtime_sums_serial_phases():
    phases = [_scan_phase(GB), _scan_phase(GB)]
    assert M.runtime(phases) == pytest.approx(2 * M.phase_time(phases[0]))


def test_runtime_parallel_group_takes_max():
    a = _scan_phase(GB)
    b = _scan_phase(4 * GB)
    a.parallel_group = b.parallel_group = "p2"
    assert M.runtime([a, b]) == pytest.approx(M.phase_time(b))


def test_runtime_mixes_serial_and_parallel():
    s = _scan_phase(GB)
    a = _scan_phase(GB)
    b = _scan_phase(2 * GB)
    a.parallel_group = b.parallel_group = "x"
    total = M.runtime([s, a, b])
    assert total == pytest.approx(M.phase_time(s) + M.phase_time(b))


def test_phase_startup_floor():
    assert M.phase_time(Phase("t")) >= M.phase_startup


def test_select_responses_parse_slower_than_bulk():
    sel = Phase("t", usage=Usage(bytes_returned=10 * GB))
    bulk = Phase("t", usage=Usage(bytes_transferred=10 * GB))
    assert M.phase_time(sel) > M.phase_time(bulk)
