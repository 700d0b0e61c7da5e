"""Tests for the Table 3/4 renderers and the Table 2 parameter grid."""
from repro.experiments.harness import ALGORITHMS
from repro.experiments.params import FLOORS, OBJECTS, S2T, TI, Settings
from repro.experiments.tables import PAPER_TABLE3, PAPER_TABLE4, render_table


def test_paper_tables_cover_all_columns():
    cols = {(qt, alg) for qt in ("FPQ", "LCPQ") for alg in ALGORITHMS}
    assert set(PAPER_TABLE3) == cols
    assert set(PAPER_TABLE4) == cols


def test_paper_table3_spot_values():
    assert PAPER_TABLE3[("FPQ", "")]["running_time_ms"] == 584
    assert PAPER_TABLE3[("LCPQ", "-NT")]["hit_rate_pct"] == 60
    assert PAPER_TABLE4[("FPQ", "-GTG")]["running_time_ms"] == 25559


def test_render_includes_measured_and_paper():
    measured = {
        col: dict(
            running_time_ms=1.0,
            memory_kb=2.0,
            hit_rate_pct=50.0,
            relative_error=0.5,
        )
        for col in PAPER_TABLE3
    }
    out = render_table(measured, PAPER_TABLE3, "Test Table")
    assert "Test Table" in out
    assert "584 / 1" in out  # paper / ours side by side
    assert "FPQ-GTG" in out and "LCPQ-NT" in out


def test_render_handles_missing_measurements():
    out = render_table({}, PAPER_TABLE3, "Empty")
    assert "—" in out


def test_table2_grid_matches_paper():
    assert FLOORS == (3, 5, 7, 9)
    assert OBJECTS == (300, 600, 900, 1200, 1500)
    assert TI == (5.0, 10.0, 15.0, 20.0)
    assert S2T == (900.0, 1100.0, 1300.0, 1500.0, 1700.0)
    s = Settings()
    assert (s.floors, s.obj_max, s.ti, s.s2t) == (5, 600, 10.0, 1300.0)


def test_tick_l_alignment():
    assert Settings(t_q=300.0, ti=10.0).tick_l == 30
    assert Settings(t_q=300.0, ti=20.0).tick_l == 15
