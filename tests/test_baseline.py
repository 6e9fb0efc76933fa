"""Tests for the CC baseline build-up (paper §3's comparison point).

The baseline must be *functionally identical* to Motivo's build-up —
same counts for every (v, T, C) — while using CC's representations
(string instances + per-pair recursive check-and-merge + 64-bit counts
+ fully memory-resident tables). That functional equality is what makes
the speed/space comparisons meaningful.
"""
import pytest

from repro.core import baseline, buildup, treelet as tl
from repro.graphs import generators as gen


@pytest.mark.parametrize("t", [t for h in range(1, 7) for t in tl.rooted_shapes(6)[h]])
def test_instance_string_roundtrip(t):
    """CC representative instances encode/decode losslessly."""
    assert baseline.str_to_enc(baseline.enc_to_str(t)) == t


def test_instance_string_shape():
    # singleton = "", 2-path rooted = "()", 3-star rooted center = "()()"
    assert baseline.enc_to_str(tl.SINGLETON) == ""
    assert baseline.enc_to_str(tl.path_rooted(2)) == "()"
    assert baseline.enc_to_str(tl.star_rooted(3)) == "()()"
    assert baseline.enc_to_str(tl.path_rooted(3)) == "(())"


def test_check_and_merge_agrees_with_succinct():
    """The recursive check-and-merge accepts exactly the valid merges and
    produces the same merged shape as the bitwise merge."""
    shapes = [t for h in range(1, 5) for t in tl.rooted_shapes(5)[h]]
    for tp in shapes:
        for ts in shapes:
            if tl.size(tp) + tl.size(ts) > 5:
                continue
            got = baseline._check_and_merge(baseline.enc_to_str(tp), baseline.enc_to_str(ts))
            if tl.is_valid_merge(tp, ts):
                assert got == baseline.enc_to_str(tl.merge(tp, ts))
            else:
                assert got is None


@pytest.mark.parametrize("k", [3, 4])
def test_cc_tables_equal_motivo_tables(spark, k):
    """Same seed => identical counts from both build-ups."""
    g = gen.er_graph(25, 70, seed=60)
    motivo = buildup.build_tables(spark, g, k, seed=61, zero_rooting=False)
    cc_levels, cc_colors, _ = baseline.build_tables_cc(spark, g, k, seed=61)
    assert (cc_colors == motivo.colors).all()
    for h in range(1, k + 1):
        m = {
            (int(r.v), int(r.t), int(r.c)): int(r.cnt)
            for r in motivo.levels[h].toPandas().itertuples()
        }
        c = {
            (int(r.v), baseline.str_to_enc(r.t), int(r.c)): int(r.cnt)
            for r in cc_levels[h].toPandas().itertuples()
        }
        assert m == c


def test_cc_counters_are_int64(spark):
    g = gen.er_graph(20, 50, seed=62)
    cc_levels, _, _ = baseline.build_tables_cc(spark, g, 3, seed=63)
    assert dict(cc_levels[3].dtypes)["cnt"] == "bigint"


def test_overflow_detection(spark):
    """Motivo's decimal counts reveal when CC's 64-bit counters would
    overflow; a normal small graph must NOT trip the detector."""
    g = gen.er_graph(20, 50, seed=64)
    tables = buildup.build_tables(spark, g, 3, seed=65)
    assert baseline.check_overflow_risk(tables) is False
    assert baseline.INT64_MAX == 2**63 - 1


def test_cached_table_bytes_positive(spark):
    g = gen.er_graph(30, 80, seed=66)
    baseline.build_tables_cc(spark, g, 3, seed=67)
    assert baseline.cached_table_bytes(spark) > 0
