"""End-to-end tests for the SubTab algorithm (Alg 2) + interactive path."""
import numpy as np
import pytest

from repro.core.interactive import InteractiveSubTab, nc_select_pdf
from repro.core.subtab import SubTab
from repro.util import RID


@pytest.fixture(scope="module")
def sp(prep_sp):
    return prep_sp


def test_preprocess_artifacts(sp):
    assert sp.st.bt is not None and sp.st.vectors is not None
    assert sp.st.timings["preprocess"] > 0
    assert set(sp.st.timings) >= {"bin", "embed", "preprocess"}


def test_vectors_cover_all_tokens(sp):
    binned = sp.bt.binned_pandas()
    missing = [
        f"{c}={v}"
        for c in binned.columns
        for v in binned[c].astype(str).unique()
        if sp.st.vectors.get(f"{c}={v}") is None
    ]
    assert not missing


@pytest.mark.parametrize("k,l", [(5, 4), (10, 8), (3, 15)])
def test_select_dimensions(sp, k, l):
    sub = sp.st.select(k, l, targets=sp.ds.targets)
    assert len(sub.rids) == min(k, sp.bt.n_rows)
    assert len(sub.cols) == min(l, len(sp.bt.columns))
    assert len(set(sub.rids)) == len(sub.rids)


def test_select_includes_targets(sp):
    sub = sp.st.select(8, 5, targets=("popularity",))
    assert "popularity" in sub.cols


def test_select_l_larger_than_m(sp):
    sub = sp.st.select(5, 100, targets=sp.ds.targets)
    assert set(sub.cols) == set(sp.bt.columns)


def test_select_where_restricts_rows(sp):
    sub = sp.st.select(6, 6, where="popularity > 60", targets=sp.ds.targets)
    raw = sub.raw_pandas(sp.bt)
    assert (raw["popularity"] > 60).all()


def test_select_use_cols_restricts_columns(sp):
    cols = ["danceability", "energy", "genre", "popularity"]
    sub = sp.st.select(5, 3, use_cols=cols, targets=("popularity",))
    assert set(sub.cols) <= set(cols)
    assert "popularity" in sub.cols


def test_select_timing_recorded(sp):
    sp.st.select(5, 5, targets=sp.ds.targets)
    assert 0 < sp.st.timings["select"]


def test_subtable_views(sp):
    sub = sp.st.select(5, 5, targets=sp.ds.targets)
    raw = sub.raw_pandas(sp.bt)
    binned = sub.binned_pandas(sp.bt)
    assert raw.shape == binned.shape == (5, 5)
    assert list(raw.index) == list(binned.index) == sorted(sub.rids)
    assert list(raw.columns) == sub.cols


def test_select_rows_are_spread(sp):
    """Centroid rows should be more diverse than the table average."""
    sub = sp.st.select(10, len(sp.bt.columns), targets=sp.ds.targets)
    div = sp.fe.diversity(sp.fe.positions(sub.rids), sub.cols)
    g = np.random.default_rng(0)
    rand_divs = [
        sp.fe.diversity(
            g.choice(sp.fe.n, size=10, replace=False), sub.cols
        )
        for _ in range(20)
    ]
    assert div >= np.mean(rand_divs) - 0.1


def test_select_deterministic(sp):
    a = sp.st.select(6, 6, targets=sp.ds.targets, seed=42)
    b = sp.st.select(6, 6, targets=sp.ds.targets, seed=42)
    assert a.rids == b.rids and a.cols == b.cols


def test_with_vectors_injection(sp):
    st2 = SubTab(seed=0).with_vectors(sp.bt, sp.st.vectors)
    sub = st2.select(5, 5, targets=sp.ds.targets)
    assert len(sub.rids) == 5


# ----------------------------------------------------------- interactive
@pytest.fixture(scope="module")
def ist(sp):
    return InteractiveSubTab.from_subtab(sp.st, seed=0)


def test_interactive_alignment(ist, sp):
    assert ist.row_vecs.shape == (sp.bt.n_rows, sp.st.vectors.dim)
    assert (ist.binned_pdf.index == sorted(ist.binned_pdf.index)).all()


def test_interactive_select_shape(ist, sp):
    sub = ist.select(10, 6, targets=sp.ds.targets)
    assert len(sub.rids) == 10 and len(sub.cols) == 6
    assert "popularity" in sub.cols


def test_interactive_select_on_query(ist):
    rows = np.flatnonzero(
        ist.binned_pdf["genre"].astype(str).to_numpy() == "pop"
    )
    sub = ist.select(5, 5, rows=rows)
    assert set(sub.rids) <= {int(ist.binned_pdf.index[r]) for r in rows}


def test_interactive_row_vectors_match_spark(ist, sp):
    """Row vectors collected by the interactive path equal a direct
    recomputation from the token vectors."""
    binned = ist.binned_pdf
    ridx = 7
    toks = [f"{c}={binned.iloc[ridx][c]}" for c in binned.columns]
    vecs = [sp.st.vectors.get(t) for t in toks]
    vecs = [v for v in vecs if v is not None]
    expect = np.mean(vecs, axis=0)
    assert np.allclose(ist.row_vecs[ridx], expect, atol=1e-9)


def test_interactive_small_result(ist):
    sub = ist.select(10, 4, rows=np.array([0, 1, 2]))
    assert len(sub.rids) == 3


def test_nc_select_pdf_shapes(sp):
    raw = sp.raw_pandas()
    sub = nc_select_pdf(raw, 8, 5, targets=sp.ds.targets, seed=0)
    assert len(sub.rids) == 8 and len(sub.cols) == 5
    assert "popularity" in sub.cols


def test_nc_select_pdf_row_subset(sp):
    raw = sp.raw_pandas()
    rows = np.arange(40)
    sub = nc_select_pdf(raw, 5, 4, rows=rows, seed=0)
    assert set(sub.rids) <= set(int(raw.index[r]) for r in rows)
