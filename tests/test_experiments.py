"""Table harnesses (experiments/tables.py): structure + paper-shape checks.

These are the integration tests that assert the *shape* claims of the paper
hold in our reproduction (ratios/orderings, not absolute seconds).
"""
import pytest

from repro.experiments import tables as T


def _cols(row, headers, name):
    return row[headers.index(name)]


@pytest.fixture(scope="module")
def results():
    # Build the cheap-but-shared tables once.
    return {
        "t04": T.table04(),
        "t05": T.table05(),
        "t09": T.table09(),
        "t11": T.table11(),
        "t13": T.table13(),
    }


def test_render_is_markdown(results):
    md = results["t04"].render()
    assert md.startswith("### Table 4")
    assert "| model |" in md


def test_table04_private_shared_sum_to_64(results):
    t = results["t04"]
    for row in t.rows:
        private = _cols(row, t.headers, "ours private")
        shared = _cols(row, t.headers, "ours shared")
        assert private + shared == 64  # every model stores 64 pages


def test_table05_totals_near_paper(results):
    t = results["t05"]
    totals = {row[0]: row[-2] for row in t.rows}
    assert totals["pages shared by 5 models"] == 51  # exactly Table 5
    assert abs(totals["pages shared by 4 models"] - 6) <= 2
    assert abs(totals["pages shared by 3 models"] - 5) <= 2
    assert abs(totals["private pages"] - 24) <= 6


def test_table09_orderings(results):
    t = results["t09"]
    by = {row[0]: row for row in t.rows}
    n = {k: v[t.headers.index("ours blocks w/ dedup")] for k, v in by.items()}
    assert n["mistique-exact"] == 2040
    assert n["mistique-approx"] >= n["proposed-l2lsh"] - 5
    for k in ("mistique-approx", "enhanced-pairwise", "proposed-l2lsh"):
        assert n[k] < 750  # similarity methods all compress far beyond exact


def test_table11_orderings(results):
    t = results["t11"]
    for row in t.rows:
        cells = [c.split(" / ") for c in row[1:]]
        ours = {name: int(c[1]) for name, c in zip(["baseline", "two-stage", "greedy1", "greedy2"], cells)}
        assert ours["two-stage"] <= ours["greedy1"]
        assert ours["two-stage"] <= ours["baseline"]
        assert ours["baseline"] >= 1.1 * ours["two-stage"]  # misalignment cost


def test_table13_reuse_majority(results):
    t = results["t13"]
    for row in t.rows[1:]:
        reused = int(row[2].split(" / ")[1])
        discarded = int(row[3].split(" / ")[1])
        assert reused / (reused + discarded) >= 0.7


@pytest.mark.slow
def test_table01_shapes():
    t = T.table01()
    for row in t.rows:
        n, disk, p_nod, nod, p_ded, ded = row
        assert ded < nod  # dedup+optimized always wins
    # latency grows with model count on each disk
    ssd = [r[3] for r in t.rows if r[1] == "SSD"]
    assert ssd == sorted(ssd)


@pytest.mark.slow
def test_table02_shapes():
    t = T.table02()
    for row in t.rows:
        disk, pool, p1, nod, p2, ded, p3, opt = row
        assert opt <= ded <= nod * 1.01
    hdd8 = next(r for r in t.rows if r[0] == "HDD" and r[1] == "8GB")
    hdd15 = next(r for r in t.rows if r[0] == "HDD" and r[1] == "15GB")
    # the pathological small-pool HDD case collapses only with optimized caching
    assert hdd8[3] > 1.5 * hdd15[3]
    assert hdd8[7] < 0.6 * hdd8[5]


@pytest.mark.slow
def test_table03_failure_pattern_matches_paper():
    t = T.table03()
    for row in t.rows:
        for cell in row[1:]:
            paper, ours = [c.strip() for c in cell.split("/")]
            assert (paper == "Failed") == (ours == "Failed"), (row[0], cell)


@pytest.mark.slow
def test_table08_failure_pattern_matches_paper():
    t = T.table08()
    for row in t.rows:
        for cell in row[1:]:
            paper, ours = [c.strip() for c in cell.split("/")]
            assert (paper == "Failed") == (ours == "Failed"), (row[0], cell)


@pytest.mark.slow
def test_table10_drop_pattern():
    t = T.table10()
    for row in t.rows:
        ours = [float(c.split("/")[1].strip().rstrip("%")) for c in row[1:]]
        assert ours[0] == 0.0 and ours[1] <= 0.5  # models 1-2 unharmed
        if row[0] != "mistique-exact":
            assert 2.5 <= ours[2] <= 5.0  # model 3 near the threshold
        else:
            assert all(v == 0 for v in ours)


@pytest.mark.slow
def test_fig8_optimized_beats_baselines():
    t = T.table_fig8()
    by = {}
    for row in t.rows:
        by.setdefault(row[0], {})[row[1]] = float(row[2])
    for workload, ratios in by.items():
        best_classic = max(ratios["LRU"], ratios["MRU"], ratios["LFU"])
        assert ratios["Optimized-M"] > best_classic
        assert ratios["Optimized-M"] >= ratios["LocalitySet-M"]
        assert ratios["Optimized-M"] / ratios["LRU"] >= 1.1


@pytest.mark.slow
def test_table14_shapes():
    t = T.table14()
    ratios = {row[0]: float(row[4].rstrip("%")) for row in t.rows}
    assert ratios["dedup+pruning"] < ratios["pruning"]
    assert ratios["dedup+quant"] < ratios["quantization"]
    assert ratios["dedup+quant"] < ratios["dedup"]


def test_run_all_subset():
    out = T.run_all(["table05"])
    assert len(out) == 1 and out[0].name == "Table 5"
