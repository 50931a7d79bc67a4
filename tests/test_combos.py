"""Unit tests for path → feature-combination mining (§IV-B1)."""
from repro.core.combos import FeatureCombo, mine_combos


def test_single_path_pairs():
    paths = [[(0, 1.0), (1, 2.0), (2, 3.0)]]
    combos = mine_combos(paths, sizes=(2,))
    feats = {c.features for c in combos}
    assert feats == {(0, 1), (0, 2), (1, 2)}


def test_cross_path_pairs_not_mined():
    """Features on *different* paths must not pair (the SAFE assumption)."""
    paths = [[(0, 1.0)], [(1, 2.0)]]
    combos = mine_combos(paths, sizes=(2,))
    assert combos == []


def test_duplicate_combo_merges_split_values():
    paths = [[(0, 1.0), (1, 2.0)], [(0, 5.0), (1, 2.0)]]
    combos = mine_combos(paths, sizes=(2,))
    assert len(combos) == 1
    c = combos[0]
    assert c.features == (0, 1)
    assert c.split_values == ((1.0, 5.0), (2.0,))


def test_repeated_feature_on_path_collects_values():
    """x0 splitting twice on one path → V_0 has both values."""
    paths = [[(0, 1.0), (1, 2.0), (0, 3.0)]]
    combos = mine_combos(paths, sizes=(2,))
    assert len(combos) == 1
    assert combos[0].split_values == ((1.0, 3.0), (2.0,))


def test_unary_size_mining():
    paths = [[(0, 1.0), (1, 2.0)]]
    combos = mine_combos(paths, sizes=(1,))
    assert {c.features for c in combos} == {(0,), (1,)}


def test_n_cells_product_formula():
    c = FeatureCombo(features=(0, 1), split_values=((1.0, 2.0), (5.0,)))
    assert c.n_cells() == 3 * 2  # (|V_0|+1)(|V_1|+1)


def test_max_cells_guard_drops_exploding_combos():
    path = [(0, float(v)) for v in range(100)] + [(1, 0.5)]
    combos = mine_combos([path], sizes=(2,), max_cells=50)
    assert combos == []
    combos = mine_combos([path], sizes=(2,), max_cells=1000)
    assert len(combos) == 1


def test_deterministic_order():
    paths = [[(2, 1.0), (0, 2.0), (1, 3.0)]]
    c1 = mine_combos(paths, sizes=(2,))
    c2 = mine_combos(list(paths), sizes=(2,))
    assert c1 == c2
    assert [c.features for c in c1] == sorted(c.features for c in c1)


def test_combo_sizes_one_and_two_together():
    paths = [[(0, 1.0), (1, 2.0)]]
    combos = mine_combos(paths, sizes=(1, 2))
    sizes = sorted(c.size for c in combos)
    assert sizes == [1, 1, 2]
