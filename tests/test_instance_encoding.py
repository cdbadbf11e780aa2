"""Instance-based NV encoding tests (§4.1)."""
import numpy as np

from repro.core.plan import JOIN_TYPES, node_count
from repro.encoding.instance import Vocab, encode_tree, norm_const, schema_vocab
from repro.solver.linexpr import OPS
from repro.workload.generator import random_plans
from repro.workload.schema import TPCDS_LITE, TPCH_LITE
from tests.test_plan import fig1_q1


def _ab_vocab() -> Vocab:
    return Vocab(
        ("A", "B"),
        ("A.joinKey", "A.val", "A.x", "B.joinKey", "B.val", "B.y"),
    )


def test_nv_size_formula():
    v = schema_vocab(TPCH_LITE)
    n_c = sum(len(t.columns) for t in TPCH_LITE.tables)
    assert v.n_c == n_c
    assert v.nv_size == 4 + 3 * n_c + 2 * len(OPS) + len(JOIN_TYPES) + 2


def test_segments_partition_vector():
    v = _ab_vocab()
    assert v.off_join_cl == v.n_t
    assert v.off_sel_c == v.n_t + 2 * v.n_c + len(OPS) + len(JOIN_TYPES)
    assert v.off_null == v.nv_size - 1


def test_encode_shapes_and_children():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    m = node_count(fig1_q1())
    assert enc.X.shape == (m, v.nv_size)
    # BFS: Project, Filter, Filter, Join, ScanA, ScanB
    assert enc.left.tolist() == [1, 2, 3, 4, -1, -1]
    assert enc.right.tolist() == [-1, -1, -1, 5, -1, -1]


def test_scan_nodes_one_hot_table_only():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    for i in (4, 5):
        row = enc.X[i]
        assert row[: v.n_t].sum() == 1.0
        assert row[v.n_t :].sum() == 0.0


def test_join_node_segments():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    row = enc.X[3]  # the Join node
    cl = row[v.off_join_cl : v.off_join_cl + v.n_c]
    cr = row[v.off_join_cr : v.off_join_cr + v.n_c]
    assert cl.sum() == 1.0 and cr.sum() == 1.0
    assert cl[v.col_idx("A.joinKey")] == 1.0
    assert cr[v.col_idx("B.joinKey")] == 1.0
    assert row[v.off_join_op + OPS.index("=")] == 1.0


def test_single_column_filter_in_select_segment():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    row = enc.X[1]  # Filter B.val > 10
    assert row[v.off_sel_c + v.col_idx("B.val")] == 1.0
    assert row[v.off_sel_op + OPS.index(">")] == 1.0
    assert abs(row[v.off_const] - norm_const(10.0)) < 1e-6


def test_two_column_filter_uses_join_segment_with_const():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    row = enc.X[2]  # Filter A.val > B.val + 10
    assert row[v.off_join_cl + v.col_idx("A.val")] == 1.0
    assert row[v.off_join_cr + v.col_idx("B.val")] == 1.0
    assert abs(row[v.off_const] - norm_const(10.0)) < 1e-6
    # but it is not a join: join-type segment zero
    assert row[v.off_join_jt : v.off_join_jt + len(JOIN_TYPES)].sum() == 0.0


def test_project_multi_hot():
    v = _ab_vocab()
    enc = encode_tree(fig1_q1(), v)
    row = enc.X[0]
    sel = row[v.off_sel_c : v.off_sel_c + v.n_c]
    assert abs(sel.sum() - 2.25) < 1e-6  # 1.0 + (1 + 0.25): position-weighted
    assert sel[v.col_idx("A.x")] == 1.0  # position 0
    assert sel[v.col_idx("B.y")] == 1.25  # position 1


def test_project_position_weights_distinguish_order():
    from repro.core.plan import Col, Project

    v = _ab_vocab()
    child = fig1_q1().child
    xy = encode_tree(Project((Col("A", "x"), Col("B", "y")), child), v)
    yx = encode_tree(Project((Col("B", "y"), Col("A", "x")), child), v)
    assert not np.array_equal(xy.X[0], yx.X[0])


def test_norm_const_bounded_and_monotone():
    vals = [-1e6, -60, -10, 0, 10, 60, 1e6]
    out = [norm_const(x) for x in vals]
    assert all(-2 <= x <= 2 for x in out)
    assert out == sorted(out)
    # linear (not saturating) inside the fuzzer's constant range:
    assert abs((norm_const(40) - norm_const(30)) - 10 / 64) < 1e-9


def test_encoding_deterministic_across_random_plans():
    v = schema_vocab(TPCDS_LITE)
    for p in random_plans(TPCDS_LITE, 15, seed=8):
        a, b = encode_tree(p, v), encode_tree(p, v)
        assert np.array_equal(a.X, b.X)
        assert np.array_equal(a.left, b.left)
        assert a.X.shape[1] == v.nv_size
