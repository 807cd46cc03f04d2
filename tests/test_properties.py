"""Property-based tests (hypothesis) for the pure components: diff-stream
semantics, ordering objective, TSP invariants, GVDL round-tripping.
"""
import numpy as np
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.tsp import christofides, tour_length, two_opt
from repro.gvdl import parse_predicate, to_sql
from repro.gvdl.parser import BinOp, Ident, Lit

# ------------------------------------------------------- diff-set algebra
bits_matrix = st.lists(
    st.lists(st.booleans(), min_size=3, max_size=6),
    min_size=1,
    max_size=30,
).filter(lambda rows: len({len(r) for r in rows}) == 1)


def diffs_of(bits: np.ndarray, order: list[int]) -> np.ndarray:
    """Reference diff computation: flips of the zero-prefixed sequence."""
    b = bits[:, order].astype(int)
    prev = np.concatenate([np.zeros((len(b), 1), dtype=int), b[:, :-1]], axis=1)
    return b - prev


@given(bits_matrix, st.randoms())
@settings(max_examples=40, deadline=None)
def test_prefix_sums_reconstruct_any_ordering(rows, rnd):
    """Σ_{s≤t} δC_s == GV_t for every t under any column ordering."""
    bits = np.array(rows, dtype=bool)
    k = bits.shape[1]
    order = list(range(k))
    rnd.shuffle(order)
    d = diffs_of(bits, order)
    acc = np.cumsum(d, axis=1)
    assert np.array_equal(acc.astype(bool), bits[:, order])


@given(bits_matrix, st.randoms())
@settings(max_examples=40, deadline=None)
def test_diff_count_equals_hamming_path(rows, rnd):
    """Σ_t |δC_t| == Hamming path length through the padded zero column —
    the identity the collection-ordering optimizer relies on (paper §4)."""
    bits = np.array(rows, dtype=bool)
    k = bits.shape[1]
    order = list(range(k))
    rnd.shuffle(order)
    n_diffs = int(np.abs(diffs_of(bits, order)).sum())
    padded = np.concatenate([np.zeros((len(bits), 1), dtype=bool), bits], axis=1)
    cols = [0] + [v + 1 for v in order]
    ham = sum(
        int((padded[:, cols[i]] != padded[:, cols[i + 1]]).sum())
        for i in range(k)
    )
    assert n_diffs == ham


@given(bits_matrix)
@settings(max_examples=30, deadline=None)
def test_row_diff_count_bounds_consecutive_blocks(rows):
    """Theorem 4.1's accounting: per row, cb ≤ diffs ≤ 2·cb (identity order),
    where cb = number of consecutive 1-blocks."""
    bits = np.array(rows, dtype=int)
    d = np.abs(diffs_of(np.array(rows, dtype=bool), list(range(bits.shape[1]))))
    for row, drow in zip(bits, d):
        cb = int(np.sum((row[1:] == 1) & (row[:-1] == 0)) + (row[0] == 1))
        diffs = int(drow.sum())
        if cb:
            assert cb <= diffs <= 2 * cb
        else:
            assert diffs == 0


# --------------------------------------------------------------- TSP props
sym_matrix = st.integers(min_value=3, max_value=9).flatmap(
    lambda n: st.lists(
        st.lists(st.integers(0, 20), min_size=n, max_size=n),
        min_size=n,
        max_size=n,
    )
)


@given(sym_matrix)
@settings(max_examples=30, deadline=None)
def test_christofides_permutation_on_metric_closure(rows):
    d = np.array(rows, dtype=float)
    d = (d + d.T) / 2
    np.fill_diagonal(d, 0)
    n = len(d)
    for k in range(n):  # metric closure
        d = np.minimum(d, d[:, k, None] + d[None, k, :])
    tour = christofides(d)
    assert sorted(tour) == list(range(n))
    refined = two_opt(d, tour)
    assert sorted(refined) == list(range(n))
    assert tour_length(d, refined) <= tour_length(d, tour) + 1e-9


# --------------------------------------------------------------- GVDL props
idents = st.sampled_from(["duration", "year", "src.city", "dst.state"])
numbers = st.integers(min_value=-999, max_value=9999)
cmp_ops = st.sampled_from(["=", "!=", "<", "<=", ">", ">="])


@st.composite
def predicates(draw, depth=0):
    if depth >= 3 or draw(st.booleans()):
        left = draw(idents)
        op = draw(cmp_ops)
        right = draw(numbers)
        return f"{left} {op} {right}"
    a = draw(predicates(depth=depth + 1))
    b = draw(predicates(depth=depth + 1))
    conn = draw(st.sampled_from(["and", "or"]))
    neg = draw(st.booleans())
    expr = f"({a}) {conn} ({b})"
    return f"not ({expr})" if neg else expr


@given(predicates())
@settings(max_examples=60, deadline=None)
def test_predicate_parse_and_compile_total(pred):
    """Every generated predicate parses, and its SQL compilation only
    contains expected tokens (no crashes, no qualifier leakage)."""
    ast = parse_predicate(pred)
    sql = to_sql(ast)
    assert "src." not in sql and "dst." not in sql
    # re-parsing the SQL's column names must be consistent
    assert isinstance(ast, (BinOp, Ident, Lit)) or ast is not None


@given(predicates())
@settings(max_examples=30, deadline=None)
def test_parse_is_deterministic(pred):
    assert parse_predicate(pred) == parse_predicate(pred)
