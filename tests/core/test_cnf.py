"""CNFEval (set predicates) and CNFEvalE (inequality predicates) tests.

Both engines are diffed against direct CNF evaluation over randomized
query sets and inputs, plus the paper's worked examples (q1 of §5.1,
q2 / Tables 4-5 of §5.2).
"""
from __future__ import annotations

import random

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.cnf import CNFEval, CNFEvalE, SetCondition, SetQuery
from repro.core.queries import (
    LABELS,
    Condition,
    Query,
    geq_only_queries,
    query_labels,
    random_cnf_queries,
)


# ----------------------------------------------------------------------
# paper worked examples
# ----------------------------------------------------------------------
def test_paper_q1_set_query():
    """q1 = age ∈ {2,3} ∧ (state ∈ {CA} ∨ gender ∈ {F}) — §5.1."""
    q1 = SetQuery(
        1,
        (
            (SetCondition("age", "in", frozenset({2, 3})),),
            (
                SetCondition("state", "in", frozenset({"CA"})),
                SetCondition("gender", "in", frozenset({"F"})),
            ),
        ),
    )
    ev = CNFEval([q1])
    assert ev.evaluate({"age": 3, "gender": "F"}) == {1}
    assert ev.evaluate({"age": 2, "state": "CA"}) == {1}
    assert ev.evaluate({"age": 4, "gender": "F"}) == set()
    assert ev.evaluate({"age": 3, "gender": "M"}) == set()
    assert ev.evaluate({"gender": "F"}) == set()


def test_paper_q2_inequality_query():
    """q2 = (car>=2 ∨ person<=3) ∧ (car>=3 ∨ person>=2) ∧ (car<=5) — §5.2."""
    q2 = Query(
        2,
        (
            (Condition("car", ">=", 2), Condition("person", "<=", 3)),
            (Condition("car", ">=", 3), Condition("person", ">=", 2)),
            (Condition("car", "<=", 5),),
        ),
    )
    ev = CNFEvalE([q2])
    assert ev.evaluate({"car": 3, "person": 0}) == {2}
    assert ev.evaluate({"car": 2, "person": 2}) == {2}
    assert ev.evaluate({"car": 6, "person": 2}) == set()  # car<=5 fails
    assert ev.evaluate({"car": 1, "person": 4}) == set()  # first disj fails
    assert ev.evaluate({"car": 0, "person": 2}) == {2}
    assert ev.evaluate({"car": 0, "person": 5}) == set()


def test_notin_predicates():
    q = SetQuery(
        7,
        (
            (SetCondition("color", "notin", frozenset({"red", "blue"})),),
            (
                SetCondition("size", "in", frozenset({1})),
                SetCondition("shape", "notin", frozenset({"round"})),
            ),
        ),
    )
    ev = CNFEval([q])
    assert ev.evaluate({"color": "green", "shape": "square", "size": 0}) == {7}
    assert ev.evaluate({"color": "red", "shape": "square", "size": 0}) == set()
    assert ev.evaluate({"color": "green", "shape": "round", "size": 1}) == {7}
    assert ev.evaluate({"color": "green", "shape": "round", "size": 0}) == set()
    # absent names: ∉ vacuously true, ∈ false
    assert ev.evaluate({}) == {7}


def test_cnfeval_dynamic_remove():
    qs = [
        SetQuery(0, ((SetCondition("a", "in", frozenset({1})),),)),
        SetQuery(1, ((SetCondition("a", "in", frozenset({1})),),)),
    ]
    ev = CNFEval(qs)
    assert ev.evaluate({"a": 1}) == {0, 1}
    ev.remove(0)
    assert ev.evaluate({"a": 1}) == {1}
    with pytest.raises(KeyError):
        ev.remove(0)


def test_duplicate_qid_rejected():
    q = Query(3, ((Condition("car", ">=", 1),),))
    ev = CNFEvalE([q])
    with pytest.raises(ValueError):
        ev.add(q)


# ----------------------------------------------------------------------
# randomized differentials
# ----------------------------------------------------------------------
@pytest.mark.parametrize("seed", range(10))
def test_cnfevale_random_differential(seed):
    rng = random.Random(seed)
    queries = random_cnf_queries(25, seed=seed, n_hi=6)
    ev = CNFEvalE(queries)
    labels = query_labels(queries)
    for _ in range(60):
        counts = {label: rng.randint(0, 7) for label in labels}
        want = {q.qid for q in queries if q.holds(counts)}
        assert ev.evaluate(counts) == want


@pytest.mark.parametrize("seed", range(6))
def test_cnfeval_random_differential(seed):
    rng = random.Random(seed)
    names = ["a", "b", "c"]
    vals = [0, 1, 2, 3]
    queries = []
    for qid in range(20):
        cnf = tuple(
            tuple(
                SetCondition(
                    rng.choice(names),
                    rng.choice(["in", "notin"]),
                    frozenset(rng.sample(vals, rng.randint(1, 3))),
                )
                for _ in range(rng.randint(1, 2))
            )
            for _ in range(rng.randint(1, 3))
        )
        queries.append(SetQuery(qid, cnf))
    ev = CNFEval(queries)
    for _ in range(50):
        pairs = {n: rng.choice(vals) for n in names if rng.random() < 0.8}
        want = {q.qid for q in queries if q.holds(pairs)}
        assert ev.evaluate(pairs) == want


@settings(max_examples=60, deadline=None)
@given(
    seed=st.integers(0, 10_000),
    counts=st.dictionaries(st.sampled_from(LABELS), st.integers(0, 9)),
)
def test_cnfevale_hypothesis(seed, counts):
    queries = random_cnf_queries(12, seed=seed, n_hi=8)
    full = {label: counts.get(label, 0) for label in query_labels(queries)}
    ev = CNFEvalE(queries)
    assert ev.evaluate(full) == {q.qid for q in queries if q.holds(full)}


# ----------------------------------------------------------------------
# workload generators
# ----------------------------------------------------------------------
@pytest.mark.parametrize("n_min", range(1, 10))
def test_geq_only_workload_nmin(n_min):
    qs = geq_only_queries(100, n_min=n_min, seed=n_min)
    assert len(qs) == 100
    assert all(q.is_geq_only() for q in qs)
    thresholds = [c.n for q in qs for disj in q.cnf for c in disj]
    assert min(thresholds) == n_min


def test_random_cnf_workload_shapes():
    qs = random_cnf_queries(50, seed=1)
    assert len(qs) == 50 and len({q.qid for q in qs}) == 50
    assert any(not q.is_geq_only() for q in qs)
    for q in qs:
        assert 1 <= len(q.cnf) <= 3
        assert all(1 <= len(d) <= 2 for d in q.cnf)


def test_condition_validation():
    with pytest.raises(ValueError):
        Condition("car", "!", 1)
    with pytest.raises(ValueError):
        Condition("car", ">=", -1)
    with pytest.raises(ValueError):
        Query(0, ())
    with pytest.raises(ValueError):
        SetCondition("a", "in", frozenset())
