"""Pipeline tests: MCOS generation × CNFEvalE coupling and §5.3 pruning."""
from __future__ import annotations

import random

import pytest

from repro.core.evaluate import (
    MatchRow,
    QueryPipeline,
    evaluate_stream,
    make_generator,
)
from repro.core.queries import (
    Condition,
    Query,
    geq_only_queries,
    random_cnf_queries,
)


def labeled_stream(n_frames, *, n_objects=10, seed=0, labels=("person", "car", "truck")):
    """(fid, [(oid,label),...]) stream with bursty dwell."""
    rng = random.Random(seed)
    label_of = {o: rng.choice(labels) for o in range(n_objects)}
    spans = {}
    for o in range(n_objects):
        a = rng.randrange(0, max(1, n_frames - 2))
        spans[o] = (a, a + max(2, int(rng.expovariate(1 / 8))))
    out = []
    for fid in range(n_frames):
        objs = [
            (o, label_of[o])
            for o, (a, b) in spans.items()
            if a <= fid <= b and rng.random() > 0.15
        ]
        out.append((fid, objs))
    return out


@pytest.mark.parametrize("seed", range(5))
def test_methods_agree_on_matches(seed):
    """NAIVE_E, MFS_E and SSG_E must produce identical match rows."""
    stream = labeled_stream(50, seed=seed)
    queries = random_cnf_queries(15, seed=seed, labels=("person", "car", "truck"))
    ref = evaluate_stream(stream, queries, w=8, d=4, method="naive")
    for method in ("mfs", "ssg"):
        got = evaluate_stream(stream, queries, w=8, d=4, method=method)
        assert sorted(got, key=str) == sorted(ref, key=str), method


@pytest.mark.parametrize("method", ["mfs", "ssg"])
@pytest.mark.parametrize("seed", range(5))
def test_pruned_variants_match_unpruned(method, seed):
    """MFS_O / SSG_O (§5.3) must return exactly the unpruned results
    for >=-only workloads (Proposition 1)."""
    stream = labeled_stream(60, seed=seed)
    queries = geq_only_queries(30, n_min=1, seed=seed, labels=("person", "car", "truck"))
    plain = evaluate_stream(stream, queries, w=10, d=5, method=method, prune=False)
    pruned = evaluate_stream(stream, queries, w=10, d=5, method=method, prune=True)
    assert sorted(plain, key=str) == sorted(pruned, key=str)


@pytest.mark.parametrize("method", ["naive", "mfs", "ssg"])
def test_pruning_reduces_states(method):
    """With a high n_min nearly everything is terminated: the pruned
    pipeline must maintain far fewer states (the Figure 9 effect)."""
    stream = labeled_stream(80, n_objects=8, seed=1)
    queries = geq_only_queries(20, n_min=9, seed=2, labels=("person", "car", "truck"))
    plain = QueryPipeline(queries, w=12, d=6, method=method, prune=False)
    pruned = QueryPipeline(queries, w=12, d=6, method=method, prune=True)
    peak_plain = peak_pruned = 0
    for fid, objs in stream:
        plain.feed(fid, objs)
        pruned.feed(fid, objs)
        peak_plain = max(peak_plain, plain.gen.n_states())
        peak_pruned = max(peak_pruned, pruned.gen.n_states())
    assert peak_pruned < peak_plain
    assert pruned.stats.terminated > 0
    assert pruned.stats.matches == plain.stats.matches == 0  # n_min=9 unreachable


def test_prune_requires_geq_only():
    queries = random_cnf_queries(5, seed=0)
    assert not all(q.is_geq_only() for q in queries)
    with pytest.raises(ValueError, match=">=-only"):
        QueryPipeline(queries, w=5, d=2, method="ssg", prune=True)


def test_irrelevant_classes_dropped():
    """Objects of classes no query mentions never enter MCOS generation."""
    queries = [Query(0, ((Condition("car", ">=", 1),),))]
    pipe = QueryPipeline(queries, w=4, d=2, method="mfs")
    pipe.feed(0, [(1, "car"), (2, "bicycle"), (3, "dog")])
    pipe.feed(1, [(1, "car"), (2, "bicycle")])
    assert len(pipe.codec) == 1  # only the car was encoded
    rows = pipe.feed(2, [(1, "car")])
    assert rows == [MatchRow(2, 0, (1,), 3)]


def test_min_duration_gates_matches():
    queries = [Query(0, ((Condition("car", ">=", 2),),))]
    pipe = QueryPipeline(queries, w=5, d=3, method="ssg")
    assert pipe.feed(0, [(1, "car"), (2, "car")]) == []
    assert pipe.feed(1, [(1, "car"), (2, "car")]) == []
    rows = pipe.feed(2, [(1, "car"), (2, "car")])
    assert rows == [MatchRow(2, 0, (1, 2), 3)]


def test_conflicting_class_rejected():
    queries = [Query(0, ((Condition("car", ">=", 1), Condition("person", ">=", 1)),),)]
    pipe = QueryPipeline(queries, w=4, d=1, method="mfs")
    pipe.feed(0, [(1, "car")])
    with pytest.raises(ValueError, match="classes"):
        pipe.feed(1, [(1, "person")])


def test_out_of_order_frames_rejected():
    queries = [Query(0, ((Condition("car", ">=", 1),),))]
    pipe = QueryPipeline(queries, w=4, d=1, method="ssg")
    pipe.feed(5, [(1, "car")])
    with pytest.raises(ValueError, match="increasing"):
        pipe.feed(5, [(1, "car")])


def test_make_generator_rejects_unknown_method():
    with pytest.raises(ValueError, match="unknown method"):
        make_generator("fancy", 5, 2)


@pytest.mark.parametrize("n_queries", [10, 30, 50])
def test_match_rows_reference_check(n_queries):
    """Every emitted match must satisfy its query on the true per-class
    counts of the reported object set, and the reported support must
    meet d — checked from raw definitions, not via the pipeline."""
    stream = labeled_stream(40, seed=7)
    label_of = {}
    for _, objs in stream:
        for oid, lab in objs:
            label_of[oid] = lab
    queries = random_cnf_queries(n_queries, seed=3, labels=("person", "car", "truck"))
    by_qid = {q.qid: q for q in queries}
    rows = evaluate_stream(stream, queries, w=9, d=4, method="ssg")
    assert rows, "workload produced no matches — weak test"
    for row in rows:
        counts = {"person": 0, "car": 0, "truck": 0}
        for oid in row.objset:
            counts[label_of[oid]] += 1
        assert by_qid[row.qid].holds(counts), row
        assert row.n_frames >= 4
