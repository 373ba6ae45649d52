"""Property-based losslessness: random graphs from mixed generators must
always decode back exactly, for SLUGGER (pruned & unpruned, height-
bounded) and for the flat encoder under arbitrary partitions."""
import numpy as np
import pandas as pd
from hypothesis import HealthCheck, given, settings
from hypothesis import strategies as st

from repro.core.pruning import prune
from repro.core.slugger import slugger
from repro.graphs import generators as gen
from repro.model.cost import cost
from repro.model.decode import assert_lossless_pd

SETTINGS = dict(
    max_examples=12,
    deadline=None,
    suppress_health_check=[HealthCheck.too_slow],
)


def random_graph(kind: int, n: int, seed: int) -> pd.DataFrame:
    if kind == 0:
        return gen.er(n, 4.0, seed=seed)
    if kind == 1:
        return gen.chung_lu(n, 5.0, seed=seed)
    if kind == 2:
        return gen.nested_partition(n, levels=2, branching=3, p_top=0.06, ratio=7, seed=seed)
    if kind == 3:
        return gen.caveman_cliques(n, clique_size=6, p_rewire=0.15, seed=seed)
    return gen.hub_spokes(n, n_hubs=max(2, n // 12), seed=seed)


@given(kind=st.integers(0, 4), n=st.integers(20, 70), seed=st.integers(0, 10**6),
       T=st.integers(1, 5))
@settings(**SETTINGS)
def test_slugger_always_lossless(kind, n, seed, T):
    edges = random_graph(kind, n, seed)
    res = slugger(edges, n, T=T, seed=seed % 97, engine="local")
    assert_lossless_pd(res.summary, edges)
    res.summary.validate()


@given(kind=st.integers(0, 4), n=st.integers(20, 60), seed=st.integers(0, 10**6))
@settings(**SETTINGS)
def test_unpruned_then_pruned_lossless_and_no_worse(kind, n, seed):
    edges = random_graph(kind, n, seed)
    res = slugger(edges, n, T=3, seed=seed % 97, engine="local", do_prune=False)
    assert_lossless_pd(res.summary, edges)
    pruned = prune(res.summary, edges)
    assert_lossless_pd(pruned, edges)
    assert cost(pruned) <= cost(res.summary)


@given(kind=st.integers(0, 4), n=st.integers(20, 60), seed=st.integers(0, 10**6),
       hb=st.integers(1, 4))
@settings(**SETTINGS)
def test_height_bounded_lossless(kind, n, seed, hb):
    edges = random_graph(kind, n, seed)
    res = slugger(edges, n, T=3, seed=seed % 97, hb=hb, engine="local")
    assert_lossless_pd(res.summary, edges)
