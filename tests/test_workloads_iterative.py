"""NumPy-reference tests for the iterative workloads: PageRank, KMeans,
NWeight, LR, SVD."""
import numpy as np
import pytest

from repro import synth_data
from repro.workloads import kmeans, lr, nweight, pagerank, svd


def _pagerank_numpy(edges_pdf, iterations, damping=0.85):
    """Reference implementing exactly the DataFrame semantics."""
    nodes = sorted(set(edges_pdf.src) | set(edges_pdf.dst))
    idx = {n: i for i, n in enumerate(nodes)}
    n = len(nodes)
    deg = edges_pdf.groupby("src").size()
    rank = np.full(n, 1.0 / n)
    for _ in range(iterations):
        contrib = np.zeros(n)
        for _, e in edges_pdf.iterrows():
            contrib[idx[e.dst]] += rank[idx[e.src]] / deg[e.src]
        linked = sum(rank[idx[s]] for s in deg.index)
        dangling = 1.0 - linked
        rank = (1.0 - damping) / n + damping * (contrib + dangling / n)
    return {node: rank[idx[node]] for node in nodes}


class TestPageRank:
    @pytest.fixture(scope="class")
    def edges(self, spark):
        return synth_data.edge_list(spark, n_nodes=40, n_edges=160, seed=20).cache()

    def test_matches_numpy_reference(self, spark, edges):
        got = {
            r.node: r.rank
            for r in pagerank.pagerank(spark, edges, iterations=3).collect()
        }
        expect = _pagerank_numpy(edges.toPandas(), iterations=3)
        assert set(got) == set(expect)
        for node, val in expect.items():
            assert got[node] == pytest.approx(val, rel=1e-6)

    def test_ranks_sum_to_one(self, spark, edges):
        ranks = pagerank.pagerank(spark, edges, iterations=2).toPandas()
        assert ranks["rank"].sum() == pytest.approx(1.0, rel=1e-6)

    def test_more_inlinks_higher_rank(self, spark):
        import pandas as pd

        pdf = pd.DataFrame(
            {"src": [1, 2, 3, 0], "dst": [0, 0, 0, 1], "weight": [1.0] * 4}
        )
        edges = spark.createDataFrame(pdf)
        ranks = {
            r.node: r.rank
            for r in pagerank.pagerank(spark, edges, iterations=5).collect()
        }
        assert ranks[0] > ranks[2]  # node 0 has 3 in-links, node 2 none


class TestKMeans:
    @pytest.fixture(scope="class")
    def pts(self, spark):
        return synth_data.points(spark, n=1500, dim=3, k=4, seed=21).cache()

    def test_assign_matches_numpy(self, spark, pts):
        cents = np.array([[0.0, 0.0, 0.0], [5.0, 5.0, 5.0], [10.0, 0.0, 5.0]])
        got = kmeans.assign(pts, cents).toPandas()
        X = got[["x0", "x1", "x2"]].to_numpy()
        d = ((X[:, None, :] - cents[None, :, :]) ** 2).sum(axis=2)
        assert np.array_equal(got.cluster.to_numpy(), d.argmin(axis=1))

    def test_lloyd_step_matches_numpy(self, spark, pts):
        cents = np.array([[2.0, 2.0, 2.0], [8.0, 8.0, 8.0]])
        new = kmeans.lloyd_step(pts, cents)
        X = pts.toPandas()[["x0", "x1", "x2"]].to_numpy()
        d = ((X[:, None, :] - cents[None, :, :]) ** 2).sum(axis=2)
        a = d.argmin(axis=1)
        for c in range(2):
            if (a == c).any():
                assert np.allclose(new[c], X[a == c].mean(axis=0), rtol=1e-6)

    def test_kmeans_reduces_inertia(self, spark, pts):
        X = pts.toPandas()[["x0", "x1", "x2"]].to_numpy()

        def inertia(C):
            return (((X[:, None, :] - C[None, :, :]) ** 2).sum(axis=2).min(axis=1)).sum()

        init = X[:4]
        final = kmeans.kmeans(pts, k=4, iterations=4, seed=0)
        assert inertia(final) <= inertia(init) * 1.01


class TestNWeight:
    @pytest.fixture(scope="class")
    def edges(self, spark):
        return synth_data.edge_list(spark, n_nodes=25, n_edges=120, seed=22).cache()

    def _dense(self, pdf, n):
        W = np.zeros((n, n))
        for _, e in pdf.iterrows():
            W[int(e.src), int(e.dst)] = e.weight
        return W

    def test_one_hop_is_identity(self, spark, edges):
        out = nweight.nweight(edges, hops=1).toPandas()
        src = edges.toPandas()
        merged = out.merge(src, on=["src", "dst"], suffixes=("_o", "_e"))
        assert len(merged) == len(src)
        assert np.allclose(merged.weight_o, merged.weight_e)

    def test_two_hops_matches_matrix_square(self, spark, edges):
        pdf = edges.toPandas()
        n = int(max(pdf.src.max(), pdf.dst.max())) + 1
        W2 = self._dense(pdf, n) @ self._dense(pdf, n)
        out = nweight.nweight(edges, hops=2).toPandas()
        got = self._dense(out, n)
        assert np.allclose(got, W2, rtol=1e-9)

    def test_invalid_hops(self, spark, edges):
        with pytest.raises(ValueError):
            nweight.nweight(edges, hops=0)


class TestLR:
    @pytest.fixture(scope="class")
    def data(self, spark):
        return synth_data.labeled_points(spark, n=2000, dim=3, seed=23).cache()

    def test_gradient_matches_numpy(self, spark, data):
        pdf = data.toPandas()
        X = pdf[["x0", "x1", "x2"]].to_numpy()
        y = pdf.label.to_numpy()
        w = np.array([0.3, -0.2, 0.5])
        p = 1.0 / (1.0 + np.exp(-(X @ w)))
        expect = ((p - y)[:, None] * X).mean(axis=0)
        got = lr.gradient(data, w)
        assert np.allclose(got, expect, rtol=1e-8)

    def test_training_improves_accuracy(self, spark, data):
        pdf = data.toPandas()
        X = pdf[["x0", "x1", "x2"]].to_numpy()
        y = pdf.label.to_numpy()
        w = lr.logistic_regression(data, iterations=8, lr=1.0)
        acc = (((1.0 / (1.0 + np.exp(-(X @ w)))) > 0.5) == y).mean()
        assert acc > 0.85

    def test_matches_numpy_descent(self, spark, data):
        pdf = data.toPandas()
        X = pdf[["x0", "x1", "x2"]].to_numpy()
        y = pdf.label.to_numpy()
        w_np = np.zeros(3)
        for _ in range(3):
            p = 1.0 / (1.0 + np.exp(-(X @ w_np)))
            w_np -= 0.5 * ((p - y)[:, None] * X).mean(axis=0)
        w_spark = lr.logistic_regression(data, iterations=3, lr=0.5)
        assert np.allclose(w_spark, w_np, rtol=1e-7)


class TestSVD:
    @pytest.fixture(scope="class")
    def pts(self, spark):
        return synth_data.points(spark, n=1200, dim=3, seed=24).cache()

    def test_gram_matches_numpy(self, spark, pts):
        X = pts.toPandas().to_numpy()
        G = svd.gram_matrix(pts)
        assert np.allclose(G, X.T @ X, rtol=1e-9)

    def test_singular_values_match_numpy(self, spark, pts):
        X = pts.toPandas().to_numpy()
        expect = np.linalg.svd(X, compute_uv=False)
        got = svd.singular_values(pts)
        assert np.allclose(got, expect, rtol=1e-6)
