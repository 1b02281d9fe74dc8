"""Tests for the built-in metadata providers (contract + oracle checks)."""
import pytest
from pyspark.sql import functions as F

from repro.core.default_spec import default_spec
from repro.core.spec import InputSpec, ProviderSpec, RankingWeight
from repro.oracle import assert_equivalent
from repro.providers.base import ProviderInputError
from repro.providers.interaction import RankedListProvider
from repro.providers.lineage import descendant_edges


@pytest.fixture(scope="module")
def reg(humboldt):
    return humboldt.registry


class TestInputValidation:
    def test_required_input_missing(self, reg, catalog):
        with pytest.raises(ProviderInputError, match="requires"):
            reg.get("joinable").fetch(catalog)

    def test_unknown_input_rejected(self, reg, catalog):
        with pytest.raises(ProviderInputError, match="unknown inputs"):
            reg.get("typed").fetch(catalog, {"bogus": 1})

    def test_can_fetch(self, reg):
        assert reg.get("typed").can_fetch()
        assert not reg.get("joinable").can_fetch()
        assert reg.get("joinable").can_fetch({"table": "orders"})


class TestAnnotationProviders:
    def test_typed_categories_vs_oracle(self, reg, catalog, corpus):
        res = reg.get("typed").fetch(catalog)
        got = res.items.groupBy("category").agg(F.count("*").alias("n"))
        assert_equivalent(
            got,
            "SELECT artifact_type AS category, count(*) AS n "
            "FROM artifacts GROUP BY 1",
            artifacts=corpus.artifacts,
        )

    def test_owned_by_filter_input(self, reg, catalog, corpus):
        res = reg.get("owned_by").fetch(catalog, {"user": "Alex"})
        got = res.items.select("artifact_id")
        assert_equivalent(
            got,
            "SELECT artifact_id FROM artifacts WHERE owner_id = 1",
            artifacts=corpus.artifacts,
        )

    def test_owned_by_filter_case_insensitive(self, reg, catalog):
        a = reg.get("owned_by").fetch(catalog, {"user": "alex"}).items.count()
        b = reg.get("owned_by").fetch(catalog, {"user": "Alex"}).items.count()
        assert a == b > 0

    def test_badged_membership_vs_oracle(self, reg, catalog, corpus):
        res = reg.get("badged").fetch(catalog)
        got = res.items.select("artifact_id", "category")
        assert_equivalent(
            got,
            "SELECT a.artifact_id, b.badge AS category "
            "FROM artifacts a JOIN badges b USING (artifact_id)",
            artifacts=corpus.artifacts,
            badges=corpus.badges,
        )

    def test_tagged_membership_vs_oracle(self, reg, catalog, corpus):
        res = reg.get("tagged").fetch(catalog)
        got = res.items.select("artifact_id", "category")
        assert_equivalent(
            got,
            "SELECT a.artifact_id, t.tag AS category "
            "FROM artifacts a JOIN tags t USING (artifact_id)",
            artifacts=corpus.artifacts,
            tags=corpus.tags,
        )

    def test_created_by_category_column(self, reg, catalog):
        res = reg.get("created_by").fetch(catalog, {"user": "John Doe"})
        cats = {r["category"] for r in res.items.select("category").distinct().collect()}
        assert cats == {"John Doe"}


class TestInteractionProviders:
    def test_recent_documents_orders_by_recency(self, reg, catalog):
        items = reg.get("recent_documents").fetch(catalog).items.collect()
        rec = [r["recency_days"] for r in items]
        assert rec == sorted(rec)  # weight -1: most recent first

    def test_most_viewed_orders_by_views(self, reg, catalog):
        items = reg.get("most_viewed").fetch(catalog).items.collect()
        views = [r["view_count"] for r in items]
        assert views == sorted(views, reverse=True)

    def test_top_n_limit_default(self, reg, catalog):
        assert len(reg.get("most_viewed").fetch(catalog).items.collect()) == 50

    def test_limit_input(self, reg, catalog):
        res = reg.get("most_viewed").fetch(catalog, {"limit": 7})
        assert res.items.count() == 7

    def test_reweighting_spec_reorders_without_code_change(self, catalog):
        """§4.2: updating the spec is sufficient to update the ranking."""
        base = dict(
            name="x", category="interaction", description="",
            representation="list", endpoint="catalog://most_viewed",
            inputs=(InputSpec("limit", "text"),),
        )
        by_views = RankedListProvider(
            ProviderSpec(**base, ranking=(RankingWeight("view_count", 1.0),))
        )
        by_fav = RankedListProvider(
            ProviderSpec(**base, ranking=(RankingWeight("favorite_count", 1.0),))
        )
        top_views = by_views.fetch(catalog).items.first()["artifact_id"]
        top_fav = by_fav.fetch(catalog).items.first()["artifact_id"]
        vmax = catalog.artifacts.orderBy(F.desc("view_count")).first()
        fmax = catalog.artifacts.orderBy(F.desc("favorite_count")).first()
        assert top_views == vmax["artifact_id"]
        assert top_fav == fmax["artifact_id"]


class TestLineageProvider:
    def test_descendants_vs_recursive_oracle(self, reg, catalog, corpus):
        """Edge depths from iterative joins match DuckDB WITH RECURSIVE."""
        root = int(corpus.lineage["parent_id"].iloc[0])
        res = reg.get("lineage").fetch(catalog, {"root": root})
        got = res.edges.select("parent_id", "child_id", "depth")
        assert_equivalent(
            got,
            f"""
            WITH RECURSIVE walk(parent_id, child_id, depth) AS (
              SELECT parent_id, child_id, 1 FROM lineage WHERE parent_id = {root}
              UNION
              SELECT l.parent_id, l.child_id, w.depth + 1
              FROM lineage l JOIN walk w ON l.parent_id = w.child_id
            )
            SELECT parent_id, child_id, min(depth) AS depth
            FROM walk GROUP BY 1, 2
            """,
            lineage=corpus.lineage,
        )

    def test_full_forest_contains_all_edges(self, reg, catalog, corpus):
        res = reg.get("lineage").fetch(catalog)
        assert res.edges.select("parent_id", "child_id").distinct().count() == len(
            corpus.lineage
        )

    def test_items_cover_edge_endpoints(self, reg, catalog):
        res = reg.get("lineage").fetch(catalog)
        ids = res.items.select("artifact_id")
        orphans = (
            res.edges.select(F.col("child_id").alias("artifact_id"))
            .join(ids, "artifact_id", "left_anti")
            .count()
        )
        assert orphans == 0

    def test_leaf_root_yields_empty_hierarchy(self, reg, catalog, corpus):
        leaf = int(corpus.lineage["child_id"].iloc[-1])
        is_parent = (corpus.lineage["parent_id"] == leaf).any()
        if not is_parent:
            res = reg.get("lineage").fetch(catalog, {"root": leaf})
            assert res.edges.count() == 0

    def test_descendant_edges_cycle_guard(self, spark):
        cyc = spark.createDataFrame(
            [(1, 2), (2, 1)], "parent_id bigint, child_id bigint"
        )
        start = spark.createDataFrame([(1,)], "artifact_id bigint")
        edges = descendant_edges(cyc, start, max_depth=5)
        assert edges.count() == 2  # both edges found once, loop terminates


class TestJoinableProvider:
    def test_graph_contract(self, reg, catalog):
        res = reg.get("joinable").fetch(catalog, {"table": "orders"})
        assert {"src_id", "dst_id", "weight"} <= set(res.edges.columns)
        assert res.items.count() > 0

    def test_orders_joins_lineitem_and_customer(self, reg, catalog):
        res = reg.get("joinable").fetch(catalog, {"table": "orders"})
        names = {r["dataset_name"] for r in res.items.collect()}
        assert {"lineitem", "customer", "orders"} <= names

    def test_weights_in_unit_interval(self, reg, catalog):
        res = reg.get("joinable").fetch(catalog, {"table": "flights"})
        bad = res.edges.where(
            (F.col("weight") < 0) | (F.col("weight") > 1)
        ).count()
        assert bad == 0

    def test_profiles_required(self, spark, lake_root, reg):
        from repro.catalog.builder import build_catalog

        bare = build_catalog(spark, lake_root, with_profiles=False, cache=False)
        with pytest.raises(ProviderInputError, match="profiles"):
            reg.get("joinable").fetch(bare, {"table": "orders"})


class TestEmbeddingProvider:
    @pytest.fixture(scope="class")
    def emb(self, reg, catalog):
        return reg.get("similar_embedding").fetch(catalog).items.cache()

    def test_every_artifact_positioned(self, emb, catalog):
        assert emb.count() == catalog.artifacts.count()

    def test_xy_finite(self, emb):
        bad = emb.where(
            F.isnan("x") | F.isnan("y") | F.col("x").isNull() | F.col("y").isNull()
        ).count()
        assert bad == 0

    def test_deterministic(self, reg, catalog):
        a = reg.get("similar_embedding").fetch(catalog).items
        b = reg.get("similar_embedding").fetch(catalog).items
        pa = a.select("artifact_id", "x", "y").orderBy("artifact_id").toPandas()
        pb = b.select("artifact_id", "x", "y").orderBy("artifact_id").toPandas()
        assert (pa["x"] - pb["x"]).abs().max() < 1e-9
        assert (pa["y"] - pb["y"]).abs().max() < 1e-9

    def test_same_subject_closer_than_random(self, emb, corpus):
        """The planted sales_* tables share terms -> near each other."""
        import numpy as np

        pos = {
            r["artifact_id"]: (r["x"], r["y"])
            for r in emb.select("artifact_id", "x", "y").collect()
        }
        f = corpus.flagship_ids
        d_pair = np.hypot(
            pos[f[0]][0] - pos[f[1]][0], pos[f[0]][1] - pos[f[1]][1]
        )
        all_pts = np.array(list(pos.values()))
        centroid_spread = np.mean(
            np.hypot(all_pts[:, 0] - all_pts[:, 0].mean(), all_pts[:, 1] - all_pts[:, 1].mean())
        )
        assert d_pair < 2 * centroid_spread
