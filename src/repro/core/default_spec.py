"""The §6 use-case specification: the provider lineup the paper wires into
Sigma Workbook (Figure 2), expressed as a Humboldt spec.

Eleven providers across four metadata categories (interaction, annotations,
relatedness, content), covering all six representations. The flagship query
from the abstract — ``type: table owned_by: 'Alex' badged: endorsed
badged_by: 'Mike' & 'sales'`` — is fully answerable from the search fields
declared here; no query-language code mentions any of these field names.
"""
from __future__ import annotations

from repro.core.spec import (
    HumboldtSpec,
    InputSpec,
    ProviderSpec,
    RankingWeight,
    SearchField,
    TeamHomePage,
)


def default_spec() -> HumboldtSpec:
    """Build (and validate) the default use-case specification."""
    providers = [
        # -- interaction metadata ------------------------------------------
        ProviderSpec(
            name="recent_documents",
            category="interaction",
            description="Artifacts ordered by how recently they were modified",
            representation="tiles",
            endpoint="catalog://recent_documents",
            inputs=(InputSpec("limit", "text", required=False),),
            ranking=(RankingWeight("recency_days", -1.0),),
        ),
        ProviderSpec(
            name="most_viewed",
            category="interaction",
            description="Artifacts ordered by view count",
            representation="list",
            endpoint="catalog://most_viewed",
            inputs=(InputSpec("limit", "text", required=False),),
            ranking=(RankingWeight("view_count", 1.0),),
        ),
        ProviderSpec(
            name="favorites",
            category="interaction",
            description="Artifacts ordered by favorite count",
            representation="tiles",
            endpoint="catalog://favorites",
            inputs=(InputSpec("limit", "text", required=False),),
            ranking=(RankingWeight("favorite_count", 4.3), RankingWeight("view_count", 1.5)),
        ),
        # -- annotation metadata -------------------------------------------
        ProviderSpec(
            name="typed",
            category="annotations",
            description="Artifacts grouped by artifact type",
            representation="categories",
            endpoint="catalog://typed",
            search_fields=(
                SearchField("type", ("artifact_type",), "artifacts", "artifact_type"),
            ),
        ),
        ProviderSpec(
            name="owned_by",
            category="annotations",
            description="Artifacts grouped by owner",
            representation="categories",
            endpoint="catalog://owned_by",
            inputs=(InputSpec("user", "user_name", required=False),),
            search_fields=(
                SearchField("owned_by", ("owned by", "owner"), "artifacts", "owner_name"),
            ),
        ),
        ProviderSpec(
            name="created_by",
            category="annotations",
            description="Artifacts grouped by creator",
            representation="categories",
            endpoint="catalog://created_by",
            inputs=(InputSpec("user", "user_name", required=False),),
            search_fields=(
                SearchField(
                    "created_by", ("created by", "creator"), "artifacts", "created_by_name"
                ),
            ),
        ),
        ProviderSpec(
            name="badged",
            category="annotations",
            description="Artifacts carrying endorsement/warning/deprecation badges",
            representation="categories",
            endpoint="catalog://badged",
            search_fields=(
                SearchField("badged", ("badge",), "badges", "badge"),
                SearchField("badged_by", ("badged by",), "badges", "badged_by"),
            ),
        ),
        ProviderSpec(
            name="tagged",
            category="annotations",
            description="Artifacts grouped by tag",
            representation="categories",
            endpoint="catalog://tagged",
            search_fields=(SearchField("tag", ("tagged",), "tags", "tag"),),
        ),
        # -- relatedness metadata ------------------------------------------
        ProviderSpec(
            name="lineage",
            category="relatedness",
            description="Downstream artifacts (table -> visualization -> "
            "workbook -> dashboard)",
            representation="hierarchy",
            endpoint="catalog://lineage",
            inputs=(InputSpec("root", "artifact_id", required=False),),
            visibility=("overview", "exploration"),
        ),
        ProviderSpec(
            name="joinable",
            category="relatedness",
            description="Tables joinable with the selected table "
            "(MinHash containment over column profiles)",
            representation="graph",
            endpoint="profiles://joinable",
            inputs=(InputSpec("table", "table", required=True),),
            visibility=("exploration", "search"),
            search_fields=(
                SearchField("joinable_with", ("joinable with",), "provider", "joinable"),
            ),
        ),
        # -- content metadata ----------------------------------------------
        ProviderSpec(
            name="similar_embedding",
            category="content",
            description="2-D embedding of artifacts by name/description terms",
            representation="embedding",
            endpoint="embedding://similar",
            visibility=("overview", "exploration"),
        ),
    ]
    spec = HumboldtSpec(
        providers=providers,
        global_ranking=[
            RankingWeight("favorite_count", 4.3),
            RankingWeight("view_count", 1.5),
            RankingWeight("recency_days", -0.5),
        ],
        team_home_pages=[
            TeamHomePage("A Team", ("recent_documents", "badged", "most_viewed")),
        ],
    )
    spec.validate()
    return spec
