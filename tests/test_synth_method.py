"""Tests for the synthesized KB (Sec 5, Sec 7.2), including an exact
reproduction of the paper's Figure 5 worked example."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.fd import unary_fds
from repro.core.synth_method import (
    build_synth_frames,
    column_overlap_matrix,
    column_sizes,
    column_values,
    kb_value_pairs,
    pair_dictionary,
    pair_overlap_matrix,
    pair_sizes,
    pair_values,
    query_column_conf,
    query_pair_conf,
)
from repro.oracle import assert_equivalent


def _cells_from_tables(spark, tables: dict[str, list[tuple[str, str]]]):
    """tables: name -> list of (v1, v2) rows for a 2-column table."""
    rows = []
    for name, pairs in tables.items():
        for i, (a, b) in enumerate(pairs):
            rows.append((name, 0, "c0", i, a, 0))
            rows.append((name, 1, "c1", i, b, 0))
    pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
    return spark.createDataFrame(pdf)


# Reconstruction of Fig 2 consistent with Example 19 and Figure 5:
# T1 has 3 value pairs, sharing 2 with T2; T2 has 5, sharing 1 with T3;
# T3 has 2. (See DESIGN.md §3.3 for the derivation.)
FIG2 = {
    "T1": [("Brands Park", "Moana"), ("Kells Park", "Spider-Man"),
           ("Eckhart Park", "Avengers")],
    "T2": [("Kells Park", "Spider-Man"), ("Eckhart Park", "Avengers"),
           ("Union Park", "Black Panther"), ("Chopin Park", "Trolls"),
           ("Oz Park", "Sing")],
    "T3": [("Union Park", "Black Panther"), ("Gill Park", "Wonder")],
}

# Paper Figure 5 rows: value pair -> {column pair: type score}.
FIG5_EXPECTED = {
    ("Brands Park", "Moana"): {"T1": 1.0, "T2": 2 / 3},
    ("Kells Park", "Spider-Man"): {"T1": 1.0, "T2": 1.0, "T3": 0.2},
    ("Union Park", "Black Panther"): {"T1": 0.4, "T2": 1.0, "T3": 1.0},
    ("Chopin Park", "Trolls"): {"T1": 0.4, "T2": 1.0, "T3": 0.2},
    ("Gill Park", "Wonder"): {"T2": 0.5, "T3": 1.0},
}


@pytest.fixture(scope="module")
def fig5_dict(spark):
    cells = _cells_from_tables(spark, FIG2)
    fds = unary_fds(cells)
    pv = pair_values(cells, fds)
    pov = pair_overlap_matrix(pv, pair_sizes(pv))
    d = pair_dictionary(pv, pov).toPandas()
    out: dict[tuple[str, str], dict[str, float]] = {}
    for r in d.itertuples():
        if (r.rcol1, r.rcol2) == (0, 1):
            out.setdefault((r.v1, r.v2), {})[r.rtable] = r.score
    return out


class TestFig5Exact:
    """The synthesized relationship dictionary reproduces Figure 5."""

    @pytest.mark.parametrize("vp", list(FIG5_EXPECTED))
    def test_row(self, fig5_dict, vp):
        got = fig5_dict.get(vp, {})
        expected = FIG5_EXPECTED[vp]
        for rs, score in expected.items():
            assert got.get(rs, 0.0) == pytest.approx(score, abs=1e-9), (
                f"{vp}: RS({rs}) = {got.get(rs)} expected {score}"
            )

    @pytest.mark.parametrize("vp", list(FIG5_EXPECTED))
    def test_no_spurious_types(self, fig5_dict, vp):
        got = fig5_dict.get(vp, {})
        assert set(got) <= {"T1", "T2", "T3"}
        # Fig 5 omits zero entries; we must not invent them either.
        for rs in {"T1", "T2", "T3"} - set(FIG5_EXPECTED[vp]):
            assert rs not in got

    def test_example_19_brands_park_in_t1_only(self, fig5_dict):
        # (Brands Park, Moana) gets RS(D,E)=2/3 from T1's overlap with T2,
        # not 1.0 — it is not itself in T2.
        assert fig5_dict[("Brands Park", "Moana")]["T2"] == pytest.approx(2 / 3)


class TestEq5ColumnOverlap:
    def test_overlap_fraction(self, spark):
        cells = _cells_from_tables(spark, {
            "A": [("x", "1"), ("y", "2"), ("z", "3")],
            "B": [("x", "1"), ("y", "2"), ("w", "9"), ("v", "8")],
        })
        cv = column_values(cells)
        m = column_overlap_matrix(cv, column_sizes(cv), hot_cap=100).toPandas()
        row = m[(m.table == "A") & (m.col == 0) & (m.ttable == "B") & (m.tcol == 0)]
        assert row.iloc[0].conf == pytest.approx(2 / 3)  # |A∩B| / |A|
        rev = m[(m.table == "B") & (m.col == 0) & (m.ttable == "A") & (m.tcol == 0)]
        assert rev.iloc[0].conf == pytest.approx(2 / 4)  # directed

    def test_self_rows_are_one(self, spark, mini_cells):
        cv = column_values(mini_cells)
        m = column_overlap_matrix(cv, column_sizes(cv))
        selfs = m.filter("table = ttable and col = tcol").select("conf").distinct().collect()
        assert [r.conf for r in selfs] == [1.0]

    def test_hot_cap_drops_ubiquitous_values(self, spark):
        tables = {f"T{i}": [("hot", str(i)), (f"u{i}", "x")] for i in range(8)}
        cells = _cells_from_tables(spark, tables)
        cv = column_values(cells)
        m = column_overlap_matrix(cv, column_sizes(cv), hot_cap=4).toPandas()
        cross = m[(m.table != m.ttable) & (m.col == 0) & (m.tcol == 0)]
        # "hot" appears in 8 columns > cap -> no overlap evidence remains.
        assert len(cross) == 0

    def test_oracle_overlap_counts(self, spark, mini_cells):
        cv = column_values(mini_cells)
        got = (
            cv.join(
                cv.select(
                    F.col("table").alias("t2"), F.col("col").alias("c2"), "value"
                ),
                "value",
            )
            .filter("table < t2")
            .groupBy("table", "col", "t2", "c2")
            .agg(F.count("*").alias("n"))
        )
        sql = """
            WITH cv AS (SELECT DISTINCT "table", col, value FROM cells
                        WHERE is_num = 0 AND value IS NOT NULL)
            SELECT a.table AS "table", a.col AS col,
                   b.table AS t2, b.col AS c2, COUNT(*) AS n
            FROM cv a JOIN cv b ON a.value = b.value AND a.table < b.table
            GROUP BY 1, 2, 3, 4
        """
        assert_equivalent(got, sql, cells=mini_cells)


class TestEq6PairOverlap:
    def test_fig2_pair_matrix(self, spark):
        cells = _cells_from_tables(spark, FIG2)
        pv = pair_values(cells, unary_fds(cells))
        m = pair_overlap_matrix(pv, pair_sizes(pv)).toPandas()

        def conf(a, b):
            r = m[(m.table == a) & (m.ttable == b) & (m.col1 == 0) & (m.tcol1 == 0)]
            return r.iloc[0].conf if len(r) else 0.0

        assert conf("T1", "T2") == pytest.approx(2 / 3)
        assert conf("T2", "T1") == pytest.approx(2 / 5)
        assert conf("T2", "T3") == pytest.approx(1 / 5)
        assert conf("T3", "T2") == pytest.approx(1 / 2)
        assert conf("T1", "T3") == 0.0
        assert conf("T1", "T1") == 1.0


class TestQuerySide:
    def test_query_column_conf(self, spark):
        cells = _cells_from_tables(spark, {"L": [("x", "1"), ("y", "2")]})
        q = _cells_from_tables(spark, {"Q": [("x", "1"), ("z", "3")]})
        conf = query_column_conf(column_values(q), column_values(cells)).toPandas()
        row = conf[(conf.qcol == 0) & (conf.ttable == "L") & (conf.tcol == 0)]
        assert row.iloc[0].conf == pytest.approx(0.5)  # |Q∩L| / |Q|

    def test_query_pair_conf_normalized(self, spark):
        cells = _cells_from_tables(spark, FIG2)
        pv = pair_values(cells, unary_fds(cells))
        pdict = pair_dictionary(pv, pair_overlap_matrix(pv, pair_sizes(pv)))
        q = _cells_from_tables(
            spark, {"Q": [("Kells Park", "Spider-Man"), ("New Park", "NewFilm")]}
        )
        qpv = pair_values(q, unary_fds(q))
        conf = query_pair_conf(qpv, pdict).toPandas()
        # One of two query pairs found; found pair carries RS(T1)=1.0 ->
        # conf for T1's relationship = 1.0 / 1 found.
        row = conf[(conf.rtable == "T1")]
        assert row.iloc[0].conf == pytest.approx(1.0)

    def test_query_pair_conf_capped_at_one(self, spark, mini_cells, mini):
        frames = build_synth_frames(spark, mini_cells)
        qn = [q for q, _ in mini.queries]
        q_cells = mini_cells.filter(F.col("table").isin(qn))
        qpv = pair_values(q_cells, unary_fds(q_cells))
        conf = query_pair_conf(qpv, frames["pair_dict"])
        assert conf.filter("conf > 1.0 + 1e-9").count() == 0


class TestKBExclusion:
    def test_kb_pairs_excluded(self, spark, kb):
        park = kb.entities_of("park")[0]
        city = kb.object_of(park, "located_in")
        known = (kb.label_of(park), kb.label_of(city))
        cells = _cells_from_tables(spark, {
            "T": [known, ("foo park", "bar city"), ("baz park", "qux city")]
        })
        fds = unary_fds(cells)
        excl = kb_value_pairs(spark, kb)
        pv = pair_values(cells, fds, exclude_pairs=excl).toPandas()
        got_pairs = set(zip(pv.v1, pv.v2))
        assert known not in got_pairs
        assert ("foo park", "bar city") in got_pairs

    def test_build_synth_frames_keys(self, spark, mini_cells, kb):
        frames = build_synth_frames(spark, mini_cells, kb=kb, exclude_kb_pairs=True)
        assert set(frames) == {
            "colvals", "col_sizes", "col_overlap", "fds",
            "pair_vals", "pair_sizes", "pair_overlap", "pair_dict",
        }
