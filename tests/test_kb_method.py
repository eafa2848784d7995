"""Tests for Sec 4 KB column/relationship semantics, oracle-checked."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.kb_method import column_semantics, relationship_semantics
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def park_cells(spark, kb):
    """One clean table: 6 parks with their located_in cities and led_by
    supervisors — all values are KB labels with known semantics."""
    parks = kb.entities_of("park")[:6]
    rows = []
    for i, p in enumerate(parks):
        city = kb.object_of(p, "located_in")
        sup = kb.object_of(p, "led_by")
        rows.append(("pt", 0, "park", i, kb.label_of(p), 0))
        rows.append(("pt", 1, "city", i, kb.label_of(city), 0))
        rows.append(("pt", 2, "sup", i, kb.label_of(sup), 0))
    pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
    return spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def park_cs(spark, kb, park_cells):
    return column_semantics(spark, park_cells, kb).toPandas()


@pytest.fixture(scope="module")
def park_rs(spark, kb, park_cells):
    return relationship_semantics(spark, park_cells, kb).toPandas()


class TestColumnSemantics:
    def test_park_column_types(self, kb, park_cs):
        got = set(park_cs[park_cs.col == 0].type_id)
        assert got == {kb.type_id("park"), kb.type_id("place")}

    def test_city_column_types(self, kb, park_cs):
        got = set(park_cs[park_cs.col == 1].type_id)
        assert got == {
            kb.type_id("city"), kb.type_id("administrative_area"),
            kb.type_id("place"),
        }

    def test_supervisor_types(self, kb, park_cs):
        got = set(park_cs[park_cs.col == 2].type_id)
        assert got == {kb.type_id("civil_servant"), kb.type_id("person")}

    def test_fs_all_one_on_clean_column(self, park_cs):
        # Every value maps to every level of its chain -> fs = 1.0.
        assert park_cs.fs.min() == pytest.approx(1.0)

    def test_conf_dl_is_fs_times_gs(self, park_cs):
        assert (park_cs.conf_dl - park_cs.fs * park_cs.gs).abs().max() < 1e-12

    def test_conf_q_is_fs(self, park_cs):
        assert (park_cs.conf_q - park_cs.fs).abs().max() < 1e-12

    def test_gs_from_kb(self, kb, park_cs):
        place_row = park_cs[park_cs.type_id == kb.type_id("place")].iloc[0]
        assert place_row.gs == pytest.approx(kb.gs_of("place"))

    def test_majority_top_level_filter(self, spark, kb):
        """A column with 3 cities and 1 movie keeps only place types."""
        cities = kb.entities_of("city")[:3]
        movie = kb.entities_of("movie")[0]
        rows = [
            ("t", 0, "c", i, kb.label_of(e), 0)
            for i, e in enumerate(cities + [movie])
        ]
        pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
        cs = column_semantics(spark, spark.createDataFrame(pdf), kb).toPandas()
        tops = set(cs.type_id)
        assert kb.type_id("city") in tops
        assert kb.type_id("movie") not in tops
        assert kb.type_id("creative_work") not in tops

    def test_fs_fraction(self, spark, kb):
        """3 cities + 1 state: fs(city)=0.75, fs(state)=0.25, fs(admin)=1."""
        ents = kb.entities_of("city")[:3] + [kb.entities_of("state")[0]]
        rows = [("t", 0, "c", i, kb.label_of(e), 0) for i, e in enumerate(ents)]
        pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
        cs = column_semantics(spark, spark.createDataFrame(pdf), kb).toPandas()
        by_type = dict(zip(cs.type_id, cs.fs))
        assert by_type[kb.type_id("city")] == pytest.approx(0.75)
        assert by_type[kb.type_id("state")] == pytest.approx(0.25)
        assert by_type[kb.type_id("administrative_area")] == pytest.approx(1.0)
        assert by_type[kb.type_id("place")] == pytest.approx(1.0)

    def test_unmapped_column_absent(self, spark, kb):
        rows = [("t", 0, "c", i, f"zzz-unknown-{i}", 0) for i in range(4)]
        pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
        cs = column_semantics(spark, spark.createDataFrame(pdf), kb)
        assert cs.count() == 0

    def test_oracle_mapped_value_counts(self, spark, kb, park_cells):
        """|c_KB| (distinct mapped values per column) matches DuckDB."""
        k = kb.to_spark(spark)
        got = (
            park_cells.filter("is_num = 0 and value is not null")
            .select("table", "col", "value").distinct()
            .join(k["labels"], F.col("value") == F.col("label"))
            .groupBy("table", "col")
            .agg(F.countDistinct("value").alias("n_kb"))
        )
        sql = """
            SELECT c.table AS "table", c.col AS col,
                   COUNT(DISTINCT c.value) AS n_kb
            FROM (SELECT DISTINCT "table", col, value FROM cells
                  WHERE is_num = 0 AND value IS NOT NULL) c
            JOIN labels l ON c.value = l.label
            GROUP BY 1, 2
        """
        assert_equivalent(got, sql, cells=park_cells, labels=kb.labels)


class TestRelationshipSemantics:
    def test_located_in_found(self, kb, park_rs):
        row = park_rs[(park_rs.col1 == 0) & (park_rs.col2 == 1)]
        assert len(row) == 1
        assert row.iloc[0].pred_id == kb.pred_id("located_in")
        assert row.iloc[0].rs_conf == pytest.approx(1.0)

    def test_led_by_found(self, kb, park_rs):
        row = park_rs[(park_rs.col1 == 0) & (park_rs.col2 == 2)]
        assert row.iloc[0].pred_id == kb.pred_id("led_by")

    def test_no_relation_between_city_and_supervisor(self, park_rs):
        # Cities and supervisors are unrelated in the KB (born_in/works_in
        # objects are per-person, and these pairings are incidental).
        rows = park_rs[(park_rs.col1 == 1) & (park_rs.col2 == 2)]
        assert len(rows) == 0 or rows.iloc[0].rs_conf < 0.5

    def test_one_predicate_per_ordered_pair(self, park_rs):
        dup = park_rs.groupby(["table", "col1", "col2"]).size()
        assert (dup == 1).all()

    def test_orientation(self, kb, park_rs):
        """located_in stored subject-side: (park, city), not (city, park)."""
        fwd = park_rs[(park_rs.col1 == 0) & (park_rs.col2 == 1)]
        rev = park_rs[(park_rs.col1 == 1) & (park_rs.col2 == 0)]
        assert fwd.iloc[0].pred_id == kb.pred_id("located_in")
        assert len(rev) == 0  # no city->park predicate exists

    def test_rs_conf_fraction(self, spark, kb):
        """2 true (park, city) pairs + 2 scrambled -> RS_CONF = 0.5."""
        parks = kb.entities_of("park")[:4]
        cities = [kb.object_of(p, "located_in") for p in parks]
        # scramble the last two pairs
        cities[2], cities[3] = cities[3], cities[2]
        rows = []
        for i, (p, c) in enumerate(zip(parks, cities)):
            rows.append(("t", 0, "p", i, kb.label_of(p), 0))
            rows.append(("t", 1, "c", i, kb.label_of(c), 0))
        pdf = pd.DataFrame(rows, columns=["table", "col", "col_name", "row", "value", "is_num"])
        rs = relationship_semantics(spark, spark.createDataFrame(pdf), kb).toPandas()
        row = rs[(rs.col1 == 0) & (rs.col2 == 1)]
        # The scrambled pairs may accidentally hit a real triple only if the
        # swap is a fixed point; with distinct cities conf is exactly 0.5.
        if cities[2] != kb.object_of(parks[2], "located_in"):
            assert row.iloc[0].rs_conf == pytest.approx(0.5)
