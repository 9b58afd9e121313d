"""TPC-H-lite (provided synth_data) flowing through the Raven IR,
optimizer, and Spark codegen, checked against the DuckDB oracle — the
relational substrate is exercised on OLAP-shaped data, not just the
paper's two datasets."""
import pytest

from repro import synth_data
from repro.ir import (
    And,
    Catalog,
    Cmp,
    Col,
    Filter,
    Join,
    Lit,
    Project,
    Scan,
)
from repro.optimizer import CrossOptimizer
from repro.oracle import assert_equivalent
from repro.runtime.codegen import to_dataframe

SF = 0.002


@pytest.fixture(scope="module")
def tpch(spark):
    li = synth_data.lineitem(spark, sf=SF)
    o = synth_data.orders(spark, sf=SF)
    c = synth_data.customer(spark, sf=SF)
    p = synth_data.part(spark, sf=SF)
    return {"lineitem": li, "orders": o, "customer": c, "part": p}


@pytest.fixture(scope="module")
def catalog(tpch):
    cat = Catalog()
    for name, df in tpch.items():
        cat.add_table(name, df.columns)
    cat.unique_keys["orders"] = {"o_orderkey"}
    cat.unique_keys["customer"] = {"c_custkey"}
    cat.unique_keys["part"] = {"p_partkey"}
    return cat


class TestTpchLite:
    def test_filter_pushdown_orders_lineitem(self, spark, tpch, catalog):
        plan = Project(
            Filter(
                Join(Scan("lineitem"), Scan("orders"), "l_orderkey", "o_orderkey"),
                And([
                    Cmp(">", Col("l_quantity"), Lit(40)),
                    Cmp("=", Col("o_orderstatus"), Lit("F")),
                ]),
            ),
            [("l_orderkey", Col("l_orderkey")), ("l_quantity", Col("l_quantity")),
             ("o_totalprice", Col("o_totalprice"))],
        )
        opt = CrossOptimizer().optimize(plan, catalog).plan
        df = to_dataframe(opt, spark, tpch)
        assert_equivalent(
            df,
            "SELECT l.l_orderkey AS l_orderkey, l.l_quantity AS l_quantity, "
            "o.o_totalprice AS o_totalprice "
            "FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey "
            "WHERE l.l_quantity > 40 AND o.o_orderstatus = 'F'",
            lineitem=tpch["lineitem"],
            orders=tpch["orders"],
        )

    def test_three_way_join_with_projection(self, spark, tpch, catalog):
        plan = Project(
            Join(
                Join(Scan("lineitem"), Scan("orders"), "l_orderkey", "o_orderkey"),
                Scan("customer"),
                "o_custkey",
                "c_custkey",
            ),
            [("l_orderkey", Col("l_orderkey")), ("c_mktsegment", Col("c_mktsegment"))],
        )
        opt = CrossOptimizer().optimize(plan, catalog).plan
        df = to_dataframe(opt, spark, tpch)
        assert_equivalent(
            df,
            "SELECT l.l_orderkey AS l_orderkey, c.c_mktsegment AS c_mktsegment "
            "FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey "
            "JOIN customer c ON o.o_custkey = c.c_custkey",
            lineitem=tpch["lineitem"],
            orders=tpch["orders"],
            customer=tpch["customer"],
        )

    def test_part_filter_date_column(self, spark, tpch, catalog):
        plan = Project(
            Filter(Scan("part"), Cmp("=", Col("p_type"), Lit("PROMO"))),
            [("p_partkey", Col("p_partkey")), ("p_retailprice", Col("p_retailprice"))],
        )
        df = to_dataframe(plan, spark, tpch)
        assert_equivalent(
            df,
            "SELECT p_partkey, p_retailprice FROM part WHERE p_type = 'PROMO'",
            part=tpch["part"],
        )

    def test_zipf_and_uniform_generators(self, spark):
        z = synth_data.zipf_keys(spark, n=2000, n_keys=50)
        u = synth_data.uniform_keys(spark, n=2000, n_keys=50)
        zc = z.groupBy("k").count().toPandas().sort_values("count", ascending=False)
        uc = u.groupBy("k").count().toPandas().sort_values("count", ascending=False)
        # zipf head is much heavier than uniform head
        assert zc["count"].iloc[0] > 3 * uc["count"].iloc[0]
