"""Generators: shapes, determinism, key integrity, schema agreement."""
import pytest

from repro import synth_data
from repro.datasets import favorita_tree, retailer_tree


# ---------------------------------------------------------------- tpch-lite
@pytest.mark.parametrize("gen", ["lineitem", "orders", "customer", "part"])
def test_tpch_nonempty(spark, gen):
    df = getattr(synth_data, gen)(spark, sf=0.002)
    assert df.count() > 0


@pytest.mark.parametrize("gen", ["lineitem", "orders", "customer", "part"])
def test_tpch_deterministic(spark, gen):
    a = getattr(synth_data, gen)(spark, sf=0.002).toPandas()
    b = getattr(synth_data, gen)(spark, sf=0.002).toPandas()
    assert a.equals(b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 3 * counts.iloc[-1]  # heavy head


def test_uniform_keys_cover(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
    assert df["k"].nunique() == 10


# ---------------------------------------------------------------- favorita
@pytest.fixture(scope="module")
def fav(spark):
    return {k: v.toPandas() for k, v in synth_data.favorita(spark, sf=0.002).items()}


def test_favorita_relations(fav):
    assert set(fav) == {"sales", "transactions", "stores", "oil", "holidays", "items"}


def test_favorita_matches_tree_schema(fav):
    tree = favorita_tree()
    for name, rel in tree.relations.items():
        assert set(fav[name].columns) == set(rel.attrs), name


@pytest.mark.parametrize(
    "fact_col,dim,dim_col",
    [
        ("date", "oil", "date"),
        ("date", "holidays", "date"),
        ("item", "items", "item"),
        ("store", "stores", "store"),
    ],
)
def test_favorita_fk_coverage(fav, fact_col, dim, dim_col):
    """Every sales key exists in its dimension: the natural join is total."""
    assert set(fav["sales"][fact_col]) <= set(fav[dim][dim_col])


def test_favorita_transactions_grid(fav):
    t = fav["transactions"]
    assert len(t) == t["date"].nunique() * t["store"].nunique()


def test_favorita_deterministic(spark, fav):
    again = {k: v.toPandas() for k, v in synth_data.favorita(spark, sf=0.002).items()}
    for name in fav:
        assert fav[name].equals(again[name]), name


def test_favorita_item_skew(fav):
    counts = fav["sales"]["item"].value_counts()
    assert counts.iloc[0] > 2 * counts.median()


def test_favorita_scales(spark):
    small = synth_data.favorita(spark, sf=0.001)["sales"].count()
    big = synth_data.favorita(spark, sf=0.004)["sales"].count()
    assert big == 4 * small


# ---------------------------------------------------------------- retailer
@pytest.fixture(scope="module")
def ret(spark):
    return {k: v.toPandas() for k, v in synth_data.retailer(spark, sf=0.002).items()}


def test_retailer_relations(ret):
    assert set(ret) == {"inventory", "location", "census", "item", "weather"}


def test_retailer_matches_tree_schema(ret):
    tree = retailer_tree()
    for name, rel in tree.relations.items():
        assert set(ret[name].columns) == set(rel.attrs), name


@pytest.mark.parametrize(
    "fact_col,dim,dim_col",
    [("ksn", "item", "ksn"), ("locn", "location", "locn")],
)
def test_retailer_fk_coverage(ret, fact_col, dim, dim_col):
    assert set(ret["inventory"][fact_col]) <= set(ret[dim][dim_col])


def test_retailer_weather_grid_covers_inventory(ret):
    inv_keys = set(zip(ret["inventory"]["locn"], ret["inventory"]["dateid"]))
    w_keys = set(zip(ret["weather"]["locn"], ret["weather"]["dateid"]))
    assert inv_keys <= w_keys


def test_retailer_zip_coverage(ret):
    assert set(ret["location"]["zip"]) <= set(ret["census"]["zip"])


def test_retailer_deterministic(spark, ret):
    again = {k: v.toPandas() for k, v in synth_data.retailer(spark, sf=0.002).items()}
    for name in ret:
        assert ret[name].equals(again[name]), name
