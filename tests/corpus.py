"""Query corpora used by the executor/baseline oracle tests.

Each corpus stresses the planner/executor dimensions that matter:
no-group-by totals, group-bys on every relation, group-bys on join
attributes, group-bys spanning *multiple* relations (carrying views on
several subtrees), multi-factor sum-products across relations, factors
on join attributes, and multi-aggregate queries.
"""
from repro.core.aggregates import Query, SumProduct


def _q(name, gb, **aggs):
    return Query.make(name, gb, **aggs)


FAVORITA_CORPUS: list[Query] = [
    # paper's running example
    _q("q1_total_units", [], v=SumProduct.of(units="units")),
    _q(
        "q2_store_gh",
        ["store"],
        v=SumProduct.of(item="(item * 0.5 + 1.0)", date="(date % 7 + 1.0)"),
    ),
    _q("q3_class_rev", ["iclass"], v=SumProduct.of(units="units", oilprize="oilprize")),
    # totals
    _q("count_star", [], v=SumProduct.count()),
    _q("sum_units_sq", [], v=SumProduct.of(units="(units * units)")),
    _q("sum_txns_oil_units", [], v=SumProduct.of(txns="txns", oilprize="oilprize", units="units")),
    _q("sum_g_item", [], v=SumProduct.of(item="(item * 0.5 + 1.0)")),
    _q("sum_cluster_txns", [], v=SumProduct.of(cluster="cluster", txns="txns")),
    # one group-by attribute per relation
    _q("by_store", ["store"], v=SumProduct.of(units="units")),
    _q("by_item", ["item"], v=SumProduct.of(txns="txns")),
    _q("by_date", ["date"], v=SumProduct.of(units="units", oilprize="oilprize")),
    _q("by_family", ["family"], v=SumProduct.count()),
    _q("by_iclass", ["iclass"], v=SumProduct.of(units="units")),
    _q("by_city", ["city"], v=SumProduct.of(units="units")),
    _q("by_state", ["state"], v=SumProduct.count()),
    _q("by_stype", ["stype"], v=SumProduct.of(txns="txns")),
    _q("by_cluster", ["cluster"], v=SumProduct.of(units="units")),
    _q("by_htype", ["htype"], v=SumProduct.of(units="units")),
    _q("by_locale", ["locale"], v=SumProduct.count()),
    _q("by_transferred", ["transferred"], v=SumProduct.of(units="units")),
    _q("by_perishable", ["perishable"], v=SumProduct.of(units="units")),
    _q("by_promo", ["promo"], v=SumProduct.count()),
    _q("by_oilprize_weighted", ["date"], v=SumProduct.of(oilprize="(oilprize * oilprize)")),
    # group-bys on join attributes / edge keys
    _q("by_date_store", ["date", "store"], v=SumProduct.of(units="units")),
    _q("by_item_count", ["item"], v=SumProduct.count()),
    # group-bys spanning relations (carrying views on several subtrees)
    _q("by_store_family", ["store", "family"], v=SumProduct.of(units="units")),
    _q("by_city_htype", ["city", "htype"], v=SumProduct.count()),
    _q("by_family_stype", ["family", "stype"], v=SumProduct.of(units="units")),
    _q("by_promo_perishable", ["promo", "perishable"], v=SumProduct.count()),
    _q("by_state_locale_promo", ["state", "locale", "promo"], v=SumProduct.count()),
    # multi-aggregate queries (CART-style)
    _q(
        "cart_family",
        ["family"],
        cnt=SumProduct.count(),
        s=SumProduct.of(units="units"),
        s2=SumProduct.of(units="(units * units)"),
    ),
    _q(
        "cart_txns",
        ["txns"],
        cnt=SumProduct.count(),
        s=SumProduct.of(units="units"),
    ),
    # factor on a group-by attribute
    _q("gb_with_own_factor", ["store"], v=SumProduct.of(store="(store * 1.0)", units="units")),
    # factors on join attributes (applied at anchors)
    _q("by_family_hdate", ["family"], v=SumProduct.of(date="(date % 31 + 1.0)", units="units")),
    _q("by_cluster_gitem", ["cluster"], v=SumProduct.of(item="(item % 13 + 1.0)")),
]


RETAILER_CORPUS: list[Query] = [
    _q("count_star", [], v=SumProduct.count()),
    _q("sum_inv", [], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("sum_inv_prize", [], v=SumProduct.of(inventoryunits="inventoryunits", prize="prize")),
    _q("sum_inv_temp", [], v=SumProduct.of(inventoryunits="inventoryunits", maxtemp="maxtemp")),
    _q("by_category", ["category"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_subcategory", ["subcategory"], v=SumProduct.count()),
    _q("by_categorycluster", ["categorycluster"], v=SumProduct.of(prize="prize")),
    _q("by_rgn", ["rgn_cd"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_clim", ["clim_zn_nbr"], v=SumProduct.count()),
    _q("by_zip", ["zip"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_zip_pop", ["zip"], v=SumProduct.of(population="population")),
    _q("by_rain", ["rain"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_snow", ["snow"], v=SumProduct.count()),
    _q("by_locn", ["locn"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_dateid", ["dateid"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_ksn_count", ["ksn"], v=SumProduct.count()),
    _q("by_category_rgn", ["category", "rgn_cd"], v=SumProduct.count()),
    _q("by_rain_snow", ["rain", "snow"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_category_rain", ["category", "rain"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q(
        "cart_category",
        ["category"],
        cnt=SumProduct.count(),
        s=SumProduct.of(inventoryunits="inventoryunits"),
        s2=SumProduct.of(inventoryunits="(inventoryunits * inventoryunits)"),
    ),
    _q("by_zip_age", ["zip"], v=SumProduct.of(medianage="medianage", inventoryunits="inventoryunits")),
    _q("sum_pop_inv", [], v=SumProduct.of(population="population", inventoryunits="inventoryunits")),
    _q("by_thunder_cat", ["thunder", "categorycluster"], v=SumProduct.count()),
    _q("by_maxtemp", ["maxtemp"], v=SumProduct.of(inventoryunits="inventoryunits")),
    _q("by_locn_dateid", ["locn", "dateid"], v=SumProduct.count()),
]


TPCH_CORPUS: list[Query] = [
    _q("count_star", [], v=SumProduct.count()),
    _q("sum_qty", [], v=SumProduct.of(l_quantity="l_quantity")),
    _q(
        "sum_disc_price",
        [],
        v=SumProduct.of(l_extendedprice="l_extendedprice", l_discount="(1.0 - l_discount)"),
    ),
    _q("by_returnflag", ["l_returnflag"], v=SumProduct.of(l_quantity="l_quantity")),
    _q("by_linestatus", ["l_linestatus"], v=SumProduct.of(l_extendedprice="l_extendedprice")),
    _q(
        "by_flag_status",
        ["l_returnflag", "l_linestatus"],
        cnt=SumProduct.count(),
        qty=SumProduct.of(l_quantity="l_quantity"),
    ),
    _q("by_orderstatus", ["o_orderstatus"], v=SumProduct.of(o_totalprice="o_totalprice")),
    _q("by_priority", ["o_orderpriority"], v=SumProduct.count()),
    _q("by_mktsegment", ["c_mktsegment"], v=SumProduct.of(l_quantity="l_quantity")),
    _q("by_nation", ["c_nationkey"], v=SumProduct.of(c_acctbal="c_acctbal")),
    _q("by_brand", ["p_brand"], v=SumProduct.of(p_retailprice="p_retailprice", l_quantity="l_quantity")),
    _q("by_ptype", ["p_type"], v=SumProduct.count()),
    _q("by_size", ["p_size"], v=SumProduct.of(l_extendedprice="l_extendedprice")),
    _q("cross_acct_qty", ["c_mktsegment"], v=SumProduct.of(c_acctbal="c_acctbal", l_quantity="l_quantity")),
    _q("by_brand_segment", ["p_brand", "c_mktsegment"], v=SumProduct.count()),
    _q("by_orderkey_count", ["l_orderkey"], v=SumProduct.count()),
    _q("by_status_nation", ["o_orderstatus", "c_nationkey"], v=SumProduct.of(l_quantity="l_quantity")),
    _q("by_tax", ["l_returnflag"], v=SumProduct.of(l_tax="(1.0 + l_tax)", l_extendedprice="l_extendedprice")),
]
