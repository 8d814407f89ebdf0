"""The five MV-refresh workloads of paper Table III.

The paper decomposes TPC-DS queries into select-project-join (SPJ)
units — one MV per unit — and merges the graphs of queries sharing
intermediate nodes/topics into one DAG per workload:

========== ================== ======= =========
Workload    TPC-DS queries    # nodes  I/O ratio
========== ================== ======= =========
I/O 1       5, 77, 80           21      51.5 %
I/O 2       2, 59, 74, 75       19      59.0 %
I/O 3       44, 49              26      46.6 %
Compute 1   33, 56, 60, 61      21       0.9 %
Compute 2   14, 23              16      28.3 %
========== ================== ======= =========

Official TPC-DS SQL is not redistributable/derivable offline, so each
workload here is a hand-built DAG with the *same node count* and the
same structural idiom as the queries it stands in for (DESIGN.md §4.3):

* the I/O workloads carry big early SPJ intermediates (channel ⨝
  date_dim ⨝ item ⨝ customer pyramids — Q5/Q77/Q80's per-channel profit
  reports, Q2/Q59/Q74/Q75's year-over-year comparisons, Q44/Q49's
  best/worst item rankings) that are re-read several times downstream —
  exactly the reads S/C short-circuits;
* the Compute workloads aggregate immediately (Q33/56/60/61's per-
  category/manufacturer rollups, Q14/Q23's cross-channel frequent-item
  analysis), so intermediates are tiny and I/O is negligible.

Every statement is portable SQL that runs unchanged on Spark and DuckDB
(the oracle); MV nodes reference their parents by bare table name.
"""
from __future__ import annotations

from repro.workloads.spec import MVSpec, WorkloadSpec

_CH = (("ss", "store_sales"), ("cs", "catalog_sales"), ("ws", "web_sales"))
_CHANNEL_NAME = {"ss": "store", "cs": "catalog", "ws": "web"}

_BASE_TABLES = (
    "store_sales",
    "catalog_sales",
    "web_sales",
    "date_dim",
    "item",
    "store",
    "customer",
)


def _measures(p: str, alias: str = "") -> str:
    # Lean SPJ projection (TPC-DS queries project few measures); keeps
    # intermediate bytes in the paper's catalog-relative regime.
    a = f"{alias}." if alias else ""
    return (
        f"{a}{p}_item_sk, {a}{p}_customer_sk, {a}{p}_quantity, "
        f"{a}{p}_sales_price, {a}{p}_ext_sales_price, {a}{p}_net_profit"
    )


# ---------------------------------------------------------------------------
# Workload 1 — "I/O 1": per-channel profit report (TPC-DS Q5/Q77/Q80 idiom)
# ---------------------------------------------------------------------------
def _w1(part: bool = False) -> WorkloadSpec:
    yr = "f.d_year" if part else "d.d_year"
    nodes: list[MVSpec] = []
    for p, fact in _CH:
        store_cols = ", s.s_state" if p == "ss" else ""
        store_join = (
            " JOIN store s ON f.ss_store_sk = s.s_store_sk" if p == "ss" else ""
        )
        store_sk = ", f.ss_store_sk" if p == "ss" else ""
        nodes += [
            MVSpec(
                f"{p}_sales_recent",
                f"""SELECT {_measures(p, 'f')}{store_sk},
                           d.d_year, d.d_moy, d.d_qoy
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    WHERE {yr} IN (2000, 2001)
                      AND f.{p}_sales_price > 40""",
            ),
            MVSpec(
                f"{p}_sales_item",
                f"""SELECT f.*, i.i_category, i.i_category_id, i.i_brand_id,
                           i.i_current_price
                    FROM {p}_sales_recent f
                    JOIN item i ON f.{p}_item_sk = i.i_item_sk
                    WHERE i.i_category IN
                          ('Books','Electronics','Home','Sports','Music')""",
                (f"{p}_sales_recent",),
            ),
            MVSpec(
                f"{p}_sales_enriched",
                f"""SELECT f.*, c.c_birth_year, c.c_preferred_cust_flag{store_cols},
                           CASE WHEN f.{p}_net_profit > 0 THEN 'gain'
                                ELSE 'loss' END AS profit_band
                    FROM {p}_sales_item f
                    JOIN customer c ON f.{p}_customer_sk = c.c_customer_sk{store_join}""",
                (f"{p}_sales_item",),
            ),
            MVSpec(
                f"{p}_profit_agg",
                f"""SELECT d_year, i_category,
                           SUM({p}_ext_sales_price) AS total_sales,
                           SUM({p}_net_profit) AS total_profit,
                           COUNT(*) AS n_lines
                    FROM {p}_sales_enriched
                    GROUP BY d_year, i_category""",
                (f"{p}_sales_enriched",),
            ),
            MVSpec(
                f"{p}_profit_monthly",
                f"""SELECT d_year, d_moy,
                           SUM({p}_ext_sales_price) AS total_sales,
                           SUM({p}_net_profit) AS total_profit
                    FROM {p}_sales_enriched
                    GROUP BY d_year, d_moy""",
                (f"{p}_sales_enriched",),
            ),
        ]
    union_profit = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, d_year, i_category, "
        f"total_sales, total_profit, n_lines FROM {p}_profit_agg"
        for p, _ in _CH
    )
    union_monthly = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, d_year, d_moy, "
        f"total_sales, total_profit FROM {p}_profit_monthly"
        for p, _ in _CH
    )
    nodes += [
        MVSpec(
            "all_profit",
            union_profit,
            tuple(f"{p}_profit_agg" for p, _ in _CH),
        ),
        MVSpec(
            "profit_by_year",
            """SELECT d_year, SUM(total_sales) AS year_sales,
                      SUM(total_profit) AS year_profit
               FROM all_profit GROUP BY d_year""",
            ("all_profit",),
        ),
        MVSpec(
            "profit_by_category",
            """SELECT i_category, SUM(total_sales) AS cat_sales,
                      SUM(total_profit) AS cat_profit, SUM(n_lines) AS cat_lines
               FROM all_profit GROUP BY i_category""",
            ("all_profit",),
        ),
        MVSpec(
            "channel_share",
            """SELECT a.channel, a.d_year, a.i_category,
                      a.total_sales / y.year_sales AS sales_share,
                      a.total_profit AS profit
               FROM all_profit a
               JOIN profit_by_year y ON a.d_year = y.d_year""",
            ("all_profit", "profit_by_year"),
        ),
        MVSpec(
            "monthly_all",
            union_monthly,
            tuple(f"{p}_profit_monthly" for p, _ in _CH),
        ),
        MVSpec(
            "profit_summary",
            """SELECT c.i_category, c.cat_sales, c.cat_profit,
                      (SELECT SUM(total_profit) FROM monthly_all) AS grand_profit
               FROM profit_by_category c""",
            ("profit_by_category", "monthly_all"),
        ),
    ]
    return WorkloadSpec("io1_profit_report", tuple(nodes), _BASE_TABLES)


# ---------------------------------------------------------------------------
# Workload 2 — "I/O 2": year-over-year sales (TPC-DS Q2/Q59/Q74/Q75 idiom)
# ---------------------------------------------------------------------------
def _w2(part: bool = False) -> WorkloadSpec:
    yr = "f.d_year" if part else "d.d_year"
    nodes: list[MVSpec] = []
    for p, fact in _CH:
        nodes += [
            MVSpec(
                f"{p}_sales_y",
                f"""SELECT {_measures(p, 'f')}, d.d_year, d.d_moy
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    WHERE {yr} IN (2000, 2001)
                      AND f.{p}_sales_price > 40""",
            ),
            MVSpec(
                f"{p}_tot_2000",
                f"""SELECT {p}_item_sk AS item_sk,
                           SUM({p}_quantity) AS qty,
                           SUM({p}_ext_sales_price) AS sales
                    FROM {p}_sales_y WHERE d_year = 2000
                    GROUP BY {p}_item_sk""",
                (f"{p}_sales_y",),
            ),
            MVSpec(
                f"{p}_tot_2001",
                f"""SELECT {p}_item_sk AS item_sk,
                           SUM({p}_quantity) AS qty,
                           SUM({p}_ext_sales_price) AS sales
                    FROM {p}_sales_y WHERE d_year = 2001
                    GROUP BY {p}_item_sk""",
                (f"{p}_sales_y",),
            ),
            MVSpec(
                f"{p}_yoy",
                f"""SELECT a.item_sk, a.sales AS sales_2000,
                           b.sales AS sales_2001,
                           b.sales / a.sales AS growth
                    FROM {p}_tot_2000 a
                    JOIN {p}_tot_2001 b ON a.item_sk = b.item_sk
                    WHERE a.sales > 0""",
                (f"{p}_tot_2000", f"{p}_tot_2001"),
            ),
        ]
    u2000 = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, item_sk, qty, sales "
        f"FROM {p}_tot_2000"
        for p, _ in _CH
    )
    u2001 = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, item_sk, qty, sales "
        f"FROM {p}_tot_2001"
        for p, _ in _CH
    )
    nodes += [
        MVSpec("yoy_all_2000", u2000, tuple(f"{p}_tot_2000" for p, _ in _CH)),
        MVSpec("yoy_all_2001", u2001, tuple(f"{p}_tot_2001" for p, _ in _CH)),
        MVSpec(
            "yoy_join",
            """SELECT a.channel, a.item_sk,
                      a.sales AS sales_2000, b.sales AS sales_2001,
                      b.sales / a.sales AS growth
               FROM yoy_all_2000 a
               JOIN yoy_all_2001 b
                 ON a.channel = b.channel AND a.item_sk = b.item_sk
               WHERE a.sales > 0""",
            ("yoy_all_2000", "yoy_all_2001"),
        ),
        MVSpec(
            "yoy_growth",
            "SELECT * FROM yoy_join WHERE growth > 1.1",
            ("yoy_join",),
        ),
        MVSpec(
            "yoy_decline",
            "SELECT * FROM yoy_join WHERE growth < 0.9",
            ("yoy_join",),
        ),
        MVSpec(
            "yoy_channel",
            """SELECT channel, SUM(sales_2000) AS ch_sales_2000,
                      SUM(sales_2001) AS ch_sales_2001, COUNT(*) AS n_items
               FROM yoy_join GROUP BY channel""",
            ("yoy_join",),
        ),
        MVSpec(
            "yoy_summary",
            """SELECT c.channel, c.ch_sales_2000, c.ch_sales_2001,
                      g.n_grow
               FROM yoy_channel c
               JOIN (SELECT channel, COUNT(*) AS n_grow
                     FROM yoy_growth GROUP BY channel) g
                 ON c.channel = g.channel""",
            ("yoy_channel", "yoy_growth"),
        ),
    ]
    return WorkloadSpec("io2_yoy_sales", tuple(nodes), _BASE_TABLES)


# ---------------------------------------------------------------------------
# Workload 3 — "I/O 3": best/worst item ranking (TPC-DS Q44/Q49 idiom)
# ---------------------------------------------------------------------------
def _w3(part: bool = False) -> WorkloadSpec:
    yr = "f.d_year" if part else "d.d_year"
    nodes: list[MVSpec] = []
    for p, fact in _CH:
        nodes += [
            MVSpec(
                f"{p}_line",
                f"""SELECT {_measures(p, 'f')}, d.d_year, d.d_moy, d.d_qoy
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    WHERE {yr} = 2001 AND f.{p}_quantity > 30""",
            ),
            MVSpec(
                f"{p}_line_item",
                f"""SELECT f.*, i.i_category, i.i_brand_id, i.i_manufact_id
                    FROM {p}_line f
                    JOIN item i ON f.{p}_item_sk = i.i_item_sk""",
                (f"{p}_line",),
            ),
            MVSpec(
                f"{p}_item_rev",
                f"""SELECT {p}_item_sk AS item_sk, i_category,
                           SUM({p}_ext_sales_price) AS revenue,
                           SUM({p}_quantity) AS qty,
                           SUM({p}_net_profit) AS profit,
                           COUNT(*) AS n_lines
                    FROM {p}_line_item
                    GROUP BY {p}_item_sk, i_category""",
                (f"{p}_line_item",),
            ),
            MVSpec(
                f"{p}_avg_rev",
                f"SELECT AVG(revenue) AS avg_revenue FROM {p}_item_rev",
                (f"{p}_item_rev",),
            ),
            MVSpec(
                f"{p}_best",
                f"""SELECT r.* FROM {p}_item_rev r
                    WHERE r.revenue > 1.5 *
                          (SELECT avg_revenue FROM {p}_avg_rev)""",
                (f"{p}_item_rev", f"{p}_avg_rev"),
            ),
            MVSpec(
                f"{p}_worst",
                f"""SELECT r.* FROM {p}_item_rev r
                    WHERE r.revenue < 0.5 *
                          (SELECT avg_revenue FROM {p}_avg_rev)""",
                (f"{p}_item_rev", f"{p}_avg_rev"),
            ),
        ]
    ubest = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, item_sk, i_category, "
        f"revenue, qty, profit FROM {p}_best"
        for p, _ in _CH
    )
    uworst = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, item_sk, i_category, "
        f"revenue, qty, profit FROM {p}_worst"
        for p, _ in _CH
    )
    nodes += [
        MVSpec("best_all", ubest, tuple(f"{p}_best" for p, _ in _CH)),
        MVSpec("worst_all", uworst, tuple(f"{p}_worst" for p, _ in _CH)),
        MVSpec(
            "best_worst",
            """SELECT b.item_sk, b.channel AS best_channel,
                      w.channel AS worst_channel,
                      b.revenue AS best_revenue, w.revenue AS worst_revenue
               FROM best_all b
               JOIN worst_all w ON b.item_sk = w.item_sk""",
            ("best_all", "worst_all"),
        ),
        MVSpec(
            "best_detail",
            """SELECT b.*, i.i_brand_id, i.i_manufact_id, i.i_current_price
               FROM best_all b JOIN item i ON b.item_sk = i.i_item_sk""",
            ("best_all",),
        ),
        MVSpec(
            "worst_detail",
            """SELECT w.*, i.i_brand_id, i.i_manufact_id, i.i_current_price
               FROM worst_all w JOIN item i ON w.item_sk = i.i_item_sk""",
            ("worst_all",),
        ),
        MVSpec(
            "rank_by_category",
            """SELECT i_category, COUNT(*) AS n_best,
                      SUM(revenue) AS best_revenue
               FROM best_detail GROUP BY i_category""",
            ("best_detail",),
        ),
        MVSpec(
            "worst_by_category",
            """SELECT i_category, COUNT(*) AS n_worst,
                      SUM(revenue) AS worst_revenue
               FROM worst_detail GROUP BY i_category""",
            ("worst_detail",),
        ),
        MVSpec(
            "ranking_summary",
            """SELECT b.i_category, b.n_best, b.best_revenue,
                      w.n_worst, w.worst_revenue
               FROM rank_by_category b
               JOIN worst_by_category w ON b.i_category = w.i_category""",
            ("rank_by_category", "worst_by_category"),
        ),
    ]
    return WorkloadSpec("io3_item_ranking", tuple(nodes), _BASE_TABLES)


# ---------------------------------------------------------------------------
# Workload 4 — "Compute 1": category rollups (TPC-DS Q33/Q56/Q60/Q61 idiom)
# Aggregates immediately on base tables — intermediates are tiny, so the
# workload is compute-bound (paper: 0.9 % I/O).
# ---------------------------------------------------------------------------
def _w4() -> WorkloadSpec:
    nodes: list[MVSpec] = []
    for p, fact in _CH:
        nodes += [
            MVSpec(
                f"{p}_cat_sales",
                f"""SELECT i.i_category_id, i.i_category, d.d_year,
                           SUM(f.{p}_ext_sales_price) AS total_sales,
                           SUM(f.{p}_net_profit) AS total_profit,
                           COUNT(*) AS n_lines
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    JOIN item i ON f.{p}_item_sk = i.i_item_sk
                    GROUP BY i.i_category_id, i.i_category, d.d_year""",
            ),
            MVSpec(
                f"{p}_manuf_sales",
                f"""SELECT i.i_manufact_id,
                           SUM(f.{p}_ext_sales_price) AS total_sales,
                           SUM(f.{p}_quantity) AS total_qty
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    JOIN item i ON f.{p}_item_sk = i.i_item_sk
                    WHERE d.d_moy BETWEEN 1 AND 6
                    GROUP BY i.i_manufact_id""",
            ),
            MVSpec(
                f"{p}_month_sales",
                f"""SELECT d.d_year, d.d_moy,
                           SUM(f.{p}_ext_sales_price) AS total_sales,
                           AVG(f.{p}_sales_price) AS avg_price
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    GROUP BY d.d_year, d.d_moy""",
            ),
            MVSpec(
                f"{p}_cat_top",
                f"""SELECT * FROM {p}_cat_sales
                    WHERE total_sales >
                          (SELECT AVG(total_sales) FROM {p}_cat_sales)""",
                (f"{p}_cat_sales",),
            ),
            MVSpec(
                f"{p}_best_month",
                f"""SELECT * FROM {p}_month_sales
                    WHERE total_sales >
                          (SELECT AVG(total_sales) FROM {p}_month_sales)""",
                (f"{p}_month_sales",),
            ),
        ]
    ucat = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, i_category_id, i_category, "
        f"d_year, total_sales, total_profit FROM {p}_cat_sales"
        for p, _ in _CH
    )
    umanuf = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, i_manufact_id, "
        f"total_sales, total_qty FROM {p}_manuf_sales"
        for p, _ in _CH
    )
    umonth = " UNION ALL ".join(
        f"SELECT '{_CHANNEL_NAME[p]}' AS channel, d_year, d_moy, "
        f"total_sales FROM {p}_month_sales"
        for p, _ in _CH
    )
    nodes += [
        MVSpec("cat_sales_all", ucat, tuple(f"{p}_cat_sales" for p, _ in _CH)),
        MVSpec(
            "manuf_sales_all", umanuf, tuple(f"{p}_manuf_sales" for p, _ in _CH)
        ),
        MVSpec(
            "cross_cat",
            """SELECT i_category, d_year, SUM(total_sales) AS sales,
                      SUM(total_profit) AS profit, COUNT(*) AS n_channels
               FROM cat_sales_all GROUP BY i_category, d_year""",
            ("cat_sales_all",),
        ),
        MVSpec(
            "cross_manuf",
            """SELECT i_manufact_id, SUM(total_sales) AS sales,
                      SUM(total_qty) AS qty
               FROM manuf_sales_all
               GROUP BY i_manufact_id
               HAVING COUNT(*) = 3""",
            ("manuf_sales_all",),
        ),
        MVSpec("month_all", umonth, tuple(f"{p}_month_sales" for p, _ in _CH)),
        MVSpec(
            "analysis_summary",
            """SELECT c.i_category, c.d_year, c.sales, c.profit,
                      (SELECT SUM(total_sales) FROM month_all) AS grand_sales
               FROM cross_cat c""",
            ("cross_cat", "month_all"),
        ),
    ]
    return WorkloadSpec("compute1_category", tuple(nodes), _BASE_TABLES)


# ---------------------------------------------------------------------------
# Workload 5 — "Compute 2": cross-channel frequent items (Q14/Q23 idiom)
# Mostly aggregation, but the frequent-item join back into the facts
# produces mid-size SPJ intermediates (paper: 28.3 % I/O).
# ---------------------------------------------------------------------------
def _w5(part: bool = False) -> WorkloadSpec:
    yr = "f.d_year" if part else "d.d_year"
    nodes: list[MVSpec] = []
    for p, fact in _CH:
        nodes.append(
            MVSpec(
                f"{p}_item_agg",
                f"""SELECT f.{p}_item_sk AS item_sk,
                           SUM(f.{p}_quantity) AS qty,
                           SUM(f.{p}_ext_sales_price) AS sales
                    FROM {fact} f
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    WHERE {yr} IN (2000, 2001)
                    GROUP BY f.{p}_item_sk""",
            )
        )
    nodes.append(
        MVSpec(
            "freq_items",
            """SELECT s.item_sk FROM ss_item_agg s
               JOIN cs_item_agg c ON s.item_sk = c.item_sk
               JOIN ws_item_agg w ON s.item_sk = w.item_sk
               WHERE s.qty > 1.1 * (SELECT AVG(qty) FROM ss_item_agg)
                 AND c.qty > 1.1 * (SELECT AVG(qty) FROM cs_item_agg)
                 AND w.qty > (SELECT AVG(qty) FROM ws_item_agg)""",
            ("ss_item_agg", "cs_item_agg", "ws_item_agg"),
        )
    )
    for p, fact in _CH:
        nodes.append(
            MVSpec(
                f"{p}_freq_sales",
                f"""SELECT '{_CHANNEL_NAME[p]}' AS channel,
                           f.{p}_item_sk AS item_sk,
                           f.{p}_customer_sk AS customer_sk,
                           f.{p}_quantity AS quantity,
                           f.{p}_ext_sales_price AS ext_sales_price,
                           f.{p}_net_profit AS net_profit,
                           d.d_year, d.d_moy, d.d_qoy
                    FROM {fact} f
                    JOIN freq_items fi ON f.{p}_item_sk = fi.item_sk
                    JOIN date_dim d ON f.{p}_sold_date_sk = d.d_date_sk
                    WHERE {yr} = 2001""",
                ("freq_items",),
            )
        )
    nodes += [
        MVSpec(
            "freq_sales_all",
            """SELECT * FROM ss_freq_sales
               UNION ALL SELECT * FROM cs_freq_sales
               UNION ALL SELECT * FROM ws_freq_sales""",
            ("ss_freq_sales", "cs_freq_sales", "ws_freq_sales"),
        ),
        MVSpec(
            "cust_spend",
            """SELECT customer_sk, SUM(ext_sales_price) AS spend,
                      SUM(quantity) AS qty, COUNT(*) AS n_lines
               FROM freq_sales_all GROUP BY customer_sk""",
            ("freq_sales_all",),
        ),
        MVSpec(
            "best_customers",
            """SELECT * FROM cust_spend
               WHERE spend > 2.0 * (SELECT AVG(spend) FROM cust_spend)""",
            ("cust_spend",),
        ),
        MVSpec(
            "monthly_mix",
            """SELECT channel, d_year, d_moy,
                      SUM(ext_sales_price) AS sales,
                      SUM(net_profit) AS profit
               FROM freq_sales_all GROUP BY channel, d_year, d_moy""",
            ("freq_sales_all",),
        ),
        MVSpec(
            "quarterly_mix",
            """SELECT d_year, d_qoy, SUM(ext_sales_price) AS sales
               FROM freq_sales_all GROUP BY d_year, d_qoy""",
            ("freq_sales_all",),
        ),
        MVSpec(
            "channel_mix",
            """SELECT channel, SUM(ext_sales_price) AS ch_sales,
                      SUM(net_profit) AS ch_profit
               FROM freq_sales_all GROUP BY channel""",
            ("freq_sales_all",),
        ),
        MVSpec(
            "best_cust_detail",
            """SELECT b.*, c.c_birth_year, c.c_state
               FROM best_customers b
               JOIN customer c ON b.customer_sk = c.c_customer_sk""",
            ("best_customers",),
        ),
        MVSpec(
            "mix_summary",
            """SELECT m.channel, m.d_year, m.d_moy,
                      m.sales / t.ch_sales AS sales_share
               FROM monthly_mix m
               JOIN channel_mix t ON m.channel = t.channel""",
            ("monthly_mix", "channel_mix"),
        ),
        MVSpec(
            "workload_summary",
            """SELECT q.d_year, q.d_qoy, q.sales,
                      (SELECT COUNT(*) FROM best_cust_detail) AS n_best_cust
               FROM quarterly_mix q""",
            ("quarterly_mix", "best_cust_detail"),
        ),
    ]
    return WorkloadSpec("compute2_cross_channel", tuple(nodes), _BASE_TABLES)


# Paper Table III row metadata, keyed by our workload name.
PAPER_TABLE3 = {
    "io1_profit_report": {
        "label": "I/O 1", "queries": "5, 77, 80", "nodes": 21, "io_ratio": 0.515,
    },
    "io2_yoy_sales": {
        "label": "I/O 2", "queries": "2, 59, 74, 75", "nodes": 19, "io_ratio": 0.590,
    },
    "io3_item_ranking": {
        "label": "I/O 3", "queries": "44, 49", "nodes": 26, "io_ratio": 0.466,
    },
    "compute1_category": {
        "label": "Compute 1", "queries": "33, 56, 60, 61", "nodes": 21, "io_ratio": 0.009,
    },
    "compute2_cross_channel": {
        "label": "Compute 2", "queries": "14, 23", "nodes": 16, "io_ratio": 0.283,
    },
}


def all_workloads(partitioned: bool = False) -> dict[str, WorkloadSpec]:
    """The five Table III workloads, keyed by name, in paper order.

    ``partitioned=True`` returns the TPC-DSp variant (paper §VI-A): the
    fact tables carry an inline ``d_year`` (written partitioned by
    year), so root nodes filter ``f.d_year`` directly — Spark statically
    prunes partitions, making base scans (and hence total runtime) far
    cheaper while S/C's absolute I/O savings stay the same, which is why
    the paper's relative speedups are larger on TPC-DSp."""
    ws = (_w1(partitioned), _w2(partitioned), _w3(partitioned), _w4(), _w5(partitioned))
    return {w.name: w for w in ws}


def workload(name: str, partitioned: bool = False) -> WorkloadSpec:
    return all_workloads(partitioned)[name]
