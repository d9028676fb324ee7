"""RDF substrate: distributed RDF graphs (Def 1), partitioners, synthetic
dataset generators (LUBM-lite / YAGO2-lite / BTC-lite) and the partitioning
cost model of Section VII."""
