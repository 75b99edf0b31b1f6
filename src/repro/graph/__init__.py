"""Graph substrates: union-find, Kruskal, Prim oracles, dual-tree
Boruvka (the mlpack baseline stand-in of Table 3)."""
