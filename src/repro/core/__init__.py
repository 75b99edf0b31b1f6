"""The paper's algorithms: WSPD (Alg. 1), GFK (Alg. 2), MemoGFK
(Alg. 3), EMST entry points, HDBSCAN* (Sec. 3.2), approximate OPTICS
(App. C), and the ordered dendrogram (Sec. 4)."""
