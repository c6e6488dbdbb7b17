"""Graph substrates: a driver/executor-local adjacency representation for
per-component kernels (``local``) and distributed DataFrame operators
(``df_graph``, ``kcore``, ``components``, ``metrics``)."""
