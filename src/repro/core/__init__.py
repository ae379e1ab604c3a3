"""The paper's contribution: min/max-metadata partition pruning.

Modules map to paper sections: ``filter_pruning`` (§3), ``pruning_tree``
(§3.2), ``limit_pruning`` (§4), ``topk_pruning`` (§5), ``join_pruning``
(§6), ``flow`` (§7), on top of the shared expression/interval machinery
(``expr``, ``intervals``, ``stats``).
"""
