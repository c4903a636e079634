package repro.core

/** Kaskade's library of *constraint-mining rules* (paper § IV-A2, Lst. 2 and
  * Lst. 6): Prolog rules that derive implicit structural constraints from the
  * explicit query/schema facts at view-enumeration time.
  */
object MiningRules {

  /** Schema constraint-mining rules.
    *
    * `schemaKHopPath/3` is the paper's Lst. 2 rule: acyclic directed k-length
    * paths over the schema graph, with a trail preventing schema-vertex
    * revisits (the paper's base case binds K=1; its listing's unbound `I` is
    * a typo).
    *
    * `schemaKHopWalk/3` additionally admits k-length *walks* (revisits
    * allowed). This is the variant `kHopConnector` must use: instance-level
    * paths revisit schema types (job→file→job→file…), which is exactly why
    * § IV-B's enumeration yields K=2,4,…,10 for the blast-radius query — the
    * trail-based rule alone would cap job-to-job paths at K=2. K must be
    * bound when K>1 (the query constraints bind it first), which is also what
    * makes the rule terminate on cyclic schemas.
    */
  val schemaRules: String =
    """
    % ---- Lst. 2: acyclic k-hop paths over the schema graph ----
    schemaKHopPath(X, Y, K) :- schemaKHopPathAcc(X, Y, K, []).
    schemaKHopPathAcc(X, Y, 1, _) :- schemaEdge(X, Y, _).
    schemaKHopPathAcc(X, Y, K, Trail) :-
      schemaEdge(X, Z, _), not(member(Z, Trail)),
      schemaKHopPathAcc(Z, Y, K1, [X|Trail]), K is K1 + 1.

    % ---- k-length schema walks (K bound for K>1) ----
    schemaKHopWalk(X, Y, 1) :- schemaEdge(X, Y, _).
    schemaKHopWalk(X, Y, K) :-
      integer(K), K > 1, schemaEdge(X, Z, _),
      K1 is K - 1, schemaKHopWalk(Z, Y, K1).

    % ---- variable-length schema paths (acyclic trails) ----
    schemaPath(X, Y) :- schemaPathAcc(X, Y, []).
    schemaPathAcc(X, Y, _) :- schemaEdge(X, Y, _).
    schemaPathAcc(X, Y, Trail) :-
      schemaEdge(X, Z, _), not(member(Z, Trail)),
      schemaPathAcc(Z, Y, [X|Trail]).

    % ---- schema paths restricted to a single edge type ----
    schemaPathVia(X, Y, E) :- schemaPathViaAcc(X, Y, E, []).
    schemaPathViaAcc(X, Y, E, _) :- schemaEdge(X, Y, E).
    schemaPathViaAcc(X, Y, E, Trail) :-
      schemaEdge(X, Z, E), not(member(Z, Trail)),
      schemaPathViaAcc(Z, Y, E, [X|Trail]).

    % ---- derived schema vocabulary ----
    schemaEdgeType(E) :- schemaEdge(_, _, E).
    schemaSourceType(T) :- schemaEdge(T, _, _), not(schemaEdge(_, T, _)).
    schemaSinkType(T) :- schemaEdge(_, T, _), not(schemaEdge(T, _, _)).
    """

  /** Query constraint-mining rules (Lst. 6).
    *
    * Deviation from the listing: the in/out-degree rules count
    * variable-length paths as incident edges (via `queryAnyEdge/2`);
    * otherwise a vertex whose only outgoing pattern element is a var-length
    * path would be misclassified as a sink.
    */
  val queryRules: String =
    """
    % Query k-hop variable length paths
    queryKHopVariableLengthPath(X, Y, K) :-
      queryVariableLengthPath(X, Y, LOWER, UPPER),
      between(LOWER, UPPER, K).

    % Query k-hop paths
    queryKHopPath(X, Y, 1) :- queryEdge(X, Y).
    queryKHopPath(X, Y, K) :- queryKHopVariableLengthPath(X, Y, K).
    queryKHopPath(X, Y, K) :- queryEdge(X, Z),
      queryKHopPath(Z, Y, K1), K is K1 + 1.
    queryKHopPath(X, Y, K) :- queryKHopVariableLengthPath(X, Z, K2),
      queryKHopPath(Z, Y, K1), K is K1 + K2.

    % Query paths
    queryPath(X, Y) :- queryEdge(X, Y).
    queryPath(X, Y) :- queryKHopPath(X, Y, _).
    queryPath(X, Y) :- queryEdge(X, Z), queryPath(Z, Y).

    % Query vertex source/sink
    queryVertexSource(X) :- queryVertexInDegree(X, 0).
    queryVertexSink(X) :- queryVertexOutDegree(X, 0).

    % Query vertex in/out degrees (var-length paths count as edges)
    queryAnyEdge(X, Y) :- queryEdge(X, Y).
    queryAnyEdge(X, Y) :- queryVariableLengthPath(X, Y, _, _).
    queryIncomingVertices(X, INLIST) :- queryVertex(X),
      findall(SRC, queryAnyEdge(SRC, X), INLIST).
    queryOutgoingVertices(X, OUTLIST) :- queryVertex(X),
      findall(DST, queryAnyEdge(X, DST), OUTLIST).
    queryVertexInDegree(X, D) :-
      queryIncomingVertices(X, INLIST), length(INLIST, D).
    queryVertexOutDegree(X, D) :-
      queryOutgoingVertices(X, OUTLIST), length(OUTLIST, D).

    % Ego-centric k-hop neighborhood (undirected) — Lst. 5
    queryVertexKHopNbors(K, X, LIST) :- queryVertex(X),
      findall(SRC, queryKHopPath(SRC, X, K), INLIST),
      findall(DST, queryKHopPath(X, DST, K), OUTLIST),
      append(INLIST, OUTLIST, TMPLIST), sort(TMPLIST, LIST).

    % Example aggregate function for higher-order templates — Lst. 5
    sum(X, Y, R) :- R is X + Y.

    % Aggregator over a k-hop neighborhood, e.g.
    %   kHopNborsAggregator(1, j2, bytes, sum, R)
    kHopNborsAggregator(K, X, P, AGGR, RESULT) :-
      queryVertexKHopNbors(K, X, NBORS),
      convlist(property(P), NBORS, OUTLIST),
      foldl(AGGR, OUTLIST, 0, RESULT).
    """

  val all: String = schemaRules + queryRules
}
