package repro.text

/** Controlled vocabulary for the synthetic corpora.
  *
  * Every word the template generators can emit is registered here with a
  * universal POS tag and a semantic cluster. The cluster drives the
  * synthetic word embeddings ([[Embeddings]]) — words in the same cluster
  * are close in embedding space, which is the one semantic property Darwin
  * exploits ("bus" generalizes to "public transport"). The POS tag drives
  * the deterministic tagger/parser that substitutes for SpaCy.
  */
object Vocab extends Serializable {

  /** POS tag + semantic cluster of a vocabulary word. */
  final case class WordInfo(pos: String, cluster: String)

  // ---- word lists, grouped by cluster; templates draw from these ----

  // 'shuttle' is intentionally NOT a {road} slot word: it appears only in
  // its dedicated template family so the Fig. 8 biased-seed experiment has
  // a rule family with no evidence outside its own sentences.
  val roadTransport: Vector[String] =
    Vector("bus", "taxi", "uber", "cab", "lyft", "car", "ride", "tram")
  val railTransport: Vector[String] =
    Vector("bart", "train", "subway", "metro", "caltrain", "monorail")
  val airTransport: Vector[String] =
    Vector("flight", "plane", "jet", "airline")
  // 'hotel' is not a {place} slot word (it appears only as fixed text in
  // the shuttle template) so hotel-anchored rules cover only that family —
  // required for the Fig. 8 biased-seed experiment.
  val places: Vector[String] =
    Vector("airport", "station", "downtown", "museum", "beach",
           "mall", "pier", "stadium", "harbor", "plaza", "park")
  val moveVerbs: Vector[String] =
    Vector("get", "go", "reach", "travel", "walk", "drive", "commute")
  val foods: Vector[String] =
    Vector("pizza", "sushi", "burger", "pasta", "tacos", "ramen", "salad",
           "pancakes", "noodles", "dumplings", "curry", "waffles")
  val meals: Vector[String] =
    Vector("breakfast", "lunch", "dinner", "brunch", "supper")
  val amenities: Vector[String] =
    Vector("towels", "wifi", "pool", "gym", "spa", "parking", "laundry",
           "minibar", "balcony")
  val musicianRoles: Vector[String] =
    Vector("composer", "pianist", "singer", "violinist", "guitarist",
           "drummer", "cellist", "conductor", "soprano", "organist")
  val musicianNames: Vector[String] =
    Vector("beethoven", "mozart", "chopin", "bach", "verdi", "brahms",
           "handel", "liszt", "schubert", "vivaldi", "puccini", "wagner")
  val musicWorks: Vector[String] =
    Vector("symphony", "sonata", "concerto", "opera", "nocturne", "etude",
           "requiem", "ballad", "anthem", "overture")
  val instruments: Vector[String] =
    Vector("piano", "violin", "guitar", "cello", "flute", "organ", "harp")
  val professions: Vector[String] =
    Vector("teacher", "scientist", "engineer", "doctor", "nurse", "lawyer",
           "chef", "pilot", "farmer", "accountant", "architect", "plumber",
           "electrician", "journalist", "librarian", "translator")
  val scientistNames: Vector[String] =
    Vector("darwin", "curie", "newton", "tesla", "faraday", "pasteur")
  val causalEvents: Vector[String] =
    Vector("earthquake", "storm", "fire", "flood", "outbreak", "crash",
           "drought", "explosion", "shortage", "leak", "strike", "virus")
  val causalEffects: Vector[String] =
    Vector("damage", "panic", "losses", "delays", "injuries", "blackout",
           "evacuation", "famine", "collapse", "congestion", "illness")
  val cities: Vector[String] =
    Vector("paris", "vienna", "london", "berlin", "tokyo", "madrid",
           "lisbon", "oslo", "prague", "dublin", "athens", "warsaw")
  val countries: Vector[String] =
    Vector("france", "austria", "england", "germany", "japan", "spain",
           "portugal", "norway", "poland", "greece", "italy", "hungary")
  val animals: Vector[String] =
    Vector("lynx", "otter", "heron", "badger", "falcon", "marten")
  val sports: Vector[String] =
    Vector("football", "hockey", "tennis", "rowing", "cycling", "rugby")
  val products: Vector[String] =
    Vector("laptop", "blender", "mattress", "printer", "camera", "heater",
           "backpack", "toaster", "monitor", "kettle")
  val topics: Vector[String] =
    Vector("insurance", "mortgages", "gardening", "recipes", "fitness",
           "astrology", "coupons", "podcasts", "makeup", "crafts")
  val weatherAdjs: Vector[String] =
    Vector("sunny", "rainy", "windy", "foggy", "humid", "chilly")

  private def entries(ws: Seq[String], pos: String, cluster: String) =
    ws.map(w => w -> WordInfo(pos, cluster))

  /** Full lexicon: word -> (POS, cluster). */
  val lexicon: Map[String, WordInfo] = (
    entries(roadTransport, "NOUN", "transport_road") ++
    entries(Seq("shuttle"), "NOUN", "transport_road") ++
    entries(Seq("hotel"), "NOUN", "place") ++
    entries(railTransport, "NOUN", "transport_rail") ++
    entries(airTransport, "NOUN", "transport_air") ++
    entries(places, "NOUN", "place") ++
    entries(moveVerbs, "VERB", "movement") ++
    entries(foods, "NOUN", "food") ++
    entries(meals, "NOUN", "food") ++
    entries(amenities, "NOUN", "amenity") ++
    entries(musicianRoles, "NOUN", "music") ++
    entries(musicianNames, "PROPN", "music_name") ++
    entries(musicWorks, "NOUN", "music") ++
    entries(instruments, "NOUN", "music") ++
    entries(professions, "NOUN", "profession") ++
    entries(scientistNames, "PROPN", "science_name") ++
    entries(causalEvents, "NOUN", "causal_event") ++
    entries(causalEffects, "NOUN", "causal_effect") ++
    entries(cities, "PROPN", "geo") ++
    entries(countries, "PROPN", "geo") ++
    entries(animals, "NOUN", "nature") ++
    entries(sports, "NOUN", "sport") ++
    entries(products, "NOUN", "retail") ++
    entries(topics, "NOUN", "retail") ++
    entries(weatherAdjs, "ADJ", "weather") ++
    // verbs
    entries(Seq("caused", "causes", "triggered", "induced", "provoked",
                "sparked"), "VERB", "causal_verb") ++
    entries(Seq("resulted", "led", "contributed"), "VERB", "causal_verb") ++
    entries(Seq("order", "ordered", "eat", "craving", "grab", "serve"),
            "VERB", "food_verb") ++
    entries(Seq("served", "cooked"), "VERB", "food_verb") ++
    entries(Seq("composed", "performed", "conducted", "sang", "taught",
                "recorded"), "VERB", "music_verb") ++
    entries(Seq("works", "worked", "hired", "trained", "employed"),
            "VERB", "work_verb") ++
    entries(Seq("discovered", "invented", "studied", "observed"),
            "VERB", "science_verb") ++
    entries(Seq("happened", "occurred", "reported", "announced", "watched",
                "booked", "won", "opened", "closed", "check", "take",
                "bring", "read", "click", "born"), "VERB", "generic_verb") ++
    entries(Seq("is", "was", "are", "were", "be", "been", "am"), "AUX", "func") ++
    entries(Seq("have", "has", "had", "does", "do", "did", "can", "could",
                "would", "will", "cant"), "AUX", "func") ++
    entries(Seq("the", "a", "an", "this", "that", "my", "your", "her",
                "his", "their", "our", "some", "any", "more", "every"),
            "DET", "func") ++
    entries(Seq("to", "from", "of", "in", "on", "at", "by", "for", "with",
                "near", "after", "before", "as", "into"), "ADP", "func") ++
    entries(Seq("i", "you", "we", "they", "he", "she", "it", "there",
                "anyone", "who"), "PRON", "func") ++
    entries(Seq("what", "how", "where", "when"), "PRON", "func") ++
    entries(Seq("and", "or", "but"), "CCONJ", "func") ++
    entries(Seq("not", "also", "just", "here", "right", "now", "tonight",
                "today", "soon"), "ADV", "func") ++
    entries(Seq("best", "fastest", "cheapest", "famous", "new", "first",
                "amazing", "demanding", "native", "available", "open",
                "delicious", "far"), "ADJ", "qual") ++
    entries(Seq("way", "time", "day", "morning", "evening", "weekend",
                "room", "phone", "job", "profession", "career", "team",
                "game", "championship", "capital", "weather", "daughters",
                "walk", "place", "city", "restaurant", "concierge",
                "question", "guest", "street", "year"), "NOUN", "common")
  ).toMap

  /** POS tags treated as content-bearing for pattern extraction. */
  val contentPos: Set[String] = Set("NOUN", "PROPN", "VERB", "ADJ")

  /** Deterministic fallback tag for out-of-lexicon words. */
  def fallbackPos(w: String): String =
    if (w.forall(_.isDigit)) "NUM"
    else if (w.endsWith("ly")) "ADV"
    else if (w.endsWith("ing") || w.endsWith("ed")) "VERB"
    else "NOUN"

  def info(w: String): WordInfo =
    lexicon.getOrElse(w, WordInfo(fallbackPos(w), "misc"))
}
